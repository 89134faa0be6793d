"""Supplementary shape checks: Figures 4/5 (EDR vs error rate and error
type) and Figure 6 (optimization ratio). Figures are out of scope as
plots; these harnesses regenerate their underlying numbers so the shape
claims can be diffed in EXPERIMENTS.md.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.registry import load
from repro.errors.inject import inner_spec, mixed_spec, outer_spec
from repro.harness.runner import (
    default_budget_s,
    detections_for,
    run_algorithm,
)

#: Algorithms kept in the §4.3 sweeps (the paper drops Daisy/Relative).
SWEEP_ALGORITHMS = (
    "BigDansing", "Holistic", "Nadeef", "MLNClean", "Horizon",
    "Baran", "Scare", "HoloClean", "Unified", "BoostClean",
)

_SPECS = {"mixed": mixed_spec, "inner": inner_spec, "outer": outer_spec}


def run_error_sweep(
    spark: SparkSession,
    *,
    dataset: str,
    rates: tuple[float, ...] = (0.1, 0.3, 0.5, 0.7, 0.9),
    kind: str = "mixed",
    scale: float = 1.0,
    seed: int = 0,
    algorithms: tuple[str, ...] = SWEEP_ALGORITHMS,
    budget_s: float | None = None,
    optimization: bool = False,
) -> pd.DataFrame:
    """EDR per (rate, algorithm) under injected errors of ``kind``.

    ``optimization=True`` additionally runs each algorithm behind the
    §4.4 detection guard and reports both EDRs plus their difference
    (the paper's "optimization ratio").
    """
    if budget_s is None:
        budget_s = default_budget_s()
    ds = load(dataset, spark, scale=scale, seed=seed)
    ds.clean.cache().count()
    rows = []
    for rate in rates:
        dirty = ds.redirty(_SPECS[kind](rate)).cache()
        dirty.count()
        det = detections_for(ds, dirty, seed).cache()
        det.count()
        for alg in algorithms:
            res = run_algorithm(
                spark, alg, ds, dirty,
                detections=det, budget_s=budget_s, seed=seed,
            )
            row = {
                "dataset": dataset,
                "kind": kind,
                "rate": rate,
                "algorithm": alg,
                "edr": res.metric("edr"),
                "status": res.status,
            }
            if optimization:
                gres = run_algorithm(
                    spark, alg, ds, dirty,
                    detections=det, budget_s=budget_s, seed=seed,
                    guard=True,
                )
                row["edr_guarded"] = gres.metric("edr")
                if row["edr"] is not None and row["edr_guarded"] is not None:
                    row["optimization_ratio"] = (
                        row["edr_guarded"] - row["edr"]
                    )
                else:
                    row["optimization_ratio"] = None
            rows.append(row)
        det.unpersist()
        dirty.unpersist()
    ds.clean.unpersist()
    return pd.DataFrame(rows)
