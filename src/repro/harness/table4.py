"""Table 4: EDR / ER_F1 / ED_F1 of the 12 algorithms on the four
real-world datasets with their native errors (§4.2)."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.registry import TABLE4_DATASETS, load
from repro.harness.runner import (
    default_budget_s,
    detections_for,
    run_algorithm,
)
from repro.repair import ALGORITHMS


def run_table4(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    seed: int = 0,
    algorithms: tuple[str, ...] = ALGORITHMS,
    datasets: tuple[str, ...] = TABLE4_DATASETS,
    budget_s: float | None = None,
) -> pd.DataFrame:
    """One row per (dataset, algorithm) with all Table 4 metrics.

    Columns: dataset, algorithm, status, edr, er_f1, ed_f1, seconds plus
    the raw DEC/IEC/OEC counts. "n/a" rows carry NaN metrics — the
    paper's 24 h timeout, here the ``budget_s`` wall clock
    (env ``REPRO_BUDGET_S``, default 300 s).
    """
    if budget_s is None:
        budget_s = default_budget_s()
    rows = []
    for ds_name in datasets:
        ds = load(ds_name, spark, scale=scale, seed=seed)
        ds.dirty.cache().count()
        ds.clean.cache().count()
        det = detections_for(ds, ds.dirty, seed)
        for alg in algorithms:
            res = run_algorithm(
                spark,
                alg,
                ds,
                ds.dirty,
                detections=det,
                budget_s=budget_s,
                seed=seed,
            )
            s = res.scores
            rows.append(
                {
                    "dataset": ds_name,
                    "algorithm": alg,
                    "status": res.status,
                    "edr": s.edr if s else float("nan"),
                    "er_f1": s.er_f1 if s else float("nan"),
                    "ed_f1": s.ed_f1 if s else float("nan"),
                    "dec": s.dec if s else None,
                    "iec": s.iec if s else None,
                    "oec": s.oec if s else None,
                    "seconds": res.seconds,
                }
            )
        ds.dirty.unpersist()
        ds.clean.unpersist()
    return pd.DataFrame(rows)
