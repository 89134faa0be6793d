"""Table 6: runtime scaling on nested Tax prefixes (§4.2 "Scalable
Performance").

The paper runs Tax-10k ... Tax-50k with a 24 h timeout; we run
configurable prefix sizes (env ``REPRO_TAX_SIZES``, comma-separated)
under the ``REPRO_BUDGET_S`` budget. "n/a" = budget exhausted, matching
the paper's semantics; HoloClean's "n/a*" (OOM) also lands here via the
budget.
"""
from __future__ import annotations

import os

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.tax import tax, tax_prefix
from repro.harness.runner import (
    default_budget_s,
    detections_for,
    run_algorithm,
)
from repro.repair import ALGORITHMS

#: Table 6 sizes in the paper.
PAPER_SIZES = (10_000, 20_000, 30_000, 40_000, 50_000)


def sizes_from_env(default: tuple[int, ...]) -> tuple[int, ...]:
    raw = os.environ.get("REPRO_TAX_SIZES")
    if not raw:
        return default
    return tuple(int(x) for x in raw.split(","))


def run_table6(
    spark: SparkSession,
    *,
    sizes: tuple[int, ...] | None = None,
    seed: int = 0,
    algorithms: tuple[str, ...] = ALGORITHMS,
    budget_s: float | None = None,
) -> pd.DataFrame:
    """One row per (size, algorithm): runtime seconds or n/a.

    The Tax base is generated once at the largest requested size; each
    measurement slices a prefix, recomputes detections at that size
    (detection cost is an *input* for data-driven methods, per §4.1, so
    it is excluded from the repair timing, as in the paper), and times
    the repair alone.
    """
    if sizes is None:
        sizes = sizes_from_env(PAPER_SIZES)
    if budget_s is None:
        budget_s = default_budget_s()
    base = tax(spark, scale=max(sizes) / 200_000, seed=seed)
    rows = []
    for k in sizes:
        ds = tax_prefix(base, k)
        ds.dirty.cache().count()
        ds.clean.cache().count()
        det = detections_for(ds, ds.dirty, seed)
        det.cache().count()
        for alg in algorithms:
            res = run_algorithm(
                spark,
                alg,
                ds,
                ds.dirty,
                detections=det,
                budget_s=budget_s,
                seed=seed,
                score=False,
            )
            rows.append(
                {
                    "size": k,
                    "algorithm": alg,
                    "status": res.status,
                    "seconds": res.seconds if res.status == "ok" else None,
                }
            )
        det.unpersist()
        ds.dirty.unpersist()
        ds.clean.unpersist()
    return pd.DataFrame(rows)
