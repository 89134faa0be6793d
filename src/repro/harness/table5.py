"""Table 5: dataset characteristics audit.

Regenerates the paper's dataset table from our synthetic datasets and
*measures* the native error rate (rather than trusting the spec), so a
drifting generator is caught.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.registry import DATASETS, load
from repro.errors.inject import observed_error_rate


def run_table5(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    tax_scale: float | None = None,
    seed: int = 0,
    datasets: tuple[str, ...] = tuple(DATASETS),
) -> pd.DataFrame:
    """One row per dataset: #tuples, #attrs, measured error rate, types.

    ``tax_scale`` optionally shrinks only Tax (its paper size is 200k
    tuples; the audit is exact at any scale since the injector is
    rate-controlled per cell).
    """
    rows = []
    for name in datasets:
        s = tax_scale if (name == "tax" and tax_scale is not None) else scale
        ds = load(name, spark, scale=s, seed=seed)
        rows.append(
            {
                "dataset": name,
                "n_tuples": ds.clean.count(),
                "n_attrs": len(ds.attrs),
                "error_rate": observed_error_rate(ds.dirty, ds.clean),
                "nominal_rate": ds.nominal_error_rate,
                "error_types": ",".join(ds.error_types),
            }
        )
    return pd.DataFrame(rows)
