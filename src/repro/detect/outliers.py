"""Outlier detector — the "Detection Goal: Outliers" row of Table 3.

Daisy, Scare, Unified, and BoostClean detect by distribution only; the
paper shows this is weaker than value-oriented detection. We expose the
same capability: frequency outliers on categorical columns, z-score and
parse failures on numeric columns, and missing tokens.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, to_cells
from repro.detect.features import MISSING_TOKENS


def outlier_cells(
    df: DataFrame,
    *,
    rare_frac: float = 0.02,
    z_thresh: float = 3.0,
) -> DataFrame:
    """Distinct ``(tid, attr)`` cells flagged as distributional outliers."""
    cells = to_cells(df)
    n = df.count()
    by_val = cells.groupBy("attr", "value").agg(F.count("*").alias("cnt"))
    num = cells.withColumn("x", F.expr("try_cast(value as double)"))
    col_stats = num.groupBy("attr").agg(
        F.count_distinct("value").alias("n_distinct"),
        F.avg("x").alias("mu"),
        F.coalesce(F.stddev("x"), F.lit(0.0)).alias("sigma"),
        (F.sum(F.col("x").isNotNull().cast("long")) / F.count("*")).alias(
            "num_frac"
        ),
    )
    j = (
        num.join(by_val, ["attr", "value"], "left")
        .join(col_stats, "attr")
    )
    is_missing = (
        F.col("value").isNull()
        | F.trim(F.lower(F.col("value"))).isin(
            [t.lower() for t in MISSING_TOKENS if t]
        )
        | (F.col("value") == "")
    )
    rare = (F.col("n_distinct") / F.lit(n) < 0.5) & (
        F.coalesce(F.col("cnt"), F.lit(0)) < rare_frac * F.lit(n)
    )
    z_out = (
        (F.col("num_frac") >= 0.8)
        & F.col("x").isNotNull()
        & (
            F.abs(F.col("x") - F.col("mu"))
            > z_thresh * F.greatest(F.col("sigma"), F.lit(1e-9))
        )
    )
    parse_fail = (
        (F.col("num_frac") >= 0.8)
        & F.col("value").isNotNull()
        & F.col("x").isNull()
    )
    return (
        j.where(is_missing | rare | z_out | parse_fail)
        .select(TID, "attr")
        .distinct()
    )
