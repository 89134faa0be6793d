"""Per-cell detector features — the base-detector ensemble of Raha-lite.

Six cheap detectors vote on every cell; their binary outputs form the
feature vector the Raha-lite classifier learns over. All features are
computed with Spark aggregations + joins over the long cell format, so
featurization scales with the data.

Features (all 0/1 doubles):
  * f_null — NULL or an implicit missing token
  * f_rare — value frequency below 2% of the column (categorical columns
    only: distinct ratio < 0.5, so high-cardinality text is exempt)
  * f_fmt  — character-class pattern outside the column's dominant set
  * f_len  — value length more than 2.5 sigma from the column mean
  * f_num  — fails numeric parse in a mostly-numeric (>=80%) column
  * f_viol — implicated in a DC violation
  * f_maj — disagrees with its FD equivalence class's majority value
    (the sharpest signal for inner/VAD errors; needs class support >= 2)
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, to_cells
from repro.detect.violations import rule_violation_cells
from repro.rules.engine import equivalence_classes, fd_class_majority
from repro.rules.model import DenialConstraint, fds_of

MISSING_TOKENS = ("", "N/A", "-", "unknown", "?", "null", "nan")

FEATURES = (
    "f_null", "f_rare", "f_fmt", "f_len", "f_num", "f_viol", "f_maj",
    "f_maj2",
)


def _majority_disagreement(
    df: DataFrame, rules: list[DenialConstraint]
) -> DataFrame:
    """Cells ``(tid, attr, n_rules)``: how many FDs' class majorities the
    cell's value disagrees with (majority support >= 2).

    ``n_rules >= 2`` is a much sharper error signal than a single
    disagreement: a cell whose tuple merely has a corrupted LHS value
    lands in one wrong class, while a genuinely wrong RHS value
    disagrees with every FD that determines it (e.g. both zip->state and
    city->state)."""
    spark = df.sparkSession
    pieces = []
    for fd in fds_of(rules):
        cls = equivalence_classes(df, fd)
        maj = fd_class_majority(df, fd).where(F.col("support") >= 2)
        bad = (
            cls.join(maj, "key")
            .where(~F.col("value").eqNullSafe(F.col("majority")))
            .select(
                TID,
                F.lit(fd.rhs).alias("attr"),
                F.lit(fd.name).alias("rule"),
            )
        )
        pieces.append(bad)
    if not pieces:
        return spark.createDataFrame(
            [], schema=f"{TID} long, attr string, n_rules long"
        )
    out = pieces[0]
    for p in pieces[1:]:
        out = out.unionByName(p)
    return out.groupBy(TID, "attr").agg(
        F.count_distinct("rule").alias("n_rules")
    )


def _pattern(col):
    """Compressed character-class abstraction: runs of letters -> 'a',
    digits -> '9', everything else kept verbatim."""
    p = F.regexp_replace(col, r"[A-Za-z]+", "a")
    p = F.regexp_replace(p, r"[0-9]+", "9")
    return p


def cell_features(
    df: DataFrame, rules: list[DenialConstraint]
) -> DataFrame:
    """``(tid, attr, value, f_null, f_rare, f_fmt, f_len, f_num, f_viol)``
    for every cell of ``df``."""
    cells = to_cells(df)
    n = df.count()

    # Column-level statistics.
    by_val = cells.groupBy("attr", "value").agg(F.count("*").alias("cnt"))
    col_stats = (
        cells.withColumn("num_ok", F.expr("try_cast(value as double)"))
        .groupBy("attr")
        .agg(
            F.count_distinct("value").alias("n_distinct"),
            F.avg(F.length("value")).alias("len_mean"),
            F.coalesce(F.stddev(F.length("value")), F.lit(0.0)).alias(
                "len_std"
            ),
            (
                F.sum(F.col("num_ok").isNotNull().cast("long"))
                / F.count("*")
            ).alias("num_frac"),
        )
    )

    # Dominant pattern set: per column, patterns covering cells until 90%
    # cumulative frequency (at least the top pattern).
    pat = cells.withColumn("pattern", _pattern(F.col("value")))
    pat_freq = pat.groupBy("attr", "pattern").agg(
        F.count("*").alias("pcnt")
    )
    from pyspark.sql.window import Window

    w = (
        Window.partitionBy("attr")
        .orderBy(F.desc("pcnt"), "pattern")
        .rowsBetween(Window.unboundedPreceding, Window.currentRow)
    )
    dominant = (
        pat_freq.withColumn("cum", F.sum("pcnt").over(w))
        .withColumn("rank", F.row_number().over(
            Window.partitionBy("attr").orderBy(F.desc("pcnt"), "pattern")
        ))
        .where(
            (F.col("rank") == 1)
            | (F.col("cum") - F.col("pcnt") < 0.9 * F.lit(n))
        )
        .select("attr", "pattern")
        .withColumn("is_dominant", F.lit(1.0))
    )

    viol = rule_violation_cells(df, rules).withColumn("f_viol", F.lit(1.0))
    maj = _majority_disagreement(df, rules).select(
        TID,
        "attr",
        F.lit(1.0).alias("f_maj"),
        (F.col("n_rules") >= 2).cast("double").alias("f_maj2"),
    )

    feats = (
        pat.join(by_val, ["attr", "value"], "left")
        .join(col_stats, "attr")
        .join(dominant, ["attr", "pattern"], "left")
        .join(viol, [TID, "attr"], "left")
        .join(maj, [TID, "attr"], "left")
    )
    is_missing = F.col("value").isNull() | F.trim(
        F.lower(F.col("value"))
    ).isin([t.lower() for t in MISSING_TOKENS if t])
    is_missing = is_missing | (F.col("value") == "")
    f_null = is_missing.cast("double")
    f_rare = (
        (F.col("n_distinct") / F.lit(n) < 0.5)
        & (F.coalesce(F.col("cnt"), F.lit(0)) < 0.02 * F.lit(n))
    ).cast("double")
    f_fmt = (F.col("is_dominant").isNull() & F.col("value").isNotNull()).cast(
        "double"
    )
    f_len = (
        F.abs(
            F.coalesce(F.length("value"), F.lit(0)) - F.col("len_mean")
        )
        > 2.5 * F.greatest(F.col("len_std"), F.lit(0.5))
    ).cast("double")
    f_num = (
        (F.col("num_frac") >= 0.8)
        & F.col("value").isNotNull()
        & F.expr("try_cast(value as double)").isNull()
    ).cast("double")
    f_viol = F.coalesce(F.col("f_viol"), F.lit(0.0))
    f_maj = F.coalesce(F.col("f_maj"), F.lit(0.0))
    f_maj2 = F.coalesce(F.col("f_maj2"), F.lit(0.0))
    return feats.select(
        TID,
        "attr",
        "value",
        f_null.alias("f_null"),
        f_rare.alias("f_rare"),
        f_fmt.alias("f_fmt"),
        f_len.alias("f_len"),
        f_num.alias("f_num"),
        f_viol.alias("f_viol"),
        f_maj.alias("f_maj"),
        f_maj2.alias("f_maj2"),
    )
