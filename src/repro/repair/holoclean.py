"""HoloClean (Rekatsinas et al., VLDB 2017) — probabilistic repair with
statistical domain pruning.

Pipeline follows the original: (1) a weak internal detector (cells that
disagree with their FD-class consensus, plus missing tokens — rule
violations and NULLs are HoloClean's documented detection signals, and
non-rule errors are its blind spot, which Table 4's ED_F1 reflects);
(2) domain generation per noisy cell via co-occurrence pruning + the FD
class consensus + the current value, with statistics estimated over the
full relation; (3) factor-graph inference, reduced to a log-linear score
per candidate (column frequency, maximum tuple-context co-occurrence,
class-consensus agreement, current-value prior) committing the MAP
candidate for *every* noisy cell — no acceptance threshold.

The thresholdless MAP commit is what makes HoloClean shine on redundant
data (Hospital, EDR 0.49 in the paper) and melt down on sparse data
(Beers, EDR -4.25): with weak statistics the MAP candidate is frequently
wrong, and it is committed anyway. The cells x pruned-domain candidate
table is the memory footprint behind the paper's OOM at Tax-20k.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.cells import TID, materialize, to_cells
from repro.core.context import RepairContext, register
from repro.detect.features import MISSING_TOKENS
from repro.repair.common import empty_fixes, finish, union_fixes
from repro.rules.engine import equivalence_classes, fd_class_majority
from repro.rules.model import fds_of

#: Log-linear weights (frequency, cooc, consensus, current-value prior).
_W_FREQ, _W_COOC, _W_MAJ, _W_CUR = 0.5, 1.0, 2.0, 0.6
#: Max co-occurrence candidates per cell.
_TOP_COOC = 3


def _internal_detect(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Noisy cells: FD-consensus disagreement + missing tokens."""
    spark = dirty.sparkSession
    pieces = [
        spark.createDataFrame([], schema=f"{TID} long, attr string")
    ]
    for fd in fds_of(ctx.rules):
        cls = equivalence_classes(dirty, fd)
        maj = fd_class_majority(dirty, fd).where(
            (F.col("support") >= 2) & F.col("majority").isNotNull()
        )
        pieces.append(
            cls.join(maj.select("key", "majority"), "key")
            .where(~F.col("value").eqNullSafe(F.col("majority")))
            .select(TID, F.lit(fd.rhs).alias("attr"))
        )
    cells = to_cells(dirty)
    pieces.append(
        cells.where(
            F.col("value").isNull()
            | F.trim(F.lower(F.col("value"))).isin(
                [t.lower() for t in MISSING_TOKENS if t]
            )
            | (F.col("value") == "")
        ).select(TID, "attr")
    )
    out = pieces[0]
    for p in pieces[1:]:
        out = out.unionByName(p)
    return out.distinct()


@register("HoloClean")
def holoclean(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Detect, prune domains, run MAP inference, commit repairs."""
    noisy = materialize(_internal_detect(dirty, ctx))
    cells = materialize(to_cells(dirty))
    noisy_cells = materialize(cells.join(noisy, [TID, "attr"], "left_semi"))
    all_cells = cells.where(F.col("value").isNotNull())
    ctx.budget.check()

    # Column frequencies (feature 1) over the whole relation.
    freq = all_cells.groupBy("attr", "value").agg(F.count("*").alias("cnt"))
    col_n = all_cells.groupBy("attr").agg(F.count("*").alias("col_n"))

    # Co-occurrence statistics for domain pruning + feature 2.
    pairs = (
        all_cells.alias("x")
        .join(all_cells.alias("y"), TID)
        .where(F.col("x.attr") != F.col("y.attr"))
        .select(
            F.col("x.attr").alias("attr"),
            F.col("x.value").alias("candidate"),
            F.col("y.attr").alias("battr"),
            F.col("y.value").alias("bvalue"),
        )
    )
    cooc = pairs.groupBy("attr", "candidate", "battr", "bvalue").agg(
        F.count("*").alias("cc")
    )
    btot = cooc.groupBy("attr", "battr", "bvalue").agg(F.sum("cc").alias("bc"))
    cooc_p = materialize(
        cooc.join(btot, ["attr", "battr", "bvalue"]).select(
            "attr", "candidate", "battr", "bvalue",
            (F.col("cc") / F.col("bc")).alias("p"),
        )
    )
    evidence = noisy_cells.select(TID, "attr").join(
        all_cells.select(
            TID, F.col("attr").alias("battr"), F.col("value").alias("bvalue")
        ),
        TID,
    ).where(F.col("attr") != F.col("battr"))
    wtop = Window.partitionBy(TID, "attr").orderBy(
        F.desc("f_cooc"), "candidate"
    )
    cooc_cand = (
        evidence.join(cooc_p, ["attr", "battr", "bvalue"])
        .groupBy(TID, "attr", "candidate")
        .agg(F.max("p").alias("f_cooc"))
        .withColumn("rk", F.row_number().over(wtop))
        .where(F.col("rk") <= _TOP_COOC)
        .drop("rk")
    )

    # FD class consensus candidates (feature 3).
    maj_parts = [
        empty_fixes(dirty).select(
            TID, "attr", F.col("new_value").alias("candidate")
        )
    ]
    for fd in fds_of(ctx.rules):
        cls = equivalence_classes(dirty, fd)
        maj = fd_class_majority(dirty, fd).where(F.col("majority").isNotNull())
        maj_parts.append(
            cls.join(maj.select("key", "majority"), "key").select(
                TID,
                F.lit(fd.rhs).alias("attr"),
                F.col("majority").alias("candidate"),
            )
        )
    maj_cand = (
        union_fixes(*maj_parts)
        .join(noisy, [TID, "attr"], "left_semi")
        .distinct()
        .withColumn("f_maj", F.lit(1.0))
    )

    current = noisy_cells.select(
        TID, "attr", F.col("value").alias("candidate")
    ).where(F.col("candidate").isNotNull()).withColumn("f_cur", F.lit(1.0))

    keys = [TID, "attr", "candidate"]
    merged = (
        cooc_cand.select(*keys, "f_cooc")
        .unionByName(maj_cand.select(*keys, "f_maj"), allowMissingColumns=True)
        .unionByName(current.select(*keys, "f_cur"), allowMissingColumns=True)
        .groupBy(*keys)
        .agg(
            F.coalesce(F.max("f_cooc"), F.lit(0.0)).alias("f_cooc"),
            F.coalesce(F.max("f_maj"), F.lit(0.0)).alias("f_maj"),
            F.coalesce(F.max("f_cur"), F.lit(0.0)).alias("f_cur"),
        )
        .join(freq.select("attr", F.col("value").alias("candidate"), "cnt"),
              ["attr", "candidate"], "left")
        .join(col_n, "attr", "left")
    )
    score = (
        _W_FREQ * F.coalesce(F.col("cnt") / F.col("col_n"), F.lit(0.0))
        + _W_COOC * F.col("f_cooc")
        + _W_MAJ * F.col("f_maj")
        + _W_CUR * F.col("f_cur")
    )
    win = Window.partitionBy(TID, "attr").orderBy(
        F.desc("score"), "candidate"
    )
    orig = noisy_cells.select(TID, "attr", F.col("value").alias("orig"))
    best = (
        merged.withColumn("score", score)
        .withColumn("rk", F.row_number().over(win))
        .where(F.col("rk") == 1)
        .join(orig, [TID, "attr"])
        .where(~F.col("candidate").eqNullSafe(F.col("orig")))
        .select(TID, "attr", F.col("candidate").alias("new_value"))
    )
    return finish(dirty, best, ctx)
