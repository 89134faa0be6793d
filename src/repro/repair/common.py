"""Helpers shared by the repair algorithms.

Every algorithm is a pure function ``(dirty, ctx) -> repaired`` over wide
string frames. The helpers here implement the candidate sources of
Table 3: equivalence-class voting (Equiv Class), column statistics
(Mean/Mode/Median), and cell-fix bookkeeping.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, apply_fixes
from repro.core.context import RepairContext
from repro.rules.engine import equivalence_classes, fd_class_majority
from repro.rules.model import FD, DenialConstraint, Predicate


def fd_majority_fixes(
    df: DataFrame,
    fd: FD,
    *,
    min_support: int = 1,
    min_conf: float = 0.0,
    strict_majority: bool = False,
    arbitrary_on_tie: bool = False,
) -> DataFrame:
    """Fixes setting each class's RHS cells to the class consensus value.

    ``min_support`` / ``min_conf`` gate how confident the consensus must
    be (MLNClean-style reliability). With ``strict_majority`` the winner
    must hold > 50% of the class; if it does not and ``arbitrary_on_tie``
    is set, the lexicographically smallest value is imposed anyway — the
    minimal-cardinality "arbitrary consistent value" choice of classical
    consistency repair, and a deliberate source of introduced errors.
    Returns ``(tid, attr, new_value)``.
    """
    cls = equivalence_classes(df, fd)
    maj = fd_class_majority(df, fd).where(
        (F.col("n_distinct") > 1) & F.col("majority").isNotNull()
    )
    conf = F.col("support") / F.col("class_size")
    confident = (F.col("support") >= min_support) & (conf >= min_conf)
    if strict_majority:
        is_strict = F.col("support") * 2 > F.col("class_size")
        if arbitrary_on_tie:
            # Arbitrary-but-consistent pick when no strict majority: the
            # smallest value present in the class.
            small = (
                cls.where(F.col("value").isNotNull())
                .groupBy("key")
                .agg(F.min("value").alias("arbitrary"))
            )
            maj = maj.join(small, "key", "left").withColumn(
                "majority",
                F.when(is_strict, F.col("majority")).otherwise(
                    F.coalesce(F.col("arbitrary"), F.col("majority"))
                ),
            )
        else:
            maj = maj.where(is_strict)
    maj = maj.where(confident)
    return (
        cls.join(maj.select("key", "majority"), "key")
        .where(~F.col("value").eqNullSafe(F.col("majority")))
        .select(
            TID,
            F.lit(fd.rhs).alias("attr"),
            F.col("majority").alias("new_value"),
        )
    )


def column_mode(df: DataFrame, attr: str) -> str | None:
    """Most frequent non-null value (ties -> smallest value)."""
    row = (
        df.where(F.col(attr).isNotNull())
        .groupBy(attr)
        .agg(F.count("*").alias("cnt"))
        .orderBy(F.desc("cnt"), attr)
        .limit(1)
        .collect()
    )
    return row[0][0] if row else None


def column_stats(df: DataFrame, attr: str) -> dict[str, float | None]:
    """mean/median of the numeric parse of a column."""
    row = df.select(
        F.avg(F.expr(f"try_cast(`{attr}` as double)")).alias("mean"),
        F.median(F.expr(f"try_cast(`{attr}` as double)")).alias("median"),
    ).collect()[0]
    return {"mean": row["mean"], "median": row["median"]}


def unary_dc_fixes(df: DataFrame, dc: DenialConstraint) -> DataFrame:
    """Fixes for unary-DC violators: set each violating attribute to the
    column mode (the standard constant-rule fallback)."""
    spark = df.sparkSession
    if not dc.unary:
        raise ValueError(f"{dc.name} is not unary")
    cond = dc.condition_sql("t1", "t1")
    bad = df.alias("t1").where(F.expr(cond)).select(TID)
    pieces = []
    for p in dc.predicates:
        mode = column_mode(df, p.lhs)
        if mode is None:
            continue
        pieces.append(
            bad.select(
                TID,
                F.lit(p.lhs).alias("attr"),
                F.lit(mode).alias("new_value"),
            )
        )
    if not pieces:
        return spark.createDataFrame(
            [], schema=f"{TID} long, attr string, new_value string"
        )
    out = pieces[0]
    for q in pieces[1:]:
        out = out.unionByName(q)
    return out


def order_dc_boundary_fixes(
    df: DataFrame, dc: DenialConstraint
) -> DataFrame:
    """Boundary fixes for binary order DCs.

    For each violating pair, the side holding the "too small" value of the
    order predicate is raised to the partner's value — the minimal-change
    boundary assignment of Holistic's repair contexts. One fix per cell
    (the largest required boundary wins).
    """
    spark = df.sparkSession
    order_preds = [
        p for p in dc.predicates if p.op in ("<", "<=") and p.rhs is not None
    ]
    if not order_preds:
        return spark.createDataFrame(
            [], schema=f"{TID} long, attr string, new_value string"
        )
    cond = f"({dc.condition_sql('t1', 't2')}) AND t1.{TID} != t2.{TID}"
    pairs = df.alias("t1").join(df.alias("t2"), on=F.expr(cond), how="inner")
    pieces = []
    for p in order_preds:
        pieces.append(
            pairs.select(
                F.col(f"t1.{TID}").alias(TID),
                F.lit(p.lhs).alias("attr"),
                F.col(f"t2.`{p.rhs}`").alias("new_value"),
            )
        )
    out = pieces[0]
    for q in pieces[1:]:
        out = out.unionByName(q)
    # Numeric max across partners (string max would misorder "9.5"/"10").
    return out.groupBy(TID, "attr").agg(
        F.max_by(
            "new_value",
            F.expr("coalesce(try_cast(new_value as double), -1e308)"),
        ).alias("new_value")
    )


def restrict_to_detections(
    fixes: DataFrame, detections: DataFrame | None
) -> DataFrame:
    """Keep only fixes targeting detector-flagged cells (§4.4 guard)."""
    if detections is None:
        return fixes
    return fixes.join(
        detections.select(TID, "attr").distinct(), [TID, "attr"], "left_semi"
    )


def finish(dirty: DataFrame, fixes: DataFrame, ctx: RepairContext) -> DataFrame:
    """Apply fixes and run a final budget check."""
    ctx.budget.check()
    return apply_fixes(dirty, fixes)


def empty_fixes(df: DataFrame) -> DataFrame:
    return df.sparkSession.createDataFrame(
        [], schema=f"{TID} long, attr string, new_value string"
    )


def union_fixes(*parts: DataFrame) -> DataFrame:
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out
