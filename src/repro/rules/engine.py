"""Spark violation engine: DC self-joins and FD equivalence classes.

``violating_pairs`` is the workhorse every rule-driven algorithm shares:
a self-join whose ON clause is the DC's predicate conjunction. Catalyst
extracts the ``t1.A = t2.A`` atoms as hash-join keys, which *is* the
blocking step of BigDansing/Holistic; order predicates stay as join
filters. Unary DCs are plain filters.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.rules.model import FD, DenialConstraint

_SYMMETRIC_OPS = {"=", "!="}


def violating_pairs(df: DataFrame, dc: DenialConstraint) -> DataFrame:
    """Tuple pairs (or single tuples) violating ``dc``.

    Returns ``(tid_1, tid_2)``; for unary DCs ``tid_2`` is NULL. For DCs
    built only from symmetric operators the pair set is deduplicated with
    ``tid_1 < tid_2``.
    """
    if dc.unary:
        cond = dc.condition_sql("t1", "t1")
        return (
            df.alias("t1")
            .where(F.expr(cond))
            .select(
                F.col(f"t1.{TID}").alias("tid_1"),
                F.lit(None).cast("long").alias("tid_2"),
            )
        )
    symmetric = all(p.op in _SYMMETRIC_OPS for p in dc.predicates)
    dedupe = (
        f"t1.{TID} < t2.{TID}" if symmetric else f"t1.{TID} != t2.{TID}"
    )
    cond = f"({dc.condition_sql('t1', 't2')}) AND {dedupe}"
    return (
        df.alias("t1")
        .join(df.alias("t2"), on=F.expr(cond), how="inner")
        .select(
            F.col(f"t1.{TID}").alias("tid_1"),
            F.col(f"t2.{TID}").alias("tid_2"),
        )
    )


def violation_cells(
    df: DataFrame, rules: list[DenialConstraint]
) -> DataFrame:
    """Distinct cells ``(tid, attr, dc_name)`` involved in any violation.

    For a violating pair, the implicated cells are every attribute each
    predicate reads on the respective tuple side — the conflict-hypergraph
    node set of Holistic.
    """
    spark = df.sparkSession
    pieces = []
    for dc in rules:
        fd = dc.as_fd()
        if fd is not None:
            # FD fast path: a tuple is implicated iff its class holds >1
            # distinct non-null RHS value and its own RHS is non-null —
            # exactly the tuples that appear in some violating pair, at
            # aggregation cost instead of a self-join.
            cls = equivalence_classes(df, fd)
            bad = (
                cls.groupBy("key")
                .agg(F.count_distinct("value").alias("nd"))
                .where(F.col("nd") > 1)
            )
            tids = (
                cls.join(bad, "key", "left_semi")
                .where(F.col("value").isNotNull())
                .select(TID)
            )
            attrs = sorted(set(fd.lhs) | {fd.rhs})
            arr = F.array(*[F.lit(a) for a in attrs])
            pieces.append(
                tids.select(TID, F.explode(arr).alias("attr")).withColumn(
                    "dc_name", F.lit(dc.name)
                )
            )
            continue
        pairs = violating_pairs(df, dc)
        side1 = sorted({p.lhs for p in dc.predicates})
        side2 = sorted({p.rhs for p in dc.predicates if p.rhs is not None})
        a1 = F.array(*[F.lit(a) for a in side1])
        cells1 = pairs.select(
            F.col("tid_1").alias(TID), F.explode(a1).alias("attr")
        )
        pieces.append(cells1.withColumn("dc_name", F.lit(dc.name)))
        if side2:
            a2 = F.array(*[F.lit(a) for a in side2])
            cells2 = pairs.where(F.col("tid_2").isNotNull()).select(
                F.col("tid_2").alias(TID), F.explode(a2).alias("attr")
            )
            pieces.append(cells2.withColumn("dc_name", F.lit(dc.name)))
    if not pieces:
        return spark.createDataFrame(
            [], schema=f"{TID} long, attr string, dc_name string"
        )
    out = pieces[0]
    for p in pieces[1:]:
        out = out.unionByName(p)
    return out.distinct()


def equivalence_classes(df: DataFrame, fd: FD) -> DataFrame:
    """Cells of the FD's RHS grouped by LHS value (one class per group).

    Returns ``(key, tid, value)`` where ``key`` is the concatenated LHS
    value (NULL keys are dropped — a NULL LHS determines nothing). This is
    the equivalence-class structure every rule-driven algorithm repairs
    over (Table 3, "Candidate Source").
    """
    key = F.concat_ws("", *[F.col(a) for a in fd.lhs]).alias("key")
    non_null = [F.col(a).isNotNull() for a in fd.lhs]
    pred = non_null[0]
    for c in non_null[1:]:
        pred = pred & c
    return df.where(pred).select(
        key, F.col(TID), F.col(fd.rhs).alias("value")
    )


def fd_class_majority(df: DataFrame, fd: FD) -> DataFrame:
    """Per-class majority statistics for an FD.

    Returns one row per equivalence class:
    ``(key, majority, support, class_size, n_distinct)`` where ``support``
    is the majority value's frequency. Deterministic: frequency ties break
    on the smaller value. NULL RHS cells count toward ``class_size`` but
    never win the majority.
    """
    classes = equivalence_classes(df, fd)
    by_value = classes.groupBy("key", "value").agg(
        F.count("*").alias("cnt")
    )
    sizes = by_value.groupBy("key").agg(
        F.sum("cnt").alias("class_size"),
        F.count_distinct(F.col("value")).alias("n_distinct"),
    )
    winners = (
        by_value.where(F.col("value").isNotNull())
        .groupBy("key")
        .agg(
            F.min_by(
                F.col("value"), F.struct(-F.col("cnt"), F.col("value"))
            ).alias("majority"),
            F.max("cnt").alias("support"),
        )
    )
    return sizes.join(winners, "key", "left")
