"""Daisy (Giannakopoulou et al., SIGMOD 2020) — cleaning inside query
execution, not in the base data.

Daisy decides where to place a cleaning operator in a query's logical
plan and answers the query *probabilistically*, replacing erroneous
values with candidate-fix distributions. It never writes repairs back to
the relation — which is exactly why its EDR/ER_F1 rows in Table 4 are
0.0000: the benchmark measures the stored data. We reproduce both
behaviours: ``repair`` is the identity on the base data, and
``probabilistic_answers`` exposes the query-time candidate distributions
so the substrate is genuinely exercised (and unit-tested).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.core.context import RepairContext, register
from repro.rules.engine import fd_class_majority, equivalence_classes
from repro.rules.model import fds_of


@register("Daisy")
def daisy(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Identity on the stored relation (query-time cleaning only)."""
    ctx.budget.check()
    return dirty


def probabilistic_answers(
    dirty: DataFrame, ctx: RepairContext
) -> DataFrame:
    """Query-time candidate fixes with probabilities.

    For every cell violating an FD, emit the class's candidate values
    with probability proportional to in-class support — Daisy's
    probabilistic query result. Returns
    ``(tid, attr, candidate, probability)``.
    """
    spark = dirty.sparkSession
    pieces = []
    for fd in fds_of(ctx.rules):
        cls = equivalence_classes(dirty, fd)
        sizes = fd_class_majority(dirty, fd).where(F.col("n_distinct") > 1)
        by_val = (
            cls.where(F.col("value").isNotNull())
            .groupBy("key", "value")
            .agg(F.count("*").alias("cnt"))
        )
        cand = (
            cls.join(sizes.select("key", "class_size"), "key")
            .join(
                by_val.select(
                    "key",
                    F.col("value").alias("candidate"),
                    "cnt",
                ),
                "key",
            )
            .select(
                TID,
                F.lit(fd.rhs).alias("attr"),
                "candidate",
                (F.col("cnt") / F.col("class_size")).alias("probability"),
            )
        )
        pieces.append(cand)
    if not pieces:
        return spark.createDataFrame(
            [],
            schema=f"{TID} long, attr string, candidate string, "
            "probability double",
        )
    out = pieces[0]
    for p in pieces[1:]:
        out = out.unionByName(p)
    return out
