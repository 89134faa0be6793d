"""MLNClean (Ge et al., TKDE 2022) — Markov-logic-weighted rule
instantiation with reliability-scored multi-version fusion.

MLNClean grounds each DC into instantiated rules weighted by data
support, builds multiple candidate data versions, and fuses them by
reliability score. Our grounding of an FD is its (LHS value -> RHS value)
pattern table; the reliability of imposing a pattern on a class is its
support ratio. *Fusion* is cross-rule: when several FDs constrain the
same cell (e.g. zip->state and city->state), each produces a candidate
version, and a repair is committed only when every version proposing a
change agrees — disagreement means some ground rule is unreliable (its
LHS evidence is itself dirty), so the cell is left alone. This is what
keeps MLNClean's introduced-error count low relative to the plain
majority repairs of BigDansing/Holistic (Table 4).

The whole pass is a handful of aggregations with no pairwise violation
materialization, which is why MLNClean is the fastest method of Table 6
by an order of magnitude.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.core.context import RepairContext, register
from repro.repair.common import (
    empty_fixes,
    fd_majority_fixes,
    finish,
    unary_dc_fixes,
    union_fixes,
)
from repro.rules.engine import equivalence_classes, fd_class_majority
from repro.rules.model import FD, fds_of


def _confirmed_cells(df: DataFrame, fd: FD) -> DataFrame:
    """Cells vouched for by a fully consistent ground rule: members of a
    class with a single RHS value and support >= MIN_SUPPORT."""
    ok = fd_class_majority(df, fd).where(
        (F.col("n_distinct") == 1) & (F.col("support") >= MIN_SUPPORT)
    )
    return (
        equivalence_classes(df, fd)
        .join(ok.select("key"), "key", "left_semi")
        .select(TID, F.lit(fd.rhs).alias("attr"))
    )

#: Reliability threshold for accepting a grounded pattern.
RELIABILITY = 0.6
#: Minimum pattern support (ground rules seen fewer times are noise).
MIN_SUPPORT = 2


@register("MLNClean")
def mlnclean(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Confident majority per ground rule, fused by cross-rule agreement."""
    fds = fds_of(ctx.rules)
    versions = [
        empty_fixes(dirty)
        .withColumn("rule", F.lit(""))
        .withColumn("lhs", F.lit(""))
    ]
    confirms = [empty_fixes(dirty).select(TID, "attr")]
    for fd in fds:
        ctx.budget.check()
        fixes = fd_majority_fixes(
            dirty, fd, min_support=MIN_SUPPORT, min_conf=RELIABILITY
        )
        versions.append(
            fixes.withColumn("rule", F.lit(fd.name)).withColumn(
                "lhs", F.lit("|".join(fd.lhs))
            )
        )
        confirms.append(_confirmed_cells(dirty, fd))
    all_fixes = versions[0]
    for v in versions[1:]:
        all_fixes = all_fixes.unionByName(v)
    confirmed = confirms[0]
    for c in confirms[1:]:
        confirmed = confirmed.unionByName(c)
    # Unreliable-evidence veto: a tuple deviating from its class consensus
    # on >= 2 RHS attributes of the *same* LHS almost surely has a dirty
    # LHS value — the ground rules instantiated from it are unreliable, so
    # none of their repairs are committed.
    veto = (
        all_fixes.groupBy(TID, "lhs")
        .agg(F.count_distinct("rule").alias("nrules"))
        .where(F.col("nrules") >= 2)
        .select(TID, "lhs")
    )
    trusted = all_fixes.join(veto, [TID, "lhs"], "left_anti")
    # Fusion: versions proposing a change must agree on one value, and no
    # version may vouch for the current value.
    fused = (
        trusted.groupBy(TID, "attr")
        .agg(
            F.count_distinct("new_value").alias("nv"),
            F.min("new_value").alias("new_value"),
        )
        .where(F.col("nv") == 1)
        .join(confirmed.distinct(), [TID, "attr"], "left_anti")
        .select(TID, "attr", "new_value")
    )
    parts = [fused]
    for dc in ctx.rules:
        if dc.unary:
            parts.append(unary_dc_fixes(dirty, dc))
    return finish(dirty, union_fixes(*parts), ctx)
