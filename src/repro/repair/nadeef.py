"""Nadeef (Ebaid et al., VLDB 2013) — generalized rule interface with
iterative violation repair.

Nadeef's contribution is generality, not repair quality: users plug any
rule exposing ``detect``/``fix``, and the core loops cell fixes to a
fixpoint. Its fix semantics for equality rules is *partner copy*: in a
violating pair, the cell of the higher-tid tuple takes the lower-tid
tuple's value. Under high error rates this propagates wrong values
through classes across iterations — the mechanism behind Nadeef's
strongly negative EDR in Table 4 (-1.80 on Hospital, -2.54 on Rayyan).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, apply_fixes, materialize
from repro.core.context import RepairContext, register
from repro.repair.common import empty_fixes, unary_dc_fixes, union_fixes
from repro.rules.engine import equivalence_classes
from repro.rules.model import fds_of

_MAX_ITER = 3


def _partner_copy_fixes(df: DataFrame, fd) -> DataFrame:
    """For every violating class, copy the value of the lowest-tid tuple
    onto every other tuple in the class."""
    cls = equivalence_classes(df, fd)
    leader = (
        cls.groupBy("key")
        .agg(
            F.min_by("value", F.col(TID)).alias("leader_value"),
            F.count_distinct("value").alias("nd"),
        )
        .where(F.col("nd") > 1)
    )
    return (
        cls.join(leader, "key")
        .where(~F.col("value").eqNullSafe(F.col("leader_value")))
        .select(
            TID,
            F.lit(fd.rhs).alias("attr"),
            F.col("leader_value").alias("new_value"),
        )
    )


@register("Nadeef")
def nadeef(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Iterate detect -> fix over all plugged rules until fixpoint."""
    current = dirty
    fds = fds_of(ctx.rules)
    unary = [dc for dc in ctx.rules if dc.unary]
    for _ in range(_MAX_ITER):
        ctx.budget.check()
        parts = [empty_fixes(current)]
        for fd in fds:
            parts.append(_partner_copy_fixes(current, fd))
        for dc in unary:
            parts.append(unary_dc_fixes(current, dc))
        fixes = materialize(union_fixes(*parts))
        n = fixes.count()
        if n == 0:
            break
        # Lineage break per iteration: the next round's detection reads
        # the repaired frame; nesting pivots across rounds blows up the
        # Catalyst plan.
        current = materialize(apply_fixes(current, fixes))
    return current
