"""BigDansing (Khayyat et al., SIGMOD 2015) — the five-operator logical
plan: Scope, Block, Iterate, Detect, GenFix.

BigDansing *was* a Spark system; its abstraction maps 1:1 onto DataFrame
stages, which is exactly how we express it:

  * Scope    — project the attributes the rule reads
  * Block    — hash-partition on the rule's equality keys (the groupBy)
  * Iterate  — enumerate candidate units inside a block
  * Detect   — keep the violating units
  * GenFix   — emit candidate fixes, resolved per block by change count

Same repair semantics as Holistic (it reuses Holistic's repair-context
fixes) but the blocked dataflow avoids materializing the pairwise
conflict graph, so its measured runtime is lower at equal asymptotic
complexity — the distinction Table 6 shows (2691 s vs 45261 s at 10k).
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
    order_dc_boundary_fixes,
    unary_dc_fixes,
    union_fixes,
)
from repro.rules.model import DenialConstraint


def _scope(dirty: DataFrame, dc: DenialConstraint) -> DataFrame:
    """Scope operator: restrict to the attributes the rule touches."""
    return dirty.select(TID, *sorted(dc.attrs()))


def _block_detect(scoped: DataFrame, dc: DenialConstraint) -> DataFrame:
    """Block + Iterate + Detect for FD-shaped DCs: one aggregation that
    finds blocks containing a violation (n_distinct RHS > 1)."""
    fd = dc.as_fd()
    keys = [F.col(a) for a in fd.lhs]
    return (
        scoped.groupBy(*keys)
        .agg(F.count_distinct(F.col(fd.rhs)).alias("nd"))
        .where(F.col("nd") > 1)
    )


@register("BigDansing")
def bigdansing(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Scope -> Block -> Iterate -> Detect -> GenFix over every rule."""
    parts = [empty_fixes(dirty)]
    for dc in ctx.rules:
        ctx.budget.check()
        scoped = _scope(dirty, dc)
        fd = dc.as_fd()
        if fd is not None:
            # Detect via the blocked aggregation (no pair materialization)
            if _block_detect(scoped, dc).limit(1).count() == 0:
                continue
            parts.append(
                fd_majority_fixes(
                    dirty,
                    fd,
                    strict_majority=True,
                    arbitrary_on_tie=True,
                )
            )
        elif dc.unary:
            parts.append(unary_dc_fixes(dirty, dc))
        else:
            parts.append(order_dc_boundary_fixes(dirty, dc))
    return finish(dirty, union_fixes(*parts), ctx)
