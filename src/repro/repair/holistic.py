"""Holistic (Chu et al., ICDE 2013) — conflict hypergraph + repair
contexts over DC violations.

Reimplementation notes: violations are enumerated *pairwise* (the
conflict hypergraph edges), which keeps the genuine O(|D|^2) scaling of
Table 3 — this is the algorithm the paper times out on Tax-20k. Repair
contexts collapse to three cases in our DC grammar:

  * FD-shaped DCs: each equivalence class is one context; the
    cost-minimal consistent assignment is the strict majority value, and
    when no strict majority exists an *arbitrary consistent value* (the
    smallest in the class) is imposed — the classical minimal-cardinality
    choice and Holistic's main source of introduced errors.
  * binary order DCs: boundary assignment from the violating partner.
  * unary DCs: column mode.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.core.context import RepairContext, register
from repro.repair.common import (
    empty_fixes,
    fd_majority_fixes,
    finish,
    order_dc_boundary_fixes,
    unary_dc_fixes,
    union_fixes,
)
from repro.rules.engine import violating_pairs


@register("Holistic")
def holistic(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Repair all DC violations via repair contexts (consistency repair)."""
    parts = [empty_fixes(dirty)]
    for dc in ctx.rules:
        ctx.budget.check()
        # Materialize the conflict-hypergraph edges for this DC — the
        # pairwise enumeration that makes Holistic quadratic.
        n_edges = violating_pairs(dirty, dc).count()
        if n_edges == 0:
            continue
        fd = dc.as_fd()
        if fd is not None:
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
