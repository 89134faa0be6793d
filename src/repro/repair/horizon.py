"""Horizon (Rezig et al., VLDB 2021) — FD pattern-graph repair.

Horizon builds a directed pattern graph whose nodes are attribute values
and whose edges connect LHS patterns to RHS values with their support
counts, then repairs each violating cell with the most-supported pattern
in *linear* time. Our pattern graph is the ``(lhs value, rhs value,
support)`` aggregate per FD; repairing a violating cell = routing it to
the heaviest outgoing edge of its LHS node. No confidence threshold is
applied (unlike MLNClean), so low-support patterns can impose wrong
values — visible as Horizon's near-zero/negative EDR rows in Table 4.

FDs are processed sequentially over the running (already partially
repaired) frame — the pattern-graph traversal order matters, as in the
original.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.core.cells import apply_fixes, materialize
from repro.core.context import RepairContext, register
from repro.repair.common import fd_majority_fixes
from repro.rules.model import fds_of


@register("Horizon")
def horizon(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Sequential pattern-graph repair over the FD subset of the rules."""
    current = dirty
    for fd in fds_of(ctx.rules):
        ctx.budget.check()
        # Heaviest-edge routing == majority of the class, no threshold.
        fixes = fd_majority_fixes(current, fd, min_support=1, min_conf=0.0)
        # Lineage break per FD hop: the pattern graph is traversed over
        # the running frame, one pivot per hop otherwise nests in the plan.
        current = materialize(apply_fixes(current, fixes))
    return current
