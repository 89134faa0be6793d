"""Relative (Beskales et al., ICDE 2013) — relative trust between
inconsistent data and inaccurate constraints.

For each FD the algorithm explores the lattice of rule modifications
(extending the LHS with attribute subsets) by backtracking search,
scoring every modification by how many data changes the modified rule
would still require, and keeps the minimal-change (rule', data') pair
within the relative-trust threshold tau. The LHS-extension lattice is
exponential in the attribute count (Table 3: O(|D| * |R|^{Sigma D})) —
on every Table 4/6 dataset the search exhausts any practical budget,
which is precisely why the paper reports "n/a" for Relative everywhere.
Unit tests exercise it on 3-4 attribute toy relations where the lattice
is tiny.
"""
from __future__ import annotations

from itertools import combinations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import data_attrs
from repro.core.context import RepairContext, register
from repro.repair.common import (
    empty_fixes,
    fd_majority_fixes,
    finish,
    union_fixes,
)
from repro.rules.engine import fd_class_majority
from repro.rules.model import FD, fds_of

#: Relative-trust threshold: accept a modified rule only if it requires
#: at most this fraction of tuples changed.
_TAU = 0.5


def _required_changes(df: DataFrame, fd: FD) -> int:
    """Minimal cell changes to satisfy ``fd`` (deviants from majority)."""
    row = (
        fd_class_majority(df, fd)
        .where(F.col("majority").isNotNull())
        .agg(
            F.sum(F.col("class_size") - F.col("support")).alias("chg")
        )
        .collect()[0]
    )
    return int(row["chg"] or 0)


@register("Relative")
def relative(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Backtracking search over LHS extensions, then minimal data repair."""
    attrs = data_attrs(dirty)
    n = dirty.count()
    chosen: list[FD] = []
    for fd in fds_of(ctx.rules):
        spare = [a for a in attrs if a not in fd.lhs and a != fd.rhs]
        best: tuple[int, FD] | None = None
        # Full lattice of LHS extensions — genuinely exponential.
        for size in range(0, len(spare) + 1):
            for combo in combinations(spare, size):
                ctx.budget.check()
                cand = FD(
                    name=f"{fd.name}+{len(combo)}",
                    lhs=tuple(sorted(fd.lhs + combo)),
                    rhs=fd.rhs,
                )
                chg = _required_changes(dirty, cand)
                # Charge the lattice node against the budget so the
                # search cost is visible even on fast hardware.
                ctx.budget.consume(0.0)
                if chg <= _TAU * n and (best is None or chg < best[0]):
                    best = (chg, cand)
            if best is not None and best[0] == 0:
                break  # backtracking prune: cannot beat zero changes
        if best is not None:
            chosen.append(best[1])
    parts = [empty_fixes(dirty)]
    for fd in chosen:
        parts.append(fd_majority_fixes(dirty, fd, min_support=2))
    return finish(dirty, union_fixes(*parts), ctx)
