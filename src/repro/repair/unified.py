"""Unified (Chiang & Miller, ICDE 2011) — one description-length cost
model for data repairs *and* rule repairs (tolerant repair).

Per FD equivalence class, the model compares:

  * DL(data repair)  = number of deviating cells (each cell edit is one
    codeword against the class's core pattern), and
  * DL(rule repair)  = cost of amending the rule to except this class
    (one codeword per distinct deviating value + a constant for the new
    pattern).

The cheaper description wins: dominated classes (one strong core
pattern, few deviants) get data repairs; diverse classes get a rule
amendment and their data is left untouched. That asymmetry is why
Unified tops Table 4 on redundancy-rich Hospital (EDR 0.60) while
staying near zero on Flights and slightly negative on sparse
Beers/Rayyan.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.core.context import RepairContext, register
from repro.repair.common import (
    empty_fixes,
    finish,
    unary_dc_fixes,
    union_fixes,
)
from repro.rules.engine import equivalence_classes, fd_class_majority
from repro.rules.model import fds_of

#: Max deviant fraction for which the data repair is the cheaper
#: description. Beyond it, most of the class deviates from the "core
#: pattern", so amending the rule (one exception codeword for the class)
#: is shorter than re-coding every deviating cell.
_MAX_DEVIANT_FRAC = 0.35


def _dl_fixes(df: DataFrame, fd) -> DataFrame:
    """Data repairs for classes where DL(data) <= DL(rule).

    DL(data) grows with the number of deviating cells; DL(rule) is a
    per-class exception cost proportional to the class itself. The ratio
    test ``deviants / class_size <= _MAX_DEVIANT_FRAC`` (with a
    supported core pattern) is the resulting decision boundary: a
    dominated class is repaired toward its core pattern, a diverse class
    triggers tolerant (rule) repair and its data is untouched.
    """
    cls = equivalence_classes(df, fd)
    stats = fd_class_majority(df, fd).where(
        (F.col("n_distinct") > 1) & F.col("majority").isNotNull()
    )
    deviants = F.col("class_size") - F.col("support")
    chosen = stats.where(
        (deviants / F.col("class_size") <= _MAX_DEVIANT_FRAC)
        & (F.col("support") >= 2)
    )
    return (
        cls.join(chosen.select("key", "majority"), "key")
        .where(~F.col("value").eqNullSafe(F.col("majority")))
        .select(
            TID,
            F.lit(fd.rhs).alias("attr"),
            F.col("majority").alias("new_value"),
        )
    )


@register("Unified")
def unified(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Tolerant repair: per class, repair data or amend the rule by DL."""
    parts = [empty_fixes(dirty)]
    for fd in fds_of(ctx.rules):
        ctx.budget.check()
        parts.append(_dl_fixes(dirty, fd))
    for dc in ctx.rules:
        if dc.unary:
            parts.append(unary_dc_fixes(dirty, dc))
    return finish(dirty, union_fixes(*parts), ctx)
