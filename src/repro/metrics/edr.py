"""Error Drop Rate and repair/detection F1 — the paper's metric suite.

Given the dirty, repaired, and ground-truth clean frames, each cell falls
into one of the outcome classes below (all comparisons null-safe):

  * OEC  (original errors):        dirty != clean
  * DEC  (decreased errors):       dirty != clean AND repaired == clean
  * IEC  (introduced errors):      dirty == clean AND repaired != clean
  * changed:                       repaired != dirty
  * correct_change:                changed AND repaired == clean

``EDR = (DEC - IEC) / OEC`` (Section 4.1). Repair F1 (ER_F1) uses
precision = correct_change / changed and recall = DEC / OEC. Detection F1
(ED_F1) follows the paper's "consistent evaluation approach based on the
disparities between repaired and original cells": detected = changed,
actual = OEC cells.

All counting is one Spark aggregation over the three-way cell join; tests
cross-check it against an identical DuckDB query via ``repro.oracle``.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, to_cells


@dataclass(frozen=True)
class RepairScores:
    """All Table 4 numbers for one (algorithm, dataset) run."""

    oec: int
    dec: int
    iec: int
    changed: int
    correct_change: int
    total_cells: int

    @property
    def edr(self) -> float:
        """Error Drop Rate: (DEC - IEC) / OEC; 0 when no original errors."""
        return (self.dec - self.iec) / self.oec if self.oec else 0.0

    @property
    def er_precision(self) -> float:
        return self.correct_change / self.changed if self.changed else 0.0

    @property
    def er_recall(self) -> float:
        return self.dec / self.oec if self.oec else 0.0

    @property
    def er_f1(self) -> float:
        p, r = self.er_precision, self.er_recall
        return 2 * p * r / (p + r) if (p + r) else 0.0

    @property
    def ed_precision(self) -> float:
        """Of the cells the algorithm touched, how many were truly dirty."""
        if not self.changed:
            return 0.0
        true_pos = self.changed_on_dirty
        return true_pos / self.changed

    @property
    def changed_on_dirty(self) -> int:
        """Changed cells that were actually erroneous (detection TPs)."""
        # changed splits into: on originally-dirty cells vs IEC cells.
        return self.changed - self.iec

    @property
    def ed_recall(self) -> float:
        return self.changed_on_dirty / self.oec if self.oec else 0.0

    @property
    def ed_f1(self) -> float:
        p, r = self.ed_precision, self.ed_recall
        return 2 * p * r / (p + r) if (p + r) else 0.0


def cell_outcomes(
    dirty: DataFrame, repaired: DataFrame, clean: DataFrame
) -> DataFrame:
    """The three-way cell join with boolean outcome flags.

    Returns ``(tid, attr, dv, rv, cv, was_error, fixed, introduced,
    changed)`` — one row per cell. ``repaired`` frames missing some tids
    (an algorithm must not drop tuples — this raises downstream via a
    count check in ``score_repair``).
    """
    d = to_cells(dirty).withColumnRenamed("value", "dv")
    r = to_cells(repaired).withColumnRenamed("value", "rv")
    c = to_cells(clean).withColumnRenamed("value", "cv")
    j = d.join(r, [TID, "attr"]).join(c, [TID, "attr"])
    was_error = ~F.col("dv").eqNullSafe(F.col("cv"))
    changed = ~F.col("rv").eqNullSafe(F.col("dv"))
    fixed = was_error & F.col("rv").eqNullSafe(F.col("cv"))
    introduced = ~was_error & ~F.col("rv").eqNullSafe(F.col("cv"))
    return j.select(
        TID,
        "attr",
        "dv",
        "rv",
        "cv",
        was_error.alias("was_error"),
        fixed.alias("fixed"),
        introduced.alias("introduced"),
        changed.alias("changed"),
    )


def score_repair(
    dirty: DataFrame, repaired: DataFrame, clean: DataFrame
) -> RepairScores:
    """Compute all Table 4 metrics in one Spark aggregation."""
    oc = cell_outcomes(dirty, repaired, clean)
    row = oc.agg(
        F.count("*").alias("total"),
        F.sum(F.col("was_error").cast("long")).alias("oec"),
        F.sum(F.col("fixed").cast("long")).alias("dec"),
        F.sum(F.col("introduced").cast("long")).alias("iec"),
        F.sum(F.col("changed").cast("long")).alias("changed"),
        F.sum(
            (F.col("changed") & F.col("rv").eqNullSafe(F.col("cv"))).cast(
                "long"
            )
        ).alias("correct_change"),
    ).collect()[0]
    n_dirty = dirty.count()
    expected = n_dirty * len([c for c in dirty.columns if c != TID])
    if row["total"] != expected:
        raise ValueError(
            f"repaired frame does not cover the dirty frame: joined "
            f"{row['total']} cells, expected {expected} — the algorithm "
            "dropped or duplicated tuples"
        )
    return RepairScores(
        oec=int(row["oec"] or 0),
        dec=int(row["dec"] or 0),
        iec=int(row["iec"] or 0),
        changed=int(row["changed"] or 0),
        correct_change=int(row["correct_change"] or 0),
        total_cells=int(row["total"]),
    )
