"""Detection-guarded repair — the unified optimization of Section 4.4.

"We ensure that values identified as correct by detection methods remain
unaltered by data repair algorithms": run any repair algorithm, then
revert every change that lands on a cell the detector did *not* flag.
The guard is algorithm-agnostic, which is the point — it lifts
rule-driven methods (whose dominant failure mode is clobbering correct
cells) toward top-tier EDR, while barely moving data-driven methods that
already confine changes to detected cells.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, apply_fixes, diff_cells
from repro.core.context import RepairContext


def guarded_repair(
    algorithm: Callable[[DataFrame, RepairContext], DataFrame],
    dirty: DataFrame,
    ctx: RepairContext,
    detections: DataFrame,
) -> DataFrame:
    """Run ``algorithm`` and keep only changes on detector-flagged cells.

    ``detections`` is the (tid, attr) output of the error detector
    (Raha-lite in the paper's setup). Changes on unflagged cells are
    reverted to the dirty value.
    """
    repaired = algorithm(dirty, ctx)
    changes = diff_cells(dirty, repaired).select(
        TID, "attr", F.col("new_value")
    )
    kept = changes.join(
        detections.select(TID, "attr").distinct(),
        [TID, "attr"],
        "left_semi",
    )
    return apply_fixes(dirty, kept)
