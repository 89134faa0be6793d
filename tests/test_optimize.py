"""Tests for the §4.4 detection-guarded optimization strategy."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.budget import Budget
from repro.core.cells import TID, diff_cells
from repro.core.context import REGISTRY, RepairContext
from repro.metrics import score_repair
from repro.optimize import guarded_repair
from repro.rules.model import FD


@pytest.fixture(scope="module")
def world(spark):
    """One real error (tid 9) and one poisoned class Y whose repair would
    wreck correct cells. The detector flags only the real error."""
    pdf = pd.DataFrame(
        {
            TID: range(13),
            "k": ["X"] * 10 + ["Y"] * 3,
            "v": ["A"] * 10 + ["C", "C", "D"],
        }
    )
    clean = spark.createDataFrame(pdf).cache()
    d = pdf.copy()
    d.loc[9, "v"] = "B"  # real error in class X
    # class Y: clean holds {C, C, D}; a majority repair would flip the
    # correct D (tid 12) to C -> introduced error
    dirty = spark.createDataFrame(d).cache()
    det = spark.createDataFrame(
        [(9, "v")], f"{TID} long, attr string"
    ).cache()
    rules = [FD("k_v", ("k",), "v").to_dc()]
    return clean, dirty, det, rules


def test_guard_keeps_flagged_fixes(spark, world):
    clean, dirty, det, rules = world
    ctx = RepairContext(spark=spark, rules=rules, budget=Budget(None))
    rep = guarded_repair(REGISTRY["Horizon"], dirty, ctx, det)
    assert rep.where(F.col(TID) == 9).collect()[0]["v"] == "A"


def test_guard_reverts_unflagged_changes(spark, world):
    clean, dirty, det, rules = world
    ctx = RepairContext(spark=spark, rules=rules, budget=Budget(None))
    raw = REGISTRY["Horizon"](dirty, ctx)
    assert raw.where(F.col(TID) == 12).collect()[0]["v"] == "C"  # wrecked
    rep = guarded_repair(REGISTRY["Horizon"], dirty, ctx, det)
    assert rep.where(F.col(TID) == 12).collect()[0]["v"] == "D"  # reverted


def test_guard_improves_edr(spark, world):
    clean, dirty, det, rules = world
    ctx = RepairContext(spark=spark, rules=rules, budget=Budget(None))
    raw = score_repair(dirty, REGISTRY["Horizon"](dirty, ctx), clean)
    guarded = score_repair(
        dirty, guarded_repair(REGISTRY["Horizon"], dirty, ctx, det), clean
    )
    assert guarded.edr > raw.edr
    assert guarded.iec == 0


def test_guard_with_perfect_detection_never_hurts(spark, world):
    clean, dirty, _, rules = world
    perfect = spark.createDataFrame(
        [(9, "v")], f"{TID} long, attr string"
    )
    ctx = RepairContext(spark=spark, rules=rules, budget=Budget(None))
    rep = guarded_repair(REGISTRY["MLNClean"], dirty, ctx, perfect)
    changed = diff_cells(dirty, rep)
    assert changed.count() <= 1


def test_guard_empty_detections_is_identity(spark, world):
    clean, dirty, _, rules = world
    none = spark.createDataFrame([], f"{TID} long, attr string")
    ctx = RepairContext(spark=spark, rules=rules, budget=Budget(None))
    rep = guarded_repair(REGISTRY["Horizon"], dirty, ctx, none)
    assert diff_cells(dirty, rep).count() == 0
