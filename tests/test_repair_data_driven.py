"""Tests for the data-driven algorithms: Baran and SCARE."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.budget import Budget
from repro.core.cells import TID, diff_cells
from repro.core.context import REGISTRY, RepairContext
from repro.metrics import score_repair


@pytest.fixture(scope="module")
def block_world(spark):
    """300 tuples with a deterministic attribute dependency a -> b and a
    handful of known errors flagged by a given detection set."""
    n = 300
    pdf = pd.DataFrame(
        {
            TID: range(n),
            "a": [f"A{i % 5}" for i in range(n)],
            "b": [f"B{i % 5}" for i in range(n)],
            "c": [f"C{i % 3}" for i in range(n)],
        }
    )
    clean = spark.createDataFrame(pdf).cache()
    dirty_pdf = pdf.copy()
    # errors on b at tids 0..9 (true value recoverable from a)
    for t in range(10):
        dirty_pdf.loc[t, "b"] = "WRONG"
    dirty = spark.createDataFrame(dirty_pdf).cache()
    det = spark.createDataFrame(
        [(t, "b") for t in range(10)], f"{TID} long, attr string"
    ).cache()
    return clean, dirty, det


def _ctx(spark, det, labeled=None, seed=0):
    return RepairContext(
        spark=spark,
        rules=[],
        labeled=labeled,
        detections=det,
        seed=seed,
        budget=Budget(120),
    )


def test_baran_repairs_detected_cells(spark, block_world):
    clean, dirty, det = block_world
    labeled = clean.where(F.col(TID) >= 280)
    rep = REGISTRY["Baran"](dirty, _ctx(spark, det, labeled))
    s = score_repair(dirty, rep, clean)
    assert s.dec >= 8  # vicinity model recovers b from a
    assert s.edr > 0.5


def test_baran_changes_only_detected_cells(spark, block_world):
    clean, dirty, det = block_world
    labeled = clean.where(F.col(TID) >= 280)
    rep = REGISTRY["Baran"](dirty, _ctx(spark, det, labeled))
    changed = diff_cells(dirty, rep).select(TID, "attr")
    outside = changed.join(det, [TID, "attr"], "left_anti")
    assert outside.count() == 0


def test_baran_without_labels_uses_default_weights(spark, block_world):
    clean, dirty, det = block_world
    rep = REGISTRY["Baran"](dirty, _ctx(spark, det, labeled=None))
    s = score_repair(dirty, rep, clean)
    assert s.edr > 0.0


def test_baran_fixes_formatting_via_value_model(spark):
    n = 60
    clean = spark.createDataFrame(
        pd.DataFrame(
            {TID: range(n), "a": ["Good Value"] * n}
        )
    )
    dirty_pdf = clean.toPandas()
    dirty_pdf.loc[0, "a"] = "  Good Value"
    dirty_pdf.loc[1, "a"] = "GOOD VALUE"
    dirty = spark.createDataFrame(dirty_pdf)
    det = spark.createDataFrame(
        [(0, "a"), (1, "a")], f"{TID} long, attr string"
    )
    labeled = clean.where(F.col(TID) >= 50)
    rep = REGISTRY["Baran"](dirty, _ctx(spark, det, labeled))
    rows = {r[TID]: r["a"] for r in rep.collect()}
    assert rows[0] == "Good Value"
    assert rows[1] == "Good Value"


def test_scare_conservative_changes(spark, block_world):
    clean, dirty, det = block_world
    rep = REGISTRY["Scare"](dirty, _ctx(spark, det))
    s = score_repair(dirty, rep, clean)
    # SCARE's margin keeps it conservative: no introduced errors here
    assert s.iec == 0
    assert s.dec >= 5  # NB recovers b from a in a clean block


def test_scare_respects_change_budget(spark):
    """At most one changed cell per tuple (bounded changes)."""
    n = 200
    pdf = pd.DataFrame(
        {
            TID: range(n),
            "a": [f"A{i % 4}" for i in range(n)],
            "b": [f"B{i % 4}" for i in range(n)],
            "c": [f"C{i % 4}" for i in range(n)],
        }
    )
    clean = spark.createDataFrame(pdf)
    dirty_pdf = pdf.copy()
    dirty_pdf.loc[0, "b"] = "X"
    dirty_pdf.loc[0, "c"] = "Y"
    dirty = spark.createDataFrame(dirty_pdf)
    det = spark.createDataFrame(
        [(0, "b"), (0, "c")], f"{TID} long, attr string"
    )
    rep = REGISTRY["Scare"](dirty, _ctx(spark, det))
    assert diff_cells(dirty, rep).where(F.col(TID) == 0).count() <= 1


def test_scare_without_detections_uses_outliers(spark, block_world):
    clean, dirty, _ = block_world
    ctx = RepairContext(
        spark=spark, rules=[], detections=None, budget=Budget(120)
    )
    rep = REGISTRY["Scare"](dirty, ctx)
    assert rep.count() == dirty.count()


@pytest.mark.parametrize("alg", ["Baran", "Scare"])
def test_data_driven_preserves_schema(spark, block_world, alg):
    clean, dirty, det = block_world
    labeled = clean.where(F.col(TID) >= 280)
    rep = REGISTRY[alg](dirty, _ctx(spark, det, labeled))
    assert set(rep.columns) == set(dirty.columns)
    assert rep.count() == dirty.count()
