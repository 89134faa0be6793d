"""Tests for the rule&data-driven algorithms: HoloClean, Unified,
Relative — and the model-driven BoostClean."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.budget import Budget, BudgetExceeded
from repro.core.cells import TID, diff_cells
from repro.core.context import REGISTRY, RepairContext
from repro.metrics import score_repair
from repro.rules.model import FD


def _ctx(spark, rules, budget=None, **kw):
    return RepairContext(
        spark=spark, rules=rules, budget=Budget(budget), **kw
    )


@pytest.fixture(scope="module")
def redundant_world(spark):
    """Redundancy-rich frame (Hospital-like): k determines v and w; two
    seeded errors plus one missing value."""
    n = 240
    pdf = pd.DataFrame(
        {
            TID: range(n),
            "k": [f"K{i % 8}" for i in range(n)],
            "v": [f"V{i % 8}" for i in range(n)],
            "w": [f"W{i % 8}" for i in range(n)],
        }
    )
    clean = spark.createDataFrame(pdf).cache()
    d = pdf.copy()
    d.loc[0, "v"] = "V7"   # inner error (valid domain value)
    d.loc[1, "v"] = "Vx"   # typo
    d.loc[2, "w"] = None   # missing
    dirty = spark.createDataFrame(d).cache()
    rules = [
        FD("k_v", ("k",), "v").to_dc(),
        FD("k_w", ("k",), "w").to_dc(),
    ]
    return clean, dirty, rules


def test_holoclean_repairs_with_consensus(spark, redundant_world):
    clean, dirty, rules = redundant_world
    rep = REGISTRY["HoloClean"](dirty, _ctx(spark, rules))
    s = score_repair(dirty, rep, clean)
    assert s.dec >= 2
    assert s.edr > 0.3


def test_holoclean_fills_missing(spark, redundant_world):
    clean, dirty, rules = redundant_world
    rep = REGISTRY["HoloClean"](dirty, _ctx(spark, rules))
    assert rep.where(F.col(TID) == 2).collect()[0]["w"] == "W2"


def test_holoclean_commits_map_without_threshold(spark):
    """On sparse data the MAP candidate overrides a *correct* minority
    value — HoloClean's negative-EDR mechanism on Beers/Rayyan. Tuple 2's
    v='B' is legitimate, but the class consensus 'A' is committed."""
    pdf = pd.DataFrame(
        {
            TID: range(3),
            "k": ["a", "a", "a"],
            "v": ["A", "A", "B"],
        }
    )
    dirty = spark.createDataFrame(pdf)
    rules = [FD("k_v", ("k",), "v").to_dc()]
    rep = REGISTRY["HoloClean"](dirty, _ctx(spark, rules))
    assert rep.where(F.col(TID) == 2).collect()[0]["v"] == "A"


def test_unified_repairs_dominated_class(spark, redundant_world):
    clean, dirty, rules = redundant_world
    rep = REGISTRY["Unified"](dirty, _ctx(spark, rules))
    s = score_repair(dirty, rep, clean)
    assert s.dec >= 2 and s.iec == 0


def test_unified_tolerates_diverse_class(spark):
    """A class with many distinct deviants is cheaper to fix by rule
    amendment -> data untouched (tolerant repair)."""
    pdf = pd.DataFrame(
        {
            TID: range(8),
            "k": ["X"] * 8,
            "v": ["A", "A", "B", "C", "D", "E", "F", "G"],
        }
    )
    dirty = spark.createDataFrame(pdf)
    rules = [FD("k_v", ("k",), "v").to_dc()]
    rep = REGISTRY["Unified"](dirty, _ctx(spark, rules))
    assert diff_cells(dirty, rep).count() == 0


def test_relative_completes_on_tiny_lattice(spark):
    pdf = pd.DataFrame(
        {
            TID: range(10),
            "k": ["X"] * 5 + ["Y"] * 5,
            "v": ["A"] * 4 + ["B"] + ["C"] * 5,
        }
    )
    clean_pdf = pdf.copy()
    clean_pdf.loc[4, "v"] = "A"
    dirty = spark.createDataFrame(pdf)
    clean = spark.createDataFrame(clean_pdf)
    rules = [FD("k_v", ("k",), "v").to_dc()]
    rep = REGISTRY["Relative"](dirty, _ctx(spark, rules, budget=120))
    s = score_repair(dirty, rep, clean)
    assert s.dec == 1


def test_relative_exhausts_budget_on_wide_relation(spark, ds_hospital):
    """The 20-attribute lattice is exponential: n/a, as in Table 4."""
    ctx = _ctx(spark, ds_hospital.rules, budget=3.0)
    with pytest.raises(BudgetExceeded):
        REGISTRY["Relative"](ds_hospital.dirty, ctx)


def test_boostclean_runs_and_preserves_tuples(spark, redundant_world):
    clean, dirty, rules = redundant_world
    ctx = _ctx(spark, rules, budget=120, label_attr="k")
    rep = REGISTRY["BoostClean"](dirty, ctx)
    assert rep.count() == dirty.count()


def test_boostclean_imputes_flagged_cells_columnwide(spark):
    """Accepted repairs hit every flagged cell with a column constant —
    the IEC mechanism behind its very negative EDR."""
    n = 120
    pdf = pd.DataFrame(
        {
            TID: range(n),
            "x": [str(10 + i % 3) for i in range(n)],
            "lab": [f"L{(10 + i % 3) != 11:d}" for i in range(n)],
        }
    )
    d = pdf.copy()
    # numeric outliers in x
    for t in range(5):
        d.loc[t, "x"] = "9999"
    dirty = spark.createDataFrame(d)
    ctx = _ctx(spark, [], budget=120, label_attr="lab")
    rep = REGISTRY["BoostClean"](dirty, ctx)
    changed = diff_cells(dirty, rep)
    # either no repair accepted, or all flagged outliers share one value
    if changed.count():
        new_vals = {r["new_value"] for r in changed.collect()}
        assert len(new_vals) == 1


@pytest.mark.parametrize("alg", ["HoloClean", "Unified", "BoostClean"])
def test_rule_data_driven_preserve_schema(spark, redundant_world, alg):
    clean, dirty, rules = redundant_world
    ctx = _ctx(spark, rules, budget=120, label_attr="k")
    rep = REGISTRY[alg](dirty, ctx)
    assert set(rep.columns) == set(dirty.columns)
    assert rep.count() == dirty.count()
