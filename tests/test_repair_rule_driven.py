"""Tests for the rule-driven algorithms: Holistic, BigDansing, Horizon,
Nadeef, MLNClean, Daisy."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.budget import Budget, BudgetExceeded
from repro.core.cells import TID, diff_cells
from repro.core.context import REGISTRY, RepairContext
from repro.repair.daisy import probabilistic_answers
from repro.rules.model import FD, DenialConstraint, Predicate


def _ctx(spark, rules, budget=None, **kw):
    return RepairContext(
        spark=spark, rules=rules, budget=Budget(budget), **kw
    )


@pytest.fixture(scope="module")
def fd_frame(spark):
    """One big class (X: 9x A, 1x B) and one tied class (Y: A/B)."""
    pdf = pd.DataFrame(
        {
            TID: range(12),
            "k": ["X"] * 10 + ["Y"] * 2,
            "v": ["A"] * 9 + ["B"] + ["A", "B"],
        }
    )
    return spark.createDataFrame(pdf).cache()


@pytest.fixture(scope="module")
def fd_rules():
    return [FD("k_v", ("k",), "v").to_dc()]


@pytest.mark.parametrize("alg", ["Holistic", "BigDansing"])
def test_majority_repair_on_dominated_class(spark, fd_frame, fd_rules, alg):
    rep = REGISTRY[alg](fd_frame, _ctx(spark, fd_rules))
    row = rep.where(F.col(TID) == 9).collect()[0]
    assert row["v"] == "A"  # minority repaired to strict majority


@pytest.mark.parametrize("alg", ["Holistic", "BigDansing"])
def test_arbitrary_choice_on_tie(spark, fd_frame, fd_rules, alg):
    """No strict majority in class Y -> smallest value imposed on both."""
    rep = REGISTRY[alg](fd_frame, _ctx(spark, fd_rules))
    vals = {
        r["v"] for r in rep.where(F.col("k") == "Y").collect()
    }
    assert vals == {"A"}


def test_mlnclean_skips_unreliable_class(spark, fd_frame, fd_rules):
    """The tied Y class is below the reliability threshold -> untouched."""
    rep = REGISTRY["MLNClean"](fd_frame, _ctx(spark, fd_rules))
    vals = sorted(
        r["v"] for r in rep.where(F.col("k") == "Y").collect()
    )
    assert vals == ["A", "B"]
    assert rep.where(F.col(TID) == 9).collect()[0]["v"] == "A"


def test_mlnclean_fusion_veto(spark):
    """A second FD that confirms the current value vetoes the repair."""
    pdf = pd.DataFrame(
        {
            TID: range(6),
            "city": ["c1", "c1", "c1", "c2", "c2", "c1"],
            "zip": ["z1", "z1", "z1", "z2", "z2", "z6"],
            "state": ["S1", "S1", "S1", "S2", "S2", "S2"],
        }
    )
    # tid 5: city wrongly says c1 (class majority S1) but its own zip z6
    # has no other members; without the confirm veto city->state would
    # wrongly flip S2 -> S1. Add zip z2 membership instead to confirm.
    pdf.loc[5, "zip"] = "z2"
    df = spark.createDataFrame(pdf)
    rules = [
        FD("city_state", ("city",), "state").to_dc(),
        FD("zip_state", ("zip",), "state").to_dc(),
    ]
    rep = REGISTRY["MLNClean"](df, _ctx(spark, rules))
    assert rep.where(F.col(TID) == 5).collect()[0]["state"] == "S2"


def test_horizon_repairs_with_pattern_graph(spark, fd_frame, fd_rules):
    rep = REGISTRY["Horizon"](fd_frame, _ctx(spark, fd_rules))
    assert rep.where(F.col(TID) == 9).collect()[0]["v"] == "A"
    assert rep.count() == 12


def test_horizon_sequential_cascade(spark):
    """Repairing fd1 first enables fd2's class to agree."""
    pdf = pd.DataFrame(
        {
            TID: range(4),
            "a": ["p", "p", "p", "q"],
            "b": ["1", "1", "2", "3"],
            "c": ["u", "u", "u", "w"],
        }
    )
    df = spark.createDataFrame(pdf)
    rules = [
        FD("a_b", ("a",), "b").to_dc(),
        FD("b_c", ("b",), "c").to_dc(),
    ]
    rep = REGISTRY["Horizon"](df, _ctx(spark, rules))
    assert rep.where(F.col(TID) == 2).collect()[0]["b"] == "1"


def test_nadeef_partner_copy_semantics(spark, fd_frame, fd_rules):
    """Lowest-tid tuple's value propagates through the class."""
    rep = REGISTRY["Nadeef"](fd_frame, _ctx(spark, fd_rules))
    x_vals = {r["v"] for r in rep.where(F.col("k") == "X").collect()}
    assert x_vals == {"A"}  # tid 0 holds A
    y_vals = {r["v"] for r in rep.where(F.col("k") == "Y").collect()}
    assert y_vals == {"A"}  # tid 10 holds A


def test_nadeef_propagates_leader_errors(spark):
    """When the lowest tid is dirty, Nadeef spreads the error — the
    mechanism behind its strongly negative EDR."""
    pdf = pd.DataFrame(
        {
            TID: range(5),
            "k": ["X"] * 5,
            "v": ["BAD", "A", "A", "A", "A"],
        }
    )
    df = spark.createDataFrame(pdf)
    rep = REGISTRY["Nadeef"](
        df, _ctx(spark, [FD("k_v", ("k",), "v").to_dc()])
    )
    assert {r["v"] for r in rep.collect()} == {"BAD"}


def test_unary_dc_mode_repair(spark):
    pdf = pd.DataFrame(
        {TID: range(5), "abv": ["0.05", "0.05", "0.05", "0.9", "0.06"]}
    )
    df = spark.createDataFrame(pdf)
    rules = [
        DenialConstraint(
            "abv_max", (Predicate("abv", ">", const="0.2", numeric=True),)
        )
    ]
    rep = REGISTRY["Holistic"](df, _ctx(spark, rules))
    assert rep.where(F.col(TID) == 3).collect()[0]["abv"] == "0.05"


def test_order_dc_boundary_repair(spark):
    pdf = pd.DataFrame(
        {
            TID: range(3),
            "state": ["A", "A", "A"],
            "salary": ["10", "20", "30"],
            "rate": ["5", "2", "6"],
        }
    )
    df = spark.createDataFrame(pdf)
    dc = DenialConstraint(
        "o",
        (
            Predicate("state", "=", rhs="state"),
            Predicate("salary", ">", rhs="salary", numeric=True),
            Predicate("rate", "<", rhs="rate", numeric=True),
        ),
    )
    rep = REGISTRY["Holistic"](df, _ctx(spark, [dc]))
    # tid 1 (salary 20, rate 2) violates against tid 0 -> raised to 5
    assert rep.where(F.col(TID) == 1).collect()[0]["rate"] == "5"


def test_daisy_is_identity(spark, fd_frame, fd_rules):
    rep = REGISTRY["Daisy"](fd_frame, _ctx(spark, fd_rules))
    assert diff_cells(fd_frame, rep).count() == 0


def test_daisy_probabilistic_answers(spark, fd_frame, fd_rules):
    ans = probabilistic_answers(fd_frame, _ctx(spark, fd_rules))
    rows = ans.where(
        (F.col(TID) == 9) & (F.col("attr") == "v")
    ).collect()
    probs = {r["candidate"]: r["probability"] for r in rows}
    assert probs["A"] == pytest.approx(0.9)
    assert probs["B"] == pytest.approx(0.1)


@pytest.mark.parametrize(
    "alg", ["Holistic", "BigDansing", "Horizon", "Nadeef", "MLNClean"]
)
def test_rule_driven_respects_budget(spark, fd_frame, fd_rules, alg):
    with pytest.raises(BudgetExceeded):
        REGISTRY[alg](fd_frame, _ctx(spark, fd_rules, budget=0.0))


@pytest.mark.parametrize(
    "alg",
    ["Holistic", "BigDansing", "Horizon", "Nadeef", "MLNClean", "Daisy"],
)
def test_rule_driven_preserves_tuples(spark, fd_frame, fd_rules, alg):
    rep = REGISTRY[alg](fd_frame, _ctx(spark, fd_rules))
    assert rep.count() == fd_frame.count()
    assert set(rep.columns) == set(fd_frame.columns)
