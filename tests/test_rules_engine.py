"""Tests for the Spark violation engine, oracle-checked against DuckDB."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.oracle import assert_equivalent
from repro.rules.engine import (
    equivalence_classes,
    fd_class_majority,
    violating_pairs,
    violation_cells,
)
from repro.rules.model import FD, DenialConstraint, Predicate


def test_fd_violating_pairs(toy, toy_fd):
    pairs = violating_pairs(toy, toy_fd.to_dc()).collect()
    assert [(p["tid_1"], p["tid_2"]) for p in pairs] == [(2, 3)]


def test_fd_violating_pairs_oracle(toy, toy_fd):
    """The symmetric pair count matches DuckDB's self-join."""
    got = violating_pairs(toy, toy_fd.to_dc()).select(
        F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        """
        SELECT count(*) AS n
        FROM toy t1 JOIN toy t2
          ON t1.city = t2.city AND t1.state <> t2.state
         AND t1.tid < t2.tid
        """,
        toy=toy,
    )


def test_unary_dc_pairs(toy, toy_rules):
    unary = toy_rules[1]
    rows = violating_pairs(toy, unary).collect()
    assert [(r["tid_1"], r["tid_2"]) for r in rows] == [(5, None)]


def test_order_dc_pairs(spark):
    pdf = pd.DataFrame(
        {
            TID: [0, 1, 2],
            "state": ["A", "A", "B"],
            "salary": ["10", "20", "5"],
            "rate": ["5", "3", "9"],
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
    pairs = violating_pairs(df, dc).collect()
    # tid 1 earns more than tid 0 in the same state but pays lower rate.
    assert [(p["tid_1"], p["tid_2"]) for p in pairs] == [(1, 0)]


def test_violation_cells_fd(toy, toy_fd):
    cells = violation_cells(toy, [toy_fd.to_dc()]).collect()
    got = sorted((c[TID], c["attr"]) for c in cells)
    assert got == [(2, "city"), (2, "state"), (3, "city"), (3, "state")]


def test_violation_cells_null_rhs_not_implicated(spark, toy_fd):
    pdf = pd.DataFrame(
        {TID: [0, 1, 2], "city": ["X", "X", "X"], "state": ["A", "B", None]}
    )
    df = spark.createDataFrame(pdf)
    cells = violation_cells(df, [toy_fd.to_dc()])
    tids = {r[TID] for r in cells.collect()}
    assert tids == {0, 1}


def test_violation_cells_clean_dataset_empty(spark, dataset_by_name):
    ds = dataset_by_name["hospital"]
    assert violation_cells(ds.clean, ds.rules).count() == 0


@pytest.mark.parametrize("name", ["flights", "beers", "rayyan", "tax"])
def test_clean_satisfies_rules(dataset_by_name, name):
    ds = dataset_by_name[name]
    assert violation_cells(ds.clean, ds.rules).count() == 0


def test_equivalence_classes_drop_null_lhs(spark, toy_fd):
    pdf = pd.DataFrame(
        {TID: [0, 1], "city": [None, "X"], "state": ["A", "B"]}
    )
    df = spark.createDataFrame(pdf)
    cls = equivalence_classes(df, toy_fd).collect()
    assert len(cls) == 1 and cls[0]["key"] == "X"


def test_fd_class_majority(toy, toy_fd):
    rows = {
        r["key"]: r for r in fd_class_majority(toy, toy_fd).collect()
    }
    assert rows["NY"]["majority"] == "NY" and rows["NY"]["support"] == 2
    assert rows["LA"]["n_distinct"] == 2
    # tie in LA -> lexicographically smaller value wins
    assert rows["LA"]["majority"] == "CA"


def test_fd_class_majority_null_never_wins(spark, toy_fd):
    pdf = pd.DataFrame(
        {TID: [0, 1, 2], "city": ["X"] * 3, "state": [None, None, "A"]}
    )
    df = spark.createDataFrame(pdf)
    row = fd_class_majority(df, toy_fd).collect()[0]
    assert row["majority"] == "A"
    assert row["class_size"] == 3


def test_fd_class_majority_oracle(toy, toy_fd):
    """Class sizes match a DuckDB group-by."""
    got = fd_class_majority(toy, toy_fd).select(
        F.col("key"), F.col("class_size")
    )
    assert_equivalent(
        got,
        """
        SELECT city AS key, count(*) AS class_size
        FROM toy WHERE city IS NOT NULL GROUP BY city
        """,
        toy=toy,
    )


def test_multi_attr_lhs_equivalence(spark):
    fd = FD("f", ("a", "b"), "c")
    pdf = pd.DataFrame(
        {
            TID: [0, 1, 2],
            "a": ["x", "x", "x"],
            "b": ["1", "1", "2"],
            "c": ["p", "q", "p"],
        }
    )
    df = spark.createDataFrame(pdf)
    pairs = violating_pairs(df, fd.to_dc()).collect()
    assert [(p["tid_1"], p["tid_2"]) for p in pairs] == [(0, 1)]
