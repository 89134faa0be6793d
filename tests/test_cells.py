"""Tests for the wide<->long cell substrate, with DuckDB oracle checks."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.cells import (
    TID,
    apply_fixes,
    data_attrs,
    diff_cells,
    from_cells,
    materialize,
    to_cells,
)
from repro.oracle import assert_equivalent


def test_data_attrs_excludes_tid(toy):
    assert data_attrs(toy) == ["city", "state", "pop"]


def test_to_cells_count(toy):
    assert to_cells(toy).count() == 6 * 3


def test_to_cells_oracle(toy):
    """Cell counts per attr match an UNPIVOT computed by DuckDB."""
    counts = (
        to_cells(toy)
        .groupBy("attr")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        counts,
        """
        SELECT attr, count(*) AS n FROM (
          SELECT 'city' AS attr FROM toy
          UNION ALL SELECT 'state' FROM toy
          UNION ALL SELECT 'pop' FROM toy
        ) GROUP BY attr
        """,
        toy=toy,
    )


def test_to_cells_subset(toy):
    c = to_cells(toy, ["city"])
    assert c.count() == 6
    assert set(r["attr"] for r in c.collect()) == {"city"}


def test_to_cells_requires_attrs(spark):
    df = spark.createDataFrame(pd.DataFrame({TID: [1]}))
    with pytest.raises(ValueError):
        to_cells(df)


def test_roundtrip_preserves_values(toy):
    cells = to_cells(toy)
    back = from_cells(cells, data_attrs(toy))
    assert sorted(map(tuple, back.collect())) == sorted(
        map(tuple, toy.collect())
    )


def test_roundtrip_preserves_nulls(spark):
    pdf = pd.DataFrame(
        {TID: [0, 1], "a": ["x", None], "b": [None, "y"]}
    )
    df = spark.createDataFrame(pdf)
    back = from_cells(to_cells(df), ["a", "b"])
    rows = {r[TID]: (r["a"], r["b"]) for r in back.collect()}
    assert rows == {0: ("x", None), 1: (None, "y")}


def test_apply_fixes_changes_only_target_cell(spark, toy):
    fixes = spark.createDataFrame(
        [(3, "state", "CA")], f"{TID} long, attr string, new_value string"
    )
    rep = apply_fixes(toy, fixes)
    d = diff_cells(toy, rep).collect()
    assert len(d) == 1
    assert (d[0][TID], d[0]["attr"], d[0]["new_value"]) == (3, "state", "CA")


def test_apply_fixes_to_null_wins(spark, toy):
    fixes = spark.createDataFrame(
        [(0, "pop", None)], f"{TID} long, attr string, new_value string"
    )
    rep = apply_fixes(toy, fixes)
    row = rep.where(F.col(TID) == 0).collect()[0]
    assert row["pop"] is None


def test_apply_fixes_duplicate_keys_deterministic(spark, toy):
    fixes = spark.createDataFrame(
        [(3, "state", "CA"), (3, "state", "AZ")],
        f"{TID} long, attr string, new_value string",
    )
    rep = apply_fixes(toy, fixes)
    row = rep.where(F.col(TID) == 3).collect()[0]
    assert row["state"] == "AZ"  # lexicographically smallest wins


def test_apply_fixes_empty_is_identity(spark, toy):
    fixes = spark.createDataFrame(
        [], f"{TID} long, attr string, new_value string"
    )
    rep = apply_fixes(toy, fixes)
    assert diff_cells(toy, rep).count() == 0


def test_diff_cells_nullsafe(spark):
    before = spark.createDataFrame(
        pd.DataFrame({TID: [0], "a": [None]})
    )
    after = spark.createDataFrame(pd.DataFrame({TID: [0], "a": ["x"]}))
    d = diff_cells(before, after).collect()
    assert len(d) == 1 and d[0]["old_value"] is None


def test_materialize_preserves_rows(toy):
    m = materialize(toy.withColumn("city", F.upper(F.col("city"))))
    assert m.count() == 6
    assert m.columns == toy.columns
