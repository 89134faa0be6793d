"""Tests for EDR / ER_F1 / ED_F1, oracle-checked against DuckDB."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.metrics import RepairScores, cell_outcomes, score_repair
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def triple(spark):
    """clean/dirty/repaired with a known outcome census:
    4 tuples x 2 attrs = 8 cells; OEC=3, DEC=1, IEC=1, changed=3."""
    clean = spark.createDataFrame(
        pd.DataFrame(
            {TID: [0, 1, 2, 3], "a": ["x", "x", "x", "x"],
             "b": ["1", "2", "3", "4"]}
        )
    )
    dirty = spark.createDataFrame(
        pd.DataFrame(
            {TID: [0, 1, 2, 3], "a": ["x", "y", "y", "x"],
             "b": ["1", "2", "9", "4"]}
        )
    )  # errors: (1,a), (2,a), (2,b)
    repaired = spark.createDataFrame(
        pd.DataFrame(
            {TID: [0, 1, 2, 3], "a": ["x", "x", "z", "x"],
             "b": ["1", "2", "9", "7"]}
        )
    )  # fixed (1,a); (2,a) wrong->wrong; introduced (3,b)
    return dirty, repaired, clean


def test_score_repair_counts(triple):
    s = score_repair(*triple)
    assert (s.oec, s.dec, s.iec) == (3, 1, 1)
    assert s.changed == 3
    assert s.correct_change == 1
    assert s.total_cells == 8


def test_edr_formula(triple):
    s = score_repair(*triple)
    assert s.edr == pytest.approx((1 - 1) / 3)


def test_er_f1(triple):
    s = score_repair(*triple)
    assert s.er_precision == pytest.approx(1 / 3)
    assert s.er_recall == pytest.approx(1 / 3)
    assert s.er_f1 == pytest.approx(1 / 3)


def test_ed_f1_from_disparities(triple):
    s = score_repair(*triple)
    # detected(changed)=3, of which truly dirty = changed - iec = 2
    assert s.ed_precision == pytest.approx(2 / 3)
    assert s.ed_recall == pytest.approx(2 / 3)
    assert s.ed_f1 == pytest.approx(2 / 3)


def test_identity_repair_scores_zero(triple):
    dirty, _, clean = triple
    s = score_repair(dirty, dirty, clean)
    assert s.edr == 0.0 and s.changed == 0 and s.er_f1 == 0.0


def test_perfect_repair_scores_one(triple):
    dirty, _, clean = triple
    s = score_repair(dirty, clean, clean)
    assert s.edr == 1.0
    assert s.er_f1 == 1.0
    assert s.ed_f1 == 1.0


def test_negative_edr_when_introducing_errors(triple):
    dirty, _, clean = triple
    # "repair" that only corrupts correct cells
    wrecked = dirty.withColumn(
        "b", F.when(F.col(TID) == 0, F.lit("666")).otherwise(F.col("b"))
    )
    s = score_repair(dirty, wrecked, clean)
    assert s.edr < 0


def test_score_repair_rejects_dropped_tuples(triple):
    dirty, repaired, clean = triple
    with pytest.raises(ValueError, match="dropped or duplicated"):
        score_repair(dirty, repaired.where(F.col(TID) != 0), clean)


def test_cell_outcomes_flags(triple):
    oc = {
        (r[TID], r["attr"]): r
        for r in cell_outcomes(*triple).collect()
    }
    assert oc[(1, "a")]["fixed"]
    assert oc[(2, "a")]["changed"] and not oc[(2, "a")]["fixed"]
    assert oc[(3, "b")]["introduced"]
    assert not oc[(0, "a")]["changed"]


def test_cell_outcomes_oracle(triple):
    """DEC/IEC/OEC match an equivalent DuckDB aggregation."""
    dirty, repaired, clean = triple
    oc = cell_outcomes(dirty, repaired, clean)
    got = oc.agg(
        F.sum(F.col("was_error").cast("long")).alias("oec"),
        F.sum(F.col("fixed").cast("long")).alias("dec"),
        F.sum(F.col("introduced").cast("long")).alias("iec"),
    )
    assert_equivalent(
        got,
        """
        WITH cells AS (
          SELECT d.tid, 'a' AS attr, d.a AS dv, r.a AS rv, c.a AS cv
          FROM dirty d JOIN rep r USING (tid) JOIN clean c USING (tid)
          UNION ALL
          SELECT d.tid, 'b', d.b, r.b, c.b
          FROM dirty d JOIN rep r USING (tid) JOIN clean c USING (tid)
        )
        SELECT
          sum(CASE WHEN dv IS DISTINCT FROM cv THEN 1 ELSE 0 END) AS oec,
          sum(CASE WHEN dv IS DISTINCT FROM cv
                    AND rv IS NOT DISTINCT FROM cv THEN 1 ELSE 0 END) AS dec,
          sum(CASE WHEN dv IS NOT DISTINCT FROM cv
                    AND rv IS DISTINCT FROM cv THEN 1 ELSE 0 END) AS iec
        FROM cells
        """,
        dirty=dirty,
        rep=repaired,
        clean=clean,
    )


def test_repair_scores_zero_division_safety():
    s = RepairScores(
        oec=0, dec=0, iec=0, changed=0, correct_change=0, total_cells=10
    )
    assert s.edr == 0.0 and s.er_f1 == 0.0 and s.ed_f1 == 0.0


def test_null_aware_fix_counts(spark):
    clean = spark.createDataFrame(
        pd.DataFrame({TID: [0], "a": ["v"]})
    )
    dirty = spark.createDataFrame(pd.DataFrame({TID: [0], "a": [None]}))
    s = score_repair(dirty, clean, clean)
    assert s.oec == 1 and s.dec == 1 and s.edr == 1.0
