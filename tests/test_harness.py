"""Integration tests for the table harnesses (reduced scale)."""
import math

import pytest

from repro.harness.paper_numbers import (
    PAPER_TABLE4,
    PAPER_TABLE5,
    PAPER_TABLE6,
)
from repro.harness.table4 import run_table4
from repro.harness.table5 import run_table5
from repro.harness.table6 import run_table6
from repro.repair import ALGORITHMS, CATEGORY


def test_paper_numbers_complete():
    for metric, by_ds in PAPER_TABLE4.items():
        for ds, row in by_ds.items():
            assert set(row) == set(ALGORITHMS), (metric, ds)
    assert set(PAPER_TABLE5) == {
        "hospital", "flights", "beers", "rayyan", "tax"
    }
    for size, row in PAPER_TABLE6.items():
        assert set(row) == set(ALGORITHMS), size


def test_category_covers_all_algorithms():
    assert set(CATEGORY) == set(ALGORITHMS)


@pytest.mark.slow
def test_run_table4_smoke(spark):
    df = run_table4(
        spark,
        scale=0.08,
        seed=3,
        algorithms=("MLNClean", "Daisy"),
        datasets=("hospital",),
        budget_s=120,
    )
    assert len(df) == 2
    daisy = df[df.algorithm == "Daisy"].iloc[0]
    assert daisy["edr"] == 0.0
    mln = df[df.algorithm == "MLNClean"].iloc[0]
    assert mln["status"] == "ok"
    assert not math.isnan(mln["edr"])


@pytest.mark.slow
def test_run_table5_smoke(spark):
    df = run_table5(
        spark, scale=0.1, tax_scale=0.002, seed=3,
        datasets=("hospital", "tax"),
    )
    assert len(df) == 2
    for _, r in df.iterrows():
        assert abs(r["error_rate"] - r["nominal_rate"]) < 0.02
        assert r["n_attrs"] == PAPER_TABLE5[r["dataset"]][1]


@pytest.mark.slow
def test_run_table6_smoke(spark):
    df = run_table6(
        spark,
        sizes=(200, 400),
        seed=3,
        algorithms=("MLNClean", "Nadeef"),
        budget_s=120,
    )
    assert len(df) == 4
    ok = df[df.status == "ok"]
    assert (ok["seconds"] > 0).all()


@pytest.mark.slow
def test_run_table6_budget_gives_na(spark):
    df = run_table6(
        spark,
        sizes=(200,),
        seed=3,
        algorithms=("Relative",),
        budget_s=2.0,
    )
    assert df.iloc[0]["status"] == "n/a"
    assert df.iloc[0]["seconds"] is None
