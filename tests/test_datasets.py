"""Tests for the five synthetic dataset generators (Table 5 profiles)."""
import pytest
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.datasets.registry import DATASETS, TABLE4_DATASETS, load
from repro.datasets.tax import tax_prefix
from repro.errors.inject import observed_error_rate
from repro.harness.paper_numbers import PAPER_TABLE5
from repro.oracle import assert_equivalent

ALL = tuple(DATASETS)


@pytest.mark.parametrize("name", ALL)
def test_attr_count_matches_table5(dataset_by_name, name):
    ds = dataset_by_name[name]
    assert len(ds.attrs) == PAPER_TABLE5[name][1]


@pytest.mark.parametrize("name", ALL)
def test_tuple_count_scales(dataset_by_name, name):
    from tests.conftest import TEST_SCALES

    ds = dataset_by_name[name]
    expected = max(20, int(round(PAPER_TABLE5[name][0] * TEST_SCALES[name])))
    assert ds.clean.count() == expected


@pytest.mark.parametrize("name", ALL)
def test_tid_unique_and_dense(dataset_by_name, name):
    ds = dataset_by_name[name]
    n = ds.clean.count()
    stats = ds.clean.agg(
        F.count_distinct(TID).alias("nd"),
        F.min(TID).alias("lo"),
        F.max(TID).alias("hi"),
    ).collect()[0]
    assert stats["nd"] == n and stats["lo"] == 0 and stats["hi"] == n - 1


@pytest.mark.parametrize("name", ALL)
def test_native_error_rate_near_nominal(dataset_by_name, name):
    ds = dataset_by_name[name]
    got = observed_error_rate(ds.dirty, ds.clean)
    assert abs(got - ds.nominal_error_rate) < 0.35 * ds.nominal_error_rate + 0.01


@pytest.mark.parametrize("name", ALL)
def test_error_types_match_table5(dataset_by_name, name):
    ds = dataset_by_name[name]
    assert tuple(sorted(ds.error_types)) == tuple(
        sorted(PAPER_TABLE5[name][3])
    )


@pytest.mark.parametrize("name", ALL)
def test_numeric_attrs_parse_in_clean(dataset_by_name, name):
    ds = dataset_by_name[name]
    for a in ds.numeric_attrs:
        bad = ds.clean.where(
            F.expr(f"try_cast(`{a}` as double)").isNull()
        ).count()
        assert bad == 0, f"{name}.{a} has non-numeric clean values"


@pytest.mark.parametrize("name", ALL)
def test_clean_has_no_nulls(dataset_by_name, name):
    ds = dataset_by_name[name]
    conds = [F.col(a).isNull() for a in ds.attrs]
    pred = conds[0]
    for c in conds[1:]:
        pred = pred | c
    assert ds.clean.where(pred).count() == 0


@pytest.mark.parametrize("name", ALL)
def test_label_attr_exists_with_multiple_classes(dataset_by_name, name):
    ds = dataset_by_name[name]
    assert ds.label_attr in ds.attrs
    assert ds.clean.select(ds.label_attr).distinct().count() >= 2


@pytest.mark.parametrize("name", ["hospital", "beers", "tax"])
def test_regression_attr_is_numeric(dataset_by_name, name):
    ds = dataset_by_name[name]
    assert ds.regression_attr in ds.numeric_attrs


@pytest.mark.parametrize("name", ALL)
def test_generator_deterministic(spark, name):
    from tests.conftest import TEST_SCALES

    a = load(name, spark, scale=TEST_SCALES[name], seed=7)
    b = load(name, spark, scale=TEST_SCALES[name], seed=7)
    assert sorted(map(tuple, a.dirty.collect())) == sorted(
        map(tuple, b.dirty.collect())
    )


def test_hospital_redundancy(dataset_by_name):
    """Hospital must be redundancy-rich: each provider repeats ~20x."""
    ds = dataset_by_name["hospital"]
    reps = (
        ds.clean.groupBy("provider_id")
        .agg(F.count("*").alias("n"))
        .agg(F.avg("n"))
        .collect()[0][0]
    )
    assert reps >= 10


def test_flights_high_cardinality(dataset_by_name):
    """Flights time columns must be high-cardinality (paper's rationale
    for near-zero EDRs)."""
    ds = dataset_by_name["flights"]
    n = ds.clean.count()
    nd = ds.clean.select("sched_dep_time").distinct().count()
    assert nd > 0.15 * n


def test_beers_low_redundancy(dataset_by_name):
    ds = dataset_by_name["beers"]
    per_brew = (
        ds.clean.groupBy("brewery_id")
        .agg(F.count("*").alias("n"))
        .agg(F.avg("n"))
        .collect()[0][0]
    )
    assert per_brew < 10


def test_rayyan_titles_near_unique(dataset_by_name):
    ds = dataset_by_name["rayyan"]
    n = ds.clean.count()
    assert ds.clean.select("article_title").distinct().count() >= 0.95 * n


def test_tax_rate_monotone_within_state(dataset_by_name):
    """Clean Tax satisfies the salary/rate order DC by construction."""
    ds = dataset_by_name["tax"]
    got = ds.clean.select(F.count("*").alias("n")).where(F.lit(False))
    # direct check through the DuckDB oracle: zero violating pairs
    assert_equivalent(
        ds.clean.sparkSession.createDataFrame([(0,)], "n long"),
        """
        SELECT count(*) AS n FROM tax t1 JOIN tax t2
          ON t1.state = t2.state
         AND CAST(t1.salary AS DOUBLE) > CAST(t2.salary AS DOUBLE)
         AND CAST(t1.rate AS DOUBLE) < CAST(t2.rate AS DOUBLE)
        """,
        tax=ds.clean,
    )


def test_tax_prefix_nesting(dataset_by_name):
    ds = dataset_by_name["tax"]
    n = ds.clean.count()
    small = tax_prefix(ds, n // 2)
    big = tax_prefix(ds, n)
    assert small.clean.count() == n // 2
    assert big.clean.count() == n
    small_tids = {r[TID] for r in small.dirty.select(TID).collect()}
    big_tids = {r[TID] for r in big.dirty.select(TID).collect()}
    assert small_tids <= big_tids


def test_registry_rejects_unknown():
    import pyspark

    with pytest.raises(KeyError, match="unknown dataset"):
        load("nope", None)  # type: ignore[arg-type]


def test_table4_datasets_constant():
    assert TABLE4_DATASETS == ("hospital", "flights", "beers", "rayyan")
