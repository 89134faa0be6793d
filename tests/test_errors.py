"""Tests for the hash-deterministic error injector."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.cells import TID, to_cells
from repro.errors import (
    ErrorSpec,
    inject,
    inner_spec,
    mixed_spec,
    outer_spec,
    observed_error_rate,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def base(spark):
    pdf = pd.DataFrame(
        {
            TID: range(400),
            "cat": [f"V{i % 7}" for i in range(400)],
            "num": [str(10 + (i % 50)) for i in range(400)],
            "txt": [f"Some Text Value {i % 13}" for i in range(400)],
        }
    )
    return spark.createDataFrame(pdf).cache()


def test_spec_validation():
    with pytest.raises(ValueError):
        ErrorSpec(rate=1.5, kinds=("typo",))
    with pytest.raises(ValueError):
        ErrorSpec(rate=0.1, kinds=("bogus",))
    with pytest.raises(ValueError):
        ErrorSpec(rate=0.1, kinds=("typo",), weights=(1, 2))


def test_zero_rate_is_identity(base):
    dirty = inject(base, ErrorSpec(rate=0.0, kinds=("typo",)), seed=3)
    assert observed_error_rate(dirty, base) == 0.0


@pytest.mark.parametrize("rate", [0.05, 0.2, 0.5])
def test_rate_control(base, rate):
    dirty = inject(base, mixed_spec(rate), seed=3, numeric_attrs=("num",))
    got = observed_error_rate(dirty, base)
    assert abs(got - rate) < 0.05


def test_determinism_under_repartition(base):
    spec = mixed_spec(0.3)
    d1 = inject(base, spec, seed=11, numeric_attrs=("num",))
    d2 = inject(
        base.repartition(7), spec, seed=11, numeric_attrs=("num",)
    )
    assert sorted(map(tuple, d1.collect())) == sorted(
        map(tuple, d2.collect())
    )


def test_different_seeds_differ(base):
    spec = mixed_spec(0.3)
    d1 = inject(base, spec, seed=1)
    d2 = inject(base, spec, seed=2)
    assert sorted(map(tuple, d1.collect())) != sorted(
        map(tuple, d2.collect())
    )


def test_inner_errors_stay_in_domain(base):
    dirty = inject(base, inner_spec(0.5), seed=5)
    domain = {r[0] for r in base.select("cat").distinct().collect()}
    got = {r[0] for r in dirty.select("cat").distinct().collect()}
    assert got <= domain


def test_inner_errors_change_values(base):
    dirty = inject(
        base, ErrorSpec(rate=1.0, kinds=("inner",)), seed=5
    )
    rate = observed_error_rate(dirty, base)
    assert rate > 0.9  # domain size > 1 for all columns


def test_missing_kind_produces_tokens_or_null(base):
    dirty = inject(base, ErrorSpec(rate=1.0, kinds=("missing",)), seed=5)
    vals = {r[0] for r in dirty.select("cat").distinct().collect()}
    assert vals <= {None, "", "N/A", "-"}


def test_typo_edits_single_character(base):
    dirty = inject(base, ErrorSpec(rate=1.0, kinds=("typo",)), seed=5)
    j = (
        to_cells(base, ["cat"]).withColumnRenamed("value", "cv")
        .join(to_cells(dirty, ["cat"]).withColumnRenamed("value", "dv"), TID)
    )
    lens = j.select(
        (F.length("dv") - F.length("cv")).alias("d")
    ).distinct()
    deltas = {r["d"] for r in lens.collect()}
    assert deltas <= {-1, 0, 1}


def test_formatting_preserves_letters(base):
    dirty = inject(
        base, ErrorSpec(rate=1.0, kinds=("formatting",)), seed=5
    )
    j = (
        to_cells(base, ["cat"]).withColumnRenamed("value", "cv")
        .join(to_cells(dirty, ["cat"]).withColumnRenamed("value", "dv"), TID)
        .select(
            F.lower(F.regexp_replace("cv", r"[^a-zA-Z0-9]", "")).alias("c"),
            F.lower(F.regexp_replace("dv", r"[^a-zA-Z0-9]", "")).alias("d"),
        )
    )
    assert j.where(F.col("c") != F.col("d")).count() == 0


def test_noise_keeps_numeric_parse(base):
    dirty = inject(
        base,
        ErrorSpec(rate=1.0, kinds=("noise",)),
        seed=5,
        numeric_attrs=("num",),
    )
    bad = dirty.where(
        F.expr("try_cast(num as double)").isNull()
    ).count()
    assert bad == 0


def test_noise_on_non_numeric_falls_back_to_typo(base):
    dirty = inject(base, ErrorSpec(rate=1.0, kinds=("noise",)), seed=5)
    # txt is not numeric -> typo fallback must still corrupt
    j = (
        to_cells(base, ["txt"]).withColumnRenamed("value", "cv")
        .join(to_cells(dirty, ["txt"]).withColumnRenamed("value", "dv"), TID)
    )
    changed = j.where(~F.col("cv").eqNullSafe(F.col("dv"))).count()
    assert changed > 350


def test_attrs_restriction(base):
    spec = ErrorSpec(rate=1.0, kinds=("missing",), attrs=("cat",))
    dirty = inject(base, spec, seed=5)
    same = (
        to_cells(base, ["num", "txt"]).withColumnRenamed("value", "cv")
        .join(
            to_cells(dirty, ["num", "txt"]).withColumnRenamed("value", "dv"),
            [TID, "attr"],
        )
        .where(~F.col("cv").eqNullSafe(F.col("dv")))
    )
    assert same.count() == 0


def test_observed_error_rate_oracle(base):
    """The audit equals a DuckDB per-cell diff count."""
    dirty = inject(base, mixed_spec(0.3), seed=3, numeric_attrs=("num",))
    got_rate = observed_error_rate(dirty, base)
    got = dirty.sparkSession.createDataFrame(
        [(float(got_rate),)], "rate double"
    )
    assert_equivalent(
        got,
        """
        SELECT
          sum(CASE WHEN d.cat IS DISTINCT FROM c.cat THEN 1 ELSE 0 END
            + CASE WHEN d.num IS DISTINCT FROM c.num THEN 1 ELSE 0 END
            + CASE WHEN d.txt IS DISTINCT FROM c.txt THEN 1 ELSE 0 END
          )::DOUBLE / (count(*) * 3) AS rate
        FROM dirty d JOIN clean c USING (tid)
        """,
        dirty=dirty,
        clean=base,
    )
