"""Integration tests for the §4.3 sweeps, §4.4 optimization, and §4.5
downstream harnesses (reduced scale)."""
import pytest
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.downstream.tasks import evaluate_downstream
from repro.errors.inject import inner_spec, mixed_spec, outer_spec
from repro.harness.downstream_eval import run_downstream
from repro.harness.sweeps import run_error_sweep


@pytest.mark.slow
def test_error_sweep_rates_increase_errors(spark, ds_hospital):
    lo = ds_hospital.redirty(mixed_spec(0.1))
    hi = ds_hospital.redirty(mixed_spec(0.7))
    from repro.errors.inject import observed_error_rate

    assert observed_error_rate(hi, ds_hospital.clean) > observed_error_rate(
        lo, ds_hospital.clean
    )


@pytest.mark.slow
def test_inner_outer_specs_differ(ds_hospital):
    inner = ds_hospital.redirty(inner_spec(0.3))
    outer = ds_hospital.redirty(outer_spec(0.3))
    inner_vals = {
        r[0] for r in inner.select("owner").distinct().collect()
    }
    clean_vals = {
        r[0] for r in ds_hospital.clean.select("owner").distinct().collect()
    }
    # inner errors stay in-domain; outer errors invent values
    assert inner_vals <= clean_vals
    outer_vals = {
        r[0] for r in outer.select("owner").distinct().collect()
    }
    assert not (outer_vals <= clean_vals)


@pytest.mark.slow
def test_run_error_sweep_smoke(spark):
    df = run_error_sweep(
        spark,
        dataset="hospital",
        rates=(0.2,),
        kind="mixed",
        scale=0.08,
        seed=3,
        algorithms=("MLNClean",),
        budget_s=120,
        optimization=True,
    )
    assert len(df) == 1
    row = df.iloc[0]
    assert row["status"] == "ok"
    assert row["edr_guarded"] is not None
    # the guard can only reduce introduced errors
    assert row["edr_guarded"] >= row["edr"] - 1e-9


@pytest.mark.slow
def test_evaluate_downstream_clean_beats_shuffled(spark, ds_hospital):
    acc_clean = evaluate_downstream(
        ds_hospital.clean,
        label_attr=ds_hospital.label_attr,
        task="classification",
        model="nb",
        seed=3,
    )
    # destroy the feature-label relation by randomizing the label
    wrecked = ds_hospital.clean.withColumn(
        ds_hospital.label_attr,
        F.concat(
            F.lit("L"), (F.pmod(F.xxhash64(TID), F.lit(4))).cast("string")
        ),
    )
    acc_wrecked = evaluate_downstream(
        wrecked,
        label_attr=ds_hospital.label_attr,
        task="classification",
        model="nb",
        seed=3,
    )
    assert acc_clean > acc_wrecked + 0.1


@pytest.mark.slow
@pytest.mark.parametrize("model", ["mlp", "xgboost"])
def test_downstream_models_on_dataset(spark, ds_hospital, model):
    acc = evaluate_downstream(
        ds_hospital.clean,
        label_attr=ds_hospital.label_attr,
        task="classification",
        model=model,
        seed=3,
    )
    assert 0.0 <= acc <= 1.0


@pytest.mark.slow
def test_downstream_regression_mse(spark, ds_hospital):
    mse = evaluate_downstream(
        ds_hospital.clean,
        label_attr=ds_hospital.regression_attr,
        task="regression",
        model="xgboost",
        seed=3,
    )
    assert mse >= 0.0


@pytest.mark.slow
def test_run_downstream_smoke(spark):
    df = run_downstream(
        spark,
        dataset="hospital",
        rates=(0.3,),
        task="classification",
        model="nb",
        scale=0.08,
        seed=3,
        algorithms=("MLNClean",),
        budget_s=120,
    )
    variants = set(df["variant"])
    assert variants == {"clean", "dirty", "MLNClean"}
    assert df["score"].notna().all()


@pytest.mark.slow
def test_run_downstream_requires_target(spark):
    with pytest.raises(ValueError, match="no target"):
        run_downstream(
            spark,
            dataset="flights",
            task="regression",
            scale=0.05,
            rates=(0.1,),
        )
