"""Tests for the detection substrate (violations, outliers, Raha-lite)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.cells import TID, to_cells
from repro.detect import outlier_cells, raha_lite, rule_violation_cells
from repro.detect.features import FEATURES, cell_features


def _truth_cells(dirty, clean):
    d = to_cells(dirty).withColumnRenamed("value", "dv")
    c = to_cells(clean).withColumnRenamed("value", "cv")
    return d.join(c, [TID, "attr"]).select(
        TID, "attr", (~F.col("dv").eqNullSafe(F.col("cv"))).alias("err")
    )


def _f1(det, dirty, clean):
    truth = _truth_cells(dirty, clean)
    j = truth.join(
        det.withColumn("flag", F.lit(True)), [TID, "attr"], "left"
    )
    row = j.agg(
        F.sum(F.col("err").cast("long")).alias("pos"),
        F.sum(F.col("flag").isNotNull().cast("long")).alias("det"),
        F.sum(
            (F.col("err") & F.col("flag").isNotNull()).cast("long")
        ).alias("tp"),
    ).collect()[0]
    p = (row["tp"] or 0) / max(row["det"] or 0, 1)
    r = (row["tp"] or 0) / max(row["pos"] or 0, 1)
    return 2 * p * r / (p + r) if (p + r) else 0.0


def test_rule_violation_cells_distinct(toy, toy_rules):
    det = rule_violation_cells(toy, toy_rules)
    assert det.count() == det.distinct().count()
    tids = {r[TID] for r in det.collect()}
    assert tids == {2, 3, 5}


def test_outlier_cells_flags_missing_tokens(spark):
    pdf = pd.DataFrame(
        {
            TID: range(100),
            "a": ["ok"] * 98 + [None, "N/A"],
        }
    )
    df = spark.createDataFrame(pdf)
    det = outlier_cells(df)
    tids = {r[TID] for r in det.collect()}
    assert {98, 99} <= tids


def test_outlier_cells_flags_numeric_outliers(spark):
    pdf = pd.DataFrame(
        {
            TID: range(100),
            "x": [str(50 + (i % 5)) for i in range(99)] + ["9999"],
        }
    )
    df = spark.createDataFrame(pdf)
    det = outlier_cells(df)
    assert 99 in {r[TID] for r in det.collect()}


def test_cell_features_schema_and_range(ds_hospital):
    feats = cell_features(ds_hospital.dirty, ds_hospital.rules)
    assert set(FEATURES) <= set(feats.columns)
    limited = feats.limit(200).collect()
    for r in limited:
        for f in FEATURES:
            assert r[f] in (0.0, 1.0)


def test_cell_features_covers_all_cells(ds_hospital):
    feats = cell_features(ds_hospital.dirty, ds_hospital.rules)
    n = ds_hospital.dirty.count()
    assert feats.count() == n * len(ds_hospital.attrs)


def test_raha_lite_beats_chance(ds_hospital, hospital_labeled, hospital_detections):
    f1 = _f1(hospital_detections, ds_hospital.dirty, ds_hospital.clean)
    # random flagging at the 3% error rate would score ~0.03 F1
    assert f1 > 0.3


def test_raha_lite_unsupervised_fallback(ds_hospital):
    det = raha_lite(ds_hospital.dirty, ds_hospital.rules, None, seed=7)
    assert det.count() > 0
    f1 = _f1(det, ds_hospital.dirty, ds_hospital.clean)
    assert f1 > 0.1


def test_raha_lite_deterministic(ds_hospital, hospital_labeled):
    d1 = raha_lite(
        ds_hospital.dirty, ds_hospital.rules, hospital_labeled, seed=3
    )
    d2 = raha_lite(
        ds_hospital.dirty, ds_hospital.rules, hospital_labeled, seed=3
    )
    assert sorted(map(tuple, d1.collect())) == sorted(
        map(tuple, d2.collect())
    )


def test_raha_lite_output_schema(hospital_detections):
    assert set(hospital_detections.columns) == {TID, "attr"}


@pytest.mark.parametrize("name", ["flights", "beers"])
def test_raha_lite_quality_other_datasets(spark, dataset_by_name, name):
    ds = dataset_by_name[name]
    labeled = ds.clean.orderBy(F.col(TID)).limit(20)
    det = raha_lite(ds.dirty, ds.rules, labeled, seed=7)
    f1 = _f1(det, ds.dirty, ds.clean)
    assert f1 > 0.4
