"""Table 4 benchmark: one timed repair run per algorithm on Hospital.

Regenerates Table 4's Hospital column (EDR / ER_F1 / ED_F1) at bench
scale under a per-algorithm budget; "n/a" algorithms (Relative) assert
budget exhaustion instead of a score. The full four-dataset table is
produced by ``python jobs/table4.py`` (see EXPERIMENTS.md).
"""
import os

import pytest
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.datasets.registry import load
from repro.harness.runner import detections_for, run_algorithm
from repro.repair import ALGORITHMS

_SCALE = float(os.environ.get("REPRO_BENCH_T4_SCALE", "0.5"))
_BUDGET = float(os.environ.get("REPRO_BUDGET_S", "240"))


@pytest.fixture(scope="module")
def hospital_bench(spark):
    ds = load("hospital", spark, scale=_SCALE, seed=0)
    ds.dirty.cache().count()
    ds.clean.cache().count()
    det = detections_for(ds, ds.dirty, 0).cache()
    det.count()
    yield ds, det
    det.unpersist()
    ds.dirty.unpersist()
    ds.clean.unpersist()


@pytest.mark.parametrize("alg", ALGORITHMS)
def test_bench_table4_hospital(benchmark, spark, hospital_bench, alg):
    ds, det = hospital_bench

    def run():
        return run_algorithm(
            spark, alg, ds, ds.dirty,
            detections=det, budget_s=_BUDGET, seed=0,
        )

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    if alg == "Relative":
        assert res.status == "n/a"  # exponential lattice, as in the paper
        return
    assert res.status == "ok"
    benchmark.extra_info["edr"] = res.metric("edr")
    benchmark.extra_info["er_f1"] = res.metric("er_f1")
    benchmark.extra_info["ed_f1"] = res.metric("ed_f1")
    if alg == "Daisy":
        assert res.metric("edr") == 0.0
