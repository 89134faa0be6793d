"""Table 6 benchmark: runtime scaling on nested Tax prefixes.

Bench sizes default to 1k/2k/4k (env ``REPRO_BENCH_T6_SIZES``) so the
suite terminates; the shape claim (MLNClean fastest, pairwise methods
scaling worst) is asserted on the measured times. The paper-size run is
``python jobs/table6.py`` (see EXPERIMENTS.md).
"""
import os

import pytest

from repro.datasets.tax import tax, tax_prefix
from repro.harness.runner import detections_for, run_algorithm

_SIZES = tuple(
    int(x)
    for x in os.environ.get("REPRO_BENCH_T6_SIZES", "1000,2000,4000").split(",")
)
#: Algorithms benched for scaling: the fast tier + one pairwise method.
_ALGS = ("MLNClean", "Nadeef", "Horizon", "Unified", "Holistic", "BoostClean")
_BUDGET = float(os.environ.get("REPRO_BUDGET_S", "240"))

_RESULTS: dict[tuple[str, int], float | None] = {}


@pytest.fixture(scope="module")
def tax_base(spark):
    ds = tax(spark, scale=max(_SIZES) / 200_000, seed=0)
    ds.dirty.cache().count()
    ds.clean.cache().count()
    yield ds
    ds.dirty.unpersist()
    ds.clean.unpersist()


@pytest.mark.parametrize("size", _SIZES)
@pytest.mark.parametrize("alg", _ALGS)
def test_bench_table6_tax(benchmark, spark, tax_base, alg, size):
    ds = tax_prefix(tax_base, size)
    ds.dirty.cache().count()
    det = detections_for(ds, ds.dirty, 0).cache()
    det.count()

    def run():
        return run_algorithm(
            spark, alg, ds, ds.dirty,
            detections=det, budget_s=_BUDGET, seed=0, score=False,
        )

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    _RESULTS[(alg, size)] = res.seconds if res.status == "ok" else None
    benchmark.extra_info["status"] = res.status
    det.unpersist()
    ds.dirty.unpersist()


def test_bench_table6_shape():
    """Shape check after all runs: MLNClean is never slower than the
    pairwise Holistic at the largest completed size."""
    biggest = max(_SIZES)
    mln = _RESULTS.get(("MLNClean", biggest))
    hol = _RESULTS.get(("Holistic", biggest))
    assert mln is not None, "MLNClean must finish within budget"
    if hol is not None:
        assert mln <= hol * 1.5
