"""Table 5 benchmark: dataset generation + native-error audit.

Times each generator end-to-end (clean synthesis, hash-deterministic
corruption, error-rate audit) at bench scale.
"""
import pytest

from repro.datasets.registry import load
from repro.errors.inject import observed_error_rate
from repro.harness.paper_numbers import PAPER_TABLE5

#: Bench scales: Table 4 datasets near paper size; Tax capped.
BENCH_SCALES = {
    "hospital": 1.0,
    "flights": 1.0,
    "beers": 1.0,
    "rayyan": 1.0,
    "tax": 0.01,
}


@pytest.mark.parametrize("name", list(BENCH_SCALES))
def test_bench_dataset_generation(benchmark, spark, name):
    def run():
        ds = load(name, spark, scale=BENCH_SCALES[name], seed=0)
        rate = observed_error_rate(ds.dirty, ds.clean)
        return ds.clean.count(), rate

    n, rate = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n > 0
    assert abs(rate - PAPER_TABLE5[name][2]) < 0.1
