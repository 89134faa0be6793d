"""Synthetic Flights: 2376 x 7, 30% native errors (MV, FI, VAD).

The real Flights benchmark is ~400 flights each reported by ~6 booking /
tracking sites with conflicting departure/arrival times, i.e. very high
value cardinality (times) and FDs from flight number to every time
attribute. The paper attributes the near-zero EDRs on Flights to that
cardinality; we reproduce it with minute-granular time strings.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import Dataset, scaled, to_spark
from repro.errors.inject import ErrorSpec, inject
from repro.rules.model import FD

_N_PAPER = 2376
_SOURCES = ["aa", "orbitz", "flightview", "travelocity", "expedia", "flightaware"]
_CARRIERS = ["AA", "UA", "DL", "WN", "B6", "AS", "NK", "F9"]
_PORTS = ["DFW", "PHX", "ORD", "LAX", "JFK", "SEA", "ATL", "DEN", "MIA", "BOS"]


def _fmt(minutes: int) -> str:
    """Minutes-past-midnight to the benchmark's '7:10 a.m.' format."""
    minutes %= 24 * 60
    h, m = divmod(minutes, 60)
    ap = "a.m." if h < 12 else "p.m."
    h12 = h % 12 or 12
    return f"{h12}:{m:02d} {ap}"


def flights(spark: SparkSession, *, scale: float = 1.0, seed: int = 0) -> Dataset:
    """Generate the Flights dataset at ``scale`` (1.0 = paper size)."""
    n = scaled(_N_PAPER, scale)
    g = np.random.default_rng(seed + 23)
    n_src = len(_SOURCES)
    n_fl = max(2, (n + n_src - 1) // n_src)

    carrier = [_CARRIERS[i % len(_CARRIERS)] for i in range(n_fl)]
    orig = [_PORTS[i % len(_PORTS)] for i in range(n_fl)]
    dest = [_PORTS[(i + 3) % len(_PORTS)] for i in range(n_fl)]
    flight_id = [
        f"{carrier[i]}-{1000 + i}-{orig[i]}-{dest[i]}" for i in range(n_fl)
    ]
    sched_dep = g.integers(5 * 60, 22 * 60, n_fl)
    duration = g.integers(60, 360, n_fl)
    dep_delay = g.integers(-5, 90, n_fl)
    arr_delay = dep_delay + g.integers(-10, 30, n_fl)

    per_flight = pd.DataFrame(
        {
            "flight": flight_id,
            "carrier": carrier,
            "sched_dep_time": [_fmt(t) for t in sched_dep],
            "act_dep_time": [_fmt(t) for t in sched_dep + dep_delay],
            "sched_arr_time": [_fmt(t) for t in sched_dep + duration],
            "act_arr_time": [
                _fmt(t) for t in sched_dep + duration + arr_delay
            ],
        }
    )
    rows = per_flight.loc[
        np.repeat(np.arange(n_fl), n_src)[:n]
    ].reset_index(drop=True)
    rows.insert(0, "src", [_SOURCES[i % n_src] for i in range(len(rows))])

    clean = to_spark(spark, rows)
    fds = [
        FD("fl_carrier", ("flight",), "carrier"),
        FD("fl_sdep", ("flight",), "sched_dep_time"),
        FD("fl_adep", ("flight",), "act_dep_time"),
        FD("fl_sarr", ("flight",), "sched_arr_time"),
        FD("fl_aarr", ("flight",), "act_arr_time"),
    ]
    rules = [f.to_dc() for f in fds]
    # Errors hit the 5 conflict-prone attrs; 0.42 over 5 of 7 columns
    # gives the ~30% whole-table rate of Table 5.
    spec = ErrorSpec(
        rate=0.42,
        kinds=("missing", "formatting", "inner"),
        weights=(2, 2, 1),
        attrs=(
            "sched_dep_time", "act_dep_time", "sched_arr_time",
            "act_arr_time", "carrier",
        ),
    )
    dirty = inject(clean, spec, seed=seed, numeric_attrs=())
    return Dataset(
        name="flights",
        clean=clean,
        dirty=dirty,
        rules=rules,
        numeric_attrs=(),
        label_attr="carrier",
        regression_attr=None,
        nominal_error_rate=0.30,
        error_types=("MV", "FI", "VAD"),
        native_spec=spec,
        seed=seed,
    )
