"""Synthetic Hospital: 1000 x 20, 3% native errors (T, VAD), heavy
redundancy, the largest rule set of the five datasets.

The real Hospital benchmark is ~50 providers x ~20 quality measures, so
every provider attribute repeats ~20x and every measure attribute ~50x —
the redundancy the paper credits for Hospital being "easier to repair".
We reproduce exactly that cross-product structure.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import Dataset, scaled, to_spark
from repro.errors.inject import ErrorSpec, inject
from repro.rules.model import FD

_N_PAPER = 1000
_STATES = ["AL", "AK", "AZ", "CA", "CO", "FL", "GA", "IL", "MA", "TX"]
_REGIONS = {s: ("SOUTH" if i % 2 else "WEST") for i, s in enumerate(_STATES)}
_CONDS = [
    "HEART ATTACK",
    "HEART FAILURE",
    "PNEUMONIA",
    "SURGICAL INFECTION",
    "CHILDRENS ASTHMA",
]
_OWNERS = [
    "GOVERNMENT - STATE",
    "GOVERNMENT - LOCAL",
    "PROPRIETARY",
    "VOLUNTARY NON-PROFIT",
]
_TYPES = ["ACUTE CARE", "CRITICAL ACCESS", "CHILDRENS"]


def hospital(spark: SparkSession, *, scale: float = 1.0, seed: int = 0) -> Dataset:
    """Generate the Hospital dataset at ``scale`` (1.0 = paper size)."""
    n = scaled(_N_PAPER, scale)
    g = np.random.default_rng(seed + 17)
    n_meas = 20
    n_hosp = max(3, (n + n_meas - 1) // n_meas)

    # Provider-side pools (each hospital row repeats across 20 measures).
    cities = [f"CITY{j:02d}" for j in range(max(3, n_hosp // 2))]
    city_state = {c: _STATES[i % len(_STATES)] for i, c in enumerate(cities)}
    city_county = {c: f"COUNTY{i % 12:02d}" for i, c in enumerate(cities)}
    city_zip = {c: f"{35000 + i * 7:05d}" for i, c in enumerate(cities)}
    hosp = pd.DataFrame(
        {
            "provider_id": [f"{10001 + i}" for i in range(n_hosp)],
            "city": [cities[i % len(cities)] for i in range(n_hosp)],
        }
    )
    hosp["name"] = [
        f"{c} GENERAL HOSPITAL {i}" for i, c in enumerate(hosp["city"])
    ]
    hosp["address"] = [
        f"{100 + 3 * i} MAIN STREET" for i in range(n_hosp)
    ]
    hosp["state"] = hosp["city"].map(city_state)
    hosp["zip"] = hosp["city"].map(city_zip)
    hosp["county"] = hosp["city"].map(city_county)
    hosp["phone"] = [f"{2056250000 + 13 * i}" for i in range(n_hosp)]
    hosp["hospital_type"] = [
        _TYPES[i % len(_TYPES)] for i in range(n_hosp)
    ]
    hosp["owner"] = [_OWNERS[i % len(_OWNERS)] for i in range(n_hosp)]
    hosp["emergency"] = ["YES" if i % 4 else "NO" for i in range(n_hosp)]
    hosp["region"] = hosp["state"].map(_REGIONS)
    hosp["beds"] = (50 + (np.arange(n_hosp) * 37) % 400).astype(str)

    # Measure-side pools.
    meas = pd.DataFrame(
        {
            "measure_code": [f"AMI-{m:02d}" for m in range(n_meas)],
            "measure_name": [
                f"{_CONDS[m % len(_CONDS)]} MEASURE {m:02d}"
                for m in range(n_meas)
            ],
            "condition": [_CONDS[m % len(_CONDS)] for m in range(n_meas)],
        }
    )

    rows = hosp.merge(meas, how="cross").head(n).reset_index(drop=True)
    k = len(rows)
    rows["score"] = np.round(
        55 + 40 * g.random(k), 1
    ).astype(str)
    rows["sample"] = [f"{int(s)} patients" for s in 20 + g.integers(0, 400, k)]
    # stateavg is determined by (state, measure_code).
    rows["stateavg"] = rows["state"] + "_" + rows["measure_code"] + "_AVG"
    rows["rating"] = ((rows.index * 7) % 5 + 1).astype(str)

    order = [
        "provider_id", "name", "address", "city", "state", "zip",
        "county", "phone", "hospital_type", "owner", "emergency",
        "region", "beds", "measure_code", "measure_name", "condition",
        "score", "sample", "stateavg", "rating",
    ]
    clean = to_spark(spark, rows[order])

    fds = [
        FD("zip_city", ("zip",), "city"),
        FD("zip_state", ("zip",), "state"),
        FD("zip_county", ("zip",), "county"),
        FD("city_state", ("city",), "state"),
        FD("city_county", ("city",), "county"),
        FD("prov_name", ("provider_id",), "name"),
        FD("prov_phone", ("provider_id",), "phone"),
        FD("prov_zip", ("provider_id",), "zip"),
        FD("mc_name", ("measure_code",), "measure_name"),
        FD("mc_cond", ("measure_code",), "condition"),
        FD("state_region", ("state",), "region"),
        FD("state_mc_avg", ("state", "measure_code"), "stateavg"),
    ]
    rules = [f.to_dc() for f in fds]
    spec = ErrorSpec(rate=0.03, kinds=("typo", "inner"), weights=(1, 1))
    numeric = ("score", "rating", "beds")
    dirty = inject(clean, spec, seed=seed, numeric_attrs=numeric)
    return Dataset(
        name="hospital",
        clean=clean,
        dirty=dirty,
        rules=rules,
        numeric_attrs=numeric,
        label_attr="owner",
        regression_attr="score",
        nominal_error_rate=0.03,
        error_types=("T", "VAD"),
        native_spec=spec,
        seed=seed,
    )
