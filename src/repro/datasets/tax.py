"""Synthetic Tax: 200 000 x 15, 4% native errors (T, FI, VAD) — the
BART-repository scalability dataset.

BART's tax schema carries the classic order denial constraint (same
state, higher salary implies tax rate at least as high) plus zip/area-code
geography FDs and unary exemption rules. Table 6 runs nested prefixes
Tax-10k ... Tax-50k; ``tax_prefix`` slices them so larger subsets contain
the smaller ones exactly as in the paper.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.cells import TID
from repro.datasets.base import Dataset, scaled, to_spark
from repro.errors.inject import ErrorSpec, inject
from repro.rules.model import DenialConstraint, FD, Predicate

_N_PAPER = 200_000
_STATES = [f"ST{i:02d}" for i in range(20)]
_FNAMES = [
    "ALICE", "BRUNO", "CARLA", "DEION", "ELENA", "FARID", "GRETA",
    "HUGO", "IRENE", "JONAS", "KARIM", "LAILA", "MARCO", "NADIA",
    "OMAR", "PRIYA",
]
_LNAMES = [
    "ADAMS", "BAKER", "CRUZ", "DOYLE", "EVANS", "FOSTER", "GOMEZ",
    "HAYES", "IRWIN", "JONES", "KELLER", "LOPEZ", "MASON", "NGUYEN",
]


def tax(spark: SparkSession, *, scale: float = 1.0, seed: int = 0) -> Dataset:
    """Generate the Tax dataset at ``scale`` (1.0 = 200k tuples)."""
    n = scaled(_N_PAPER, scale)
    g = np.random.default_rng(seed + 53)

    n_cities = 200
    city_state_idx = np.arange(n_cities) % len(_STATES)
    city_names = np.array([f"TOWN{i:03d}" for i in range(n_cities)])
    zips = np.array([f"{60000 + 11 * i:05d}" for i in range(n_cities)])
    area_by_state = np.array([f"{200 + 5 * i}" for i in range(len(_STATES))])
    base_rate = np.array([2.0 + 0.25 * i for i in range(len(_STATES))])

    ci = g.integers(0, n_cities, n)
    si = city_state_idx[ci]
    salary = (20_000 + g.integers(0, 180, n) * 1_000).astype(np.int64)
    # Rate is a monotone function of salary within a state, so the clean
    # data satisfies the order DC by construction.
    rate = base_rate[si] + (salary // 20_000) * 0.5
    marital = np.where(g.random(n) < 0.45, "M", "S")
    child = np.where(g.random(n) < 0.4, "Y", "N")
    rows = pd.DataFrame(
        {
            "fname": [ _FNAMES[int(x)] for x in g.integers(0, len(_FNAMES), n)],
            "lname": [ _LNAMES[int(x)] for x in g.integers(0, len(_LNAMES), n)],
            "gender": np.where(g.random(n) < 0.5, "F", "M"),
            "area_code": area_by_state[si],
            "phone": [f"{5550000 + 7 * i}" for i in range(n)],
            "city": city_names[ci],
            "state": np.array(_STATES)[si],
            "zip": zips[ci],
            "marital_status": marital,
            "has_child": child,
            "salary": salary.astype(str),
            "rate": np.round(rate, 2).astype(str),
            "single_exemp": np.where(marital == "S", "1000", "0"),
            "married_exemp": np.where(marital == "M", "2000", "0"),
            "child_exemp": np.where(child == "Y", "1500", "0"),
        }
    )
    clean = to_spark(spark, rows)

    fds = [
        FD("zip_city", ("zip",), "city"),
        FD("zip_state", ("zip",), "state"),
        FD("area_state", ("area_code",), "state"),
        FD("marital_single", ("marital_status",), "single_exemp"),
        FD("marital_married", ("marital_status",), "married_exemp"),
        FD("child_exempt", ("has_child",), "child_exemp"),
    ]
    rules = [f.to_dc() for f in fds] + [
        # Same state, strictly higher salary => rate must not be lower.
        DenialConstraint(
            "salary_rate_order",
            (
                Predicate("state", "=", rhs="state"),
                Predicate("salary", ">", rhs="salary", numeric=True),
                Predicate("rate", "<", rhs="rate", numeric=True),
            ),
        ),
        DenialConstraint(
            "no_child_no_exemp",
            (
                Predicate("has_child", "=", const="N"),
                Predicate("child_exemp", "!=", const="0"),
            ),
        ),
    ]
    spec = ErrorSpec(
        rate=0.04,
        kinds=("typo", "formatting", "inner"),
        weights=(1, 1, 1),
    )
    numeric = ("salary", "rate", "single_exemp", "married_exemp", "child_exemp")
    dirty = inject(clean, spec, seed=seed, numeric_attrs=numeric)
    return Dataset(
        name="tax",
        clean=clean,
        dirty=dirty,
        rules=rules,
        numeric_attrs=numeric,
        label_attr="marital_status",
        regression_attr="salary",
        nominal_error_rate=0.04,
        error_types=("T", "FI", "VAD"),
        native_spec=spec,
        seed=seed,
    )


def tax_prefix(ds: Dataset, k: int) -> Dataset:
    """The Tax-k prefix subset (Table 6): tuples with tid < k.

    Larger prefixes contain the smaller ones exactly, matching "the larger
    datasets encompass the entirety of the smaller ones".
    """

    def cut(df: DataFrame) -> DataFrame:
        return df.where(F.col(TID) < k)

    return Dataset(
        name=f"tax-{k // 1000}k",
        clean=cut(ds.clean),
        dirty=cut(ds.dirty),
        rules=ds.rules,
        numeric_attrs=ds.numeric_attrs,
        label_attr=ds.label_attr,
        regression_attr=ds.regression_attr,
        nominal_error_rate=ds.nominal_error_rate,
        error_types=ds.error_types,
        native_spec=ds.native_spec,
        seed=ds.seed,
    )
