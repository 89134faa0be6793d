"""Shared test fixtures: tiny deterministic frames + scaled datasets.

Dataset fixtures are session-scoped and cached — generating them once
keeps the suite fast while every test still runs against real generator
output.
"""
from __future__ import annotations

import os

# Must run before the root conftest's spark fixture instantiates the
# session: tiny test frames do not need 64 shuffle partitions, and the
# suite is dominated by task-scheduling overhead otherwise.
os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

import pandas as pd
import pytest

import repro.repair  # noqa: F401  — populates the algorithm REGISTRY
from repro.core.cells import TID
from repro.datasets.registry import load
from repro.rules.model import FD, DenialConstraint, Predicate

#: Reduced generator scales for tests (paper scale = 1.0).
TEST_SCALES = {
    "hospital": 0.12,
    "flights": 0.12,
    "beers": 0.12,
    "rayyan": 0.25,
    "tax": 0.004,
}


@pytest.fixture(scope="session")
def toy(spark):
    """Six-row city/state relation with one FD violation (tid 3) and one
    unary-DC violation (tid 5, pop < 15)."""
    pdf = pd.DataFrame(
        {
            TID: range(6),
            "city": ["NY", "NY", "LA", "LA", "DET", "AUS"],
            "state": ["NY", "NY", "CA", "MI", "MI", "TX"],
            "pop": ["100", "100", "50", "50", "20", "10"],
        }
    )
    return spark.createDataFrame(pdf).cache()


@pytest.fixture(scope="session")
def toy_rules():
    fd = FD("city_state", ("city",), "state")
    unary = DenialConstraint(
        "pop_min", (Predicate("pop", "<", const="15", numeric=True),)
    )
    return [fd.to_dc(), unary]


@pytest.fixture(scope="session")
def toy_fd():
    return FD("city_state", ("city",), "state")


def _load_cached(spark, name):
    ds = load(name, spark, scale=TEST_SCALES[name], seed=7)
    ds.clean.cache().count()
    ds.dirty.cache().count()
    return ds


@pytest.fixture(scope="session")
def ds_hospital(spark):
    return _load_cached(spark, "hospital")


@pytest.fixture(scope="session")
def ds_flights(spark):
    return _load_cached(spark, "flights")


@pytest.fixture(scope="session")
def ds_beers(spark):
    return _load_cached(spark, "beers")


@pytest.fixture(scope="session")
def ds_rayyan(spark):
    return _load_cached(spark, "rayyan")


@pytest.fixture(scope="session")
def ds_tax(spark):
    return _load_cached(spark, "tax")


@pytest.fixture(scope="session")
def dataset_by_name(
    ds_hospital, ds_flights, ds_beers, ds_rayyan, ds_tax
):
    return {
        "hospital": ds_hospital,
        "flights": ds_flights,
        "beers": ds_beers,
        "rayyan": ds_rayyan,
        "tax": ds_tax,
    }


@pytest.fixture(scope="session")
def hospital_labeled(spark, ds_hospital):
    from pyspark.sql import functions as F

    return ds_hospital.clean.orderBy(F.col(TID)).limit(20).cache()


@pytest.fixture(scope="session")
def hospital_detections(spark, ds_hospital, hospital_labeled):
    from repro.detect import raha_lite

    det = raha_lite(
        ds_hospital.dirty, ds_hospital.rules, hospital_labeled, seed=7
    ).cache()
    det.count()
    return det
