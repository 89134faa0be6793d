"""Dataset registry keyed by the paper's names."""
from __future__ import annotations

from typing import Callable

from pyspark.sql import SparkSession

from repro.datasets.base import Dataset
from repro.datasets.beers import beers
from repro.datasets.flights import flights
from repro.datasets.hospital import hospital
from repro.datasets.rayyan import rayyan
from repro.datasets.tax import tax

DATASETS: dict[str, Callable[..., Dataset]] = {
    "hospital": hospital,
    "flights": flights,
    "beers": beers,
    "rayyan": rayyan,
    "tax": tax,
}

#: The four real-world datasets of Table 4 (Tax is Table 6 only).
TABLE4_DATASETS = ("hospital", "flights", "beers", "rayyan")


def load(
    name: str, spark: SparkSession, *, scale: float = 1.0, seed: int = 0
) -> Dataset:
    """Instantiate a dataset by paper name at a generator scale."""
    try:
        gen = DATASETS[name]
    except KeyError:
        raise KeyError(
            f"unknown dataset {name!r}; expected one of {sorted(DATASETS)}"
        ) from None
    return gen(spark, scale=scale, seed=seed)
