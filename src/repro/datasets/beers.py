"""Synthetic Beers: 2410 x 11, 16% native errors (MV, FI, VAD).

The real Beers corpus was web-scraped: long free-text beer names, ~5
beers per brewery (low redundancy), numeric abv/ibu/ounces columns. The
paper finds Beers hard ("complex and lengthy data") — reproduced here by
high-cardinality composite names and small FD classes.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import Dataset, scaled, to_spark
from repro.errors.inject import ErrorSpec, inject
from repro.rules.model import DenialConstraint, FD, Predicate

_N_PAPER = 2410
_ADJ = [
    "Hoppy", "Golden", "Dark", "Imperial", "Rustic", "Wild", "Smoked",
    "Velvet", "Iron", "Copper", "Midnight", "Cascade", "Granite", "Nomad",
]
_NOUN = [
    "Trail", "Harbor", "Summit", "Meadow", "Canyon", "River", "Lantern",
    "Anchor", "Orchard", "Prairie", "Falcon", "Bison", "Juniper", "Ember",
]
_STYLE = [
    "American IPA", "American Pale Ale", "Hefeweizen", "Saison",
    "Imperial Stout", "Porter", "Pilsner", "Amber Ale", "Witbier",
    "ESB", "Kolsch", "Fruit Beer", "Brown Ale", "Barleywine",
    "Cream Ale", "Scotch Ale", "Oatmeal Stout", "Red Ale", "Gose",
    "Tripel",
]
_OUNCES = ["12.0", "16.0", "8.4", "19.2", "24.0"]
_STATES = [
    "MN", "CO", "CA", "MI", "OR", "TX", "PA", "WA", "IN", "WI", "NC",
    "IL",
]


def beers(spark: SparkSession, *, scale: float = 1.0, seed: int = 0) -> Dataset:
    """Generate the Beers dataset at ``scale`` (1.0 = paper size)."""
    n = scaled(_N_PAPER, scale)
    g = np.random.default_rng(seed + 31)
    n_brew = max(3, n // 5)

    brew_city = [f"Brewtown {i % 97:02d}" for i in range(n_brew)]
    brew = pd.DataFrame(
        {
            "brewery_id": [str(i) for i in range(n_brew)],
            "brewery_name": [
                f"{_ADJ[i % len(_ADJ)]} {_NOUN[(i * 3) % len(_NOUN)]} Brewing Co {i}"
                for i in range(n_brew)
            ],
            "city": brew_city,
            "state": [_STATES[i % len(_STATES)] for i in range(n_brew)],
        }
    )
    idx = g.integers(0, n_brew, n)
    rows = brew.iloc[idx].reset_index(drop=True)
    rows.insert(0, "id", [str(1000 + i) for i in range(n)])
    rows.insert(
        1,
        "beer_name",
        [
            f"{_ADJ[int(a)]} {_NOUN[int(b)]} {_STYLE[int(s)]} #{i}"
            for i, (a, b, s) in enumerate(
                zip(
                    g.integers(0, len(_ADJ), n),
                    g.integers(0, len(_NOUN), n),
                    g.integers(0, len(_STYLE), n),
                )
            )
        ],
    )
    rows.insert(2, "style", [_STYLE[int(s)] for s in g.integers(0, len(_STYLE), n)])
    rows.insert(3, "ounces", [_OUNCES[int(o)] for o in g.integers(0, len(_OUNCES), n)])
    rows.insert(4, "abv", np.round(0.03 + 0.09 * g.random(n), 3).astype(str))
    rows.insert(5, "ibu", g.integers(5, 120, n).astype(str))
    rows["availability"] = [
        ["Year Round", "Seasonal", "Limited", "Rotating"][int(x)]
        for x in g.integers(0, 4, n)
    ]
    order = [
        "id", "beer_name", "style", "ounces", "abv", "ibu", "brewery_id",
        "brewery_name", "city", "state", "availability",
    ]
    clean = to_spark(spark, rows[order])

    fds = [
        FD("brew_name", ("brewery_id",), "brewery_name"),
        FD("brew_city", ("brewery_id",), "city"),
        FD("brew_state", ("brewery_id",), "state"),
    ]
    rules = [f.to_dc() for f in fds] + [
        DenialConstraint(
            "abv_range",
            (Predicate("abv", ">", const="0.2", numeric=True),),
        ),
        DenialConstraint(
            "ounces_range",
            (Predicate("ounces", ">", const="64", numeric=True),),
        ),
    ]
    spec = ErrorSpec(
        rate=0.16,
        kinds=("missing", "formatting", "inner"),
        weights=(2, 2, 1),
    )
    numeric = ("ounces", "abv", "ibu")
    dirty = inject(clean, spec, seed=seed, numeric_attrs=numeric)
    return Dataset(
        name="beers",
        clean=clean,
        dirty=dirty,
        rules=rules,
        numeric_attrs=numeric,
        label_attr="style",
        regression_attr="ibu",
        nominal_error_rate=0.16,
        error_types=("MV", "FI", "VAD"),
        native_spec=spec,
        seed=seed,
    )
