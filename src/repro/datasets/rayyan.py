"""Synthetic Rayyan: 1000 x 11, 9% native errors (MV, T, FI, VAD).

The real Rayyan corpus is bibliographic records: long article titles and
author lists (near-unique, no redundancy to vote over), journal metadata
with ISSN-keyed FDs. The paper groups it with Beers as "complex and
lengthy" — almost every algorithm scores negative EDR on it.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import Dataset, scaled, to_spark
from repro.errors.inject import ErrorSpec, inject
from repro.rules.model import DenialConstraint, FD, Predicate

_N_PAPER = 1000
_TOPICS = [
    "randomized trial", "cohort study", "meta analysis", "case report",
    "systematic review", "cross sectional survey", "pilot study",
]
_FIELDS = [
    "cardiology", "oncology", "neurology", "pediatrics", "psychiatry",
    "epidemiology", "nephrology", "dermatology",
]
_LANGS = ["eng", "fre", "ger", "spa", "por"]
_SURNAMES = [
    "Smith", "Chen", "Garcia", "Okafor", "Novak", "Tanaka", "Iyer",
    "Mueller", "Rossi", "Kim", "Haddad", "Olsen",
]


def rayyan(spark: SparkSession, *, scale: float = 1.0, seed: int = 0) -> Dataset:
    """Generate the Rayyan dataset at ``scale`` (1.0 = paper size)."""
    n = scaled(_N_PAPER, scale)
    g = np.random.default_rng(seed + 41)
    n_j = max(3, n // 16)

    journal = pd.DataFrame(
        {
            "journal_issn": [f"{1000 + 7 * j:04d}-{4096 + 13 * j:04d}" for j in range(n_j)],
            "journal_title": [
                f"Journal of {_FIELDS[j % len(_FIELDS)].title()} Research {j}"
                for j in range(n_j)
            ],
            "journal_abbrev": [
                f"J {_FIELDS[j % len(_FIELDS)][:4].title()} Res {j}"
                for j in range(n_j)
            ],
        }
    )
    idx = g.integers(0, n_j, n)
    rows = journal.iloc[idx].reset_index(drop=True)
    rows.insert(
        0,
        "article_title",
        [
            f"A {_TOPICS[int(t)]} of {_FIELDS[int(f)]} outcomes in adults: "
            f"part {i}"
            for i, (t, f) in enumerate(
                zip(g.integers(0, len(_TOPICS), n), g.integers(0, len(_FIELDS), n))
            )
        ],
    )
    rows["volume"] = g.integers(1, 60, n).astype(str)
    rows["issue"] = g.integers(1, 13, n).astype(str)
    first = g.integers(1, 900, n)
    rows["pagination"] = [f"{a}-{a + int(d)}" for a, d in zip(first, g.integers(3, 25, n))]
    rows["year"] = g.integers(1985, 2017, n).astype(str)
    rows["language"] = [_LANGS[int(x)] for x in g.integers(0, len(_LANGS), n)]
    rows["authors"] = [
        "; ".join(
            f"{_SURNAMES[int(s)]} {chr(65 + int(c))}."
            for s, c in zip(g.integers(0, len(_SURNAMES), 3), g.integers(0, 26, 3))
        )
        for _ in range(n)
    ]
    rows["created_at"] = [
        f"2016-{1 + i % 12:02d}-{1 + i % 28:02d}" for i in range(n)
    ]
    order = [
        "article_title", "journal_title", "journal_abbrev", "journal_issn",
        "volume", "issue", "pagination", "year", "language", "authors",
        "created_at",
    ]
    clean = to_spark(spark, rows[order])

    fds = [
        FD("issn_title", ("journal_issn",), "journal_title"),
        FD("issn_abbrev", ("journal_issn",), "journal_abbrev"),
        FD("abbrev_title", ("journal_abbrev",), "journal_title"),
    ]
    rules = [f.to_dc() for f in fds] + [
        DenialConstraint(
            "year_min", (Predicate("year", "<", const="1900", numeric=True),)
        ),
        DenialConstraint(
            "year_max", (Predicate("year", ">", const="2025", numeric=True),)
        ),
    ]
    spec = ErrorSpec(
        rate=0.09,
        kinds=("missing", "typo", "formatting", "inner"),
        weights=(1, 1, 1, 1),
    )
    numeric = ("volume", "issue", "year")
    dirty = inject(clean, spec, seed=seed, numeric_attrs=numeric)
    return Dataset(
        name="rayyan",
        clean=clean,
        dirty=dirty,
        rules=rules,
        numeric_attrs=numeric,
        label_attr="language",
        regression_attr=None,
        nominal_error_rate=0.09,
        error_types=("MV", "T", "FI", "VAD"),
        native_spec=spec,
        seed=seed,
    )
