"""Tabular feature encoding for the downstream models.

Each feature attribute contributes: a one-hot block over its top-K
training categories (plus an "other" bucket), a standardized numeric
parse (NaN -> 0), and a missing-value flag. Labels are encoded as
training-set category indices; unseen test labels get -1 (always counted
as a miss — the honest treatment for dirty label columns).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

_TOP_K = 20


class Encoder:
    """Fit on training rows; transform any rows to a dense matrix."""

    def __init__(self, attrs: list[str], label_attr: str | None = None):
        self.attrs = [a for a in attrs if a != label_attr]
        self.label_attr = label_attr
        self.cats: dict[str, dict[str, int]] = {}
        self.num_mu: dict[str, float] = {}
        self.num_sd: dict[str, float] = {}
        self.labels: dict[str, int] = {}

    def fit(self, pdf: pd.DataFrame) -> "Encoder":
        for a in self.attrs:
            top = pdf[a].astype(object).value_counts().head(_TOP_K)
            self.cats[a] = {v: i for i, v in enumerate(top.index)}
            x = pd.to_numeric(pdf[a], errors="coerce")
            self.num_mu[a] = float(x.mean()) if x.notna().any() else 0.0
            sd = float(x.std()) if x.notna().any() else 1.0
            self.num_sd[a] = sd if sd and np.isfinite(sd) else 1.0
        if self.label_attr is not None:
            vals = pdf[self.label_attr].astype(object).dropna().unique()
            self.labels = {v: i for i, v in enumerate(sorted(map(str, vals)))}
        return self

    @property
    def n_classes(self) -> int:
        return len(self.labels)

    def transform(self, pdf: pd.DataFrame) -> np.ndarray:
        blocks = []
        for a in self.attrs:
            cat = self.cats[a]
            oh = np.zeros((len(pdf), len(cat) + 1))
            col = pdf[a].astype(object)
            idx = col.map(cat)
            known = idx.notna().to_numpy()
            oh[np.arange(len(pdf))[known], idx[known].astype(int)] = 1.0
            oh[~known, len(cat)] = 1.0
            x = pd.to_numeric(pdf[a], errors="coerce")
            num = ((x - self.num_mu[a]) / self.num_sd[a]).fillna(0.0)
            miss = col.isna().astype(float).to_numpy()
            blocks.append(
                np.column_stack([oh, num.to_numpy(), miss])
            )
        return np.hstack(blocks) if blocks else np.zeros((len(pdf), 0))

    def encode_labels(self, pdf: pd.DataFrame) -> np.ndarray:
        col = pdf[self.label_attr].astype(object).map(
            lambda v: self.labels.get(str(v), -1) if v is not None else -1
        )
        return col.fillna(-1).to_numpy(int)

    def encode_target(self, pdf: pd.DataFrame) -> np.ndarray:
        """Numeric regression target (NaN -> column mean)."""
        x = pd.to_numeric(pdf[self.label_attr], errors="coerce")
        return x.fillna(x.mean() if x.notna().any() else 0.0).to_numpy(float)
