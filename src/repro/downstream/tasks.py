"""Downstream task harness (Section 4.5).

The paper trains on 80% / tests on 20% of each data variant (dirty,
repaired, clean). The split is by tid hash so the *same* tuples land in
train/test across variants — otherwise variant scores would not be
comparable. Classification reports accuracy; regression reports MSE on a
standardized target.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core.cells import TID, data_attrs
from repro.downstream.encode import Encoder
from repro.downstream.models import GBTStumps, MLP, NaiveBayes

_MODELS = {"mlp": MLP, "xgboost": GBTStumps, "nb": NaiveBayes}


def _split_mask(tids: pd.Series, seed: int) -> np.ndarray:
    """Deterministic 80/20 split on the tuple id (True = train)."""
    h = (tids.to_numpy(np.int64) * 2654435761 + seed * 97) % 10
    return h < 8


def evaluate_downstream(
    variant: DataFrame,
    *,
    label_attr: str,
    task: str = "classification",
    model: str = "mlp",
    seed: int = 0,
) -> float:
    """Train/test on one data variant; returns accuracy (classification)
    or MSE (regression, standardized target)."""
    pdf = variant.toPandas().sort_values(TID).reset_index(drop=True)
    train_mask = _split_mask(pdf[TID], seed)
    train, test = pdf[train_mask], pdf[~train_mask]
    enc = Encoder(data_attrs(variant), label_attr).fit(train)
    Xtr, Xte = enc.transform(train), enc.transform(test)
    if task == "classification":
        ytr, yte = enc.encode_labels(train), enc.encode_labels(test)
        if model == "nb":
            m = NaiveBayes().fit(Xtr, ytr)
        else:
            m = _MODELS[model](task=task, seed=seed).fit(Xtr, ytr)
        pred = m.predict(Xte)
        return float((pred == yte).mean())
    ytr, yte = enc.encode_target(train), enc.encode_target(test)
    mu, sd = ytr.mean(), ytr.std() or 1.0
    m = _MODELS[model](task=task, seed=seed).fit(Xtr, (ytr - mu) / sd)
    pred = m.predict(Xte)
    return float(np.mean((pred - (yte - mu) / sd) ** 2))
