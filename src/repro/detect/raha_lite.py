"""Raha-lite: ensemble featurization + few-label per-column classifiers.

Architecture follows Raha (SIGMOD'19): a set of base detectors produces a
feature vector per cell (``repro.detect.features``); a classifier trained
from ~20 labeled tuples maps feature vectors to error flags. Differences
from the original (documented in DESIGN.md): we replace its
clustering-based label propagation with (a) a global classifier pooled
over all columns' labeled cells plus (b) per-column classifiers where the
column's own labels contain both classes; and we use a numpy logistic
regression instead of scikit-learn (not installed).

Featurization and scoring run in Spark; only the <=20x|attrs| labeled
feature rows are collected to the driver for fitting — the same
driver-fit/distributed-score split Spark ML estimators use.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, to_cells
from repro.detect.features import FEATURES, cell_features
from repro.rules.model import DenialConstraint

#: Hand-set ensemble weights used when no labels are available at all
#: (bias last, feature order = detect.features.FEATURES). Mirrors Raha's
#: unsupervised ensemble fallback.
_DEFAULT_W = np.array([1.5, 0.5, 1.0, 0.5, 1.5, 0.75, 1.0, 1.5, -1.25])


def _fit_logreg(X: np.ndarray, y: np.ndarray, seed: int) -> np.ndarray:
    """Class-balanced L2-regularized logistic regression via gradient
    descent; returns weights with the bias appended. Balancing matters:
    at a 3% error rate, 20 labeled tuples yield ~97% negative cells, and
    an unbalanced fit degenerates to "never flag"."""
    rng = np.random.default_rng(seed)
    Xb = np.hstack([X, np.ones((len(X), 1))])
    w = 0.01 * rng.standard_normal(Xb.shape[1])
    pos = max(y.sum(), 1.0)
    neg = max(len(y) - y.sum(), 1.0)
    sw = np.where(y > 0.5, len(y) / (2 * pos), len(y) / (2 * neg))
    for _ in range(400):
        p = 1.0 / (1.0 + np.exp(-(Xb @ w)))
        grad = Xb.T @ (sw * (p - y)) / sw.sum() + 1e-2 * w
        w -= 0.5 * grad
    return w


def _score_expr(weights: dict[str, np.ndarray], glob: np.ndarray) -> Column:
    """Per-attr linear score over the feature columns as one expression."""

    def linear(w: np.ndarray) -> Column:
        s = F.lit(float(w[-1]))
        for f, wi in zip(FEATURES, w[:-1]):
            s = s + F.lit(float(wi)) * F.col(f)
        return s

    expr = None
    for attr, w in weights.items():
        cond = F.col("attr") == attr
        expr = (
            F.when(cond, linear(w))
            if expr is None
            else expr.when(cond, linear(w))
        )
    fallback = linear(glob)
    return fallback if expr is None else expr.otherwise(fallback)


def raha_lite(
    dirty: DataFrame,
    rules: list[DenialConstraint],
    labeled_clean: DataFrame | None,
    *,
    seed: int = 0,
) -> DataFrame:
    """Detected error cells ``(tid, attr)`` of ``dirty``.

    ``labeled_clean`` is a wide frame of ground-truth values for the
    labeled tuples (the paper's uniform default of 20); None degrades to
    the unsupervised ensemble vote.
    """
    feats = cell_features(dirty, rules).cache()
    per_col: dict[str, np.ndarray] = {}
    glob = _DEFAULT_W
    if labeled_clean is not None and labeled_clean.count() > 0:
        lab = (
            to_cells(labeled_clean)
            .withColumnRenamed("value", "clean_value")
        )
        joined = feats.join(lab, [TID, "attr"]).select(
            "attr",
            *FEATURES,
            (~F.col("value").eqNullSafe(F.col("clean_value")))
            .cast("double")
            .alias("label"),
        )
        pdf = joined.toPandas()
        if len(pdf) and pdf["label"].nunique() > 1:
            X = pdf[list(FEATURES)].to_numpy(float)
            y = pdf["label"].to_numpy(float)
            glob = _fit_logreg(X, y, seed)
            for attr, grp in pdf.groupby("attr"):
                if grp["label"].nunique() > 1:
                    per_col[attr] = _fit_logreg(
                        grp[list(FEATURES)].to_numpy(float),
                        grp["label"].to_numpy(float),
                        seed + hash(attr) % 1000,
                    )
    score = _score_expr(per_col, glob)
    out = feats.where(score > 0).select(TID, "attr").distinct()
    result = out.cache()
    result.count()
    feats.unpersist()
    return result
