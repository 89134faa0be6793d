"""SCARE (Yakout et al., SIGMOD 2013) — scalable ML repair with maximal
likelihood and bounded changes.

SCARE horizontally partitions the relation, learns per-block classifiers
from tuples the detector considers clean, predicts flagged attributes
from the tuple's reliable attributes, and accepts a replacement only when
its likelihood beats the current value by a margin, under a per-tuple
change budget. The partition-then-learn structure maps onto
``groupBy(block).applyInPandas``: each block trains its naive-Bayes
models in pandas and emits fixes.

With the original's conservative acceptance margin, very few repairs
survive — reproducing SCARE's 0.0000 EDR / tiny ER_F1 rows in Table 4.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, data_attrs
from repro.core.context import RepairContext, register
from repro.detect.outliers import outlier_cells
from repro.repair.common import finish

#: Likelihood-ratio margin a prediction must clear to replace a value.
#: High on purpose: SCARE's bounded-change objective accepts a repair
#: only under overwhelming likelihood, which is why its EDR rows in
#: Table 4 sit at ~0 with tiny ER_F1.
MARGIN = 20.0
#: Max changed cells per tuple (the "bounded changes" of the title).
MAX_CHANGES_PER_TUPLE = 1
#: Target tuples per horizontal partition.
BLOCK_SIZE = 500


def _nb_predict(
    block: pd.DataFrame, attrs: list[str], target: str, row_idx: int
) -> tuple[str | None, float]:
    """Naive-Bayes MAP value of ``target`` for one row, with the
    likelihood ratio over the row's current value."""
    flag_col = f"__flag_{target}"
    train = block[~block[flag_col].fillna(False)]
    if len(train) < 5:
        return None, 0.0
    y = train[target].astype(object)
    classes = y.value_counts().head(50)  # domain pruning
    if len(classes) < 1:
        return None, 0.0
    feats = [a for a in attrs if a != target]
    row = block.iloc[row_idx]
    # log P(v) + sum_j log P(x_j | v), Laplace-smoothed.
    scores: dict[str, float] = {}
    for v, cnt in classes.items():
        sub = train[y == v]
        s = np.log(cnt / len(train))
        for a in feats:
            if block[f"__flag_{a}"].iloc[row_idx]:
                continue  # unreliable evidence
            x = row[a]
            match = (sub[a].astype(object) == x).sum()
            s += np.log((match + 1) / (cnt + len(classes)))
        scores[v] = s
    best = max(scores, key=lambda k: (scores[k], str(k)))
    cur = row[target]
    cur_score = scores.get(cur, min(scores.values()) - np.log(MARGIN) - 1)
    return best, float(np.exp(scores[best] - cur_score))


def _repair_block(pdf: pd.DataFrame, attrs: list[str]) -> pd.DataFrame:
    fixes = []
    for i in range(len(pdf)):
        budget_left = MAX_CHANGES_PER_TUPLE
        for a in attrs:
            if budget_left == 0:
                break
            if not pdf[f"__flag_{a}"].iloc[i]:
                continue
            pred, ratio = _nb_predict(pdf, attrs, a, i)
            if (
                pred is not None
                and ratio >= MARGIN
                and pred != pdf[a].iloc[i]
            ):
                fixes.append((int(pdf[TID].iloc[i]), a, pred))
                budget_left -= 1
    return pd.DataFrame(fixes, columns=[TID, "attr", "new_value"]).astype(
        {TID: "int64", "attr": "string", "new_value": "string"}
    )


@register("Scare")
def scare(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Partition, learn, predict, accept under margin + change budget."""
    attrs = data_attrs(dirty)
    det = ctx.detections
    if det is None:
        det = outlier_cells(dirty)
    flags = (
        det.withColumn("f", F.lit(True))
        .groupBy(TID)
        .pivot("attr", attrs)
        .agg(F.first("f"))
    )
    # Prefix the pivoted flag columns so they cannot collide with the
    # data attributes when joined back.
    flags = flags.select(
        TID, *[F.col(a).alias(f"__flag_{a}") for a in attrs]
    )
    flagged = dirty.join(flags, TID, "left").select(
        TID,
        *[F.col(a) for a in attrs],
        *[
            F.coalesce(F.col(f"__flag_{a}"), F.lit(False)).alias(
                f"__flag_{a}"
            )
            for a in attrs
        ],
    )
    n = dirty.count()
    n_blocks = max(1, n // BLOCK_SIZE)
    blocked = flagged.withColumn(
        "__block", F.pmod(F.xxhash64(F.col(TID), F.lit(ctx.seed)), F.lit(n_blocks))
    )
    ctx.budget.check()
    schema = f"{TID} long, attr string, new_value string"
    fixes = blocked.groupBy("__block").applyInPandas(
        lambda pdf: _repair_block(pdf, attrs), schema=schema
    )
    return finish(dirty, fixes, ctx)
