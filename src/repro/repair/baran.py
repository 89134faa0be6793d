"""Raha-Baran (Mahdavi & Abedjan, VLDB 2020) — unified-context error
correction with transfer-style candidate models.

Baran consumes *all* detection results (Raha's output, Table 3: "LD + OD
+ ADR") and, for each detected cell, generates repair candidates from
three context models, then ranks them with a classifier trained on ~20
labeled tuples:

  * value model    — string transformations (trim, case, punctuation
                     strip) plus direct dirty->clean replacements learned
                     from the labeled tuples;
  * vicinity model — co-occurrence with the tuple's other (undetected)
                     cells, estimated from the undetected portion of the
                     data — this is what nails FD-style and missing-value
                     errors;
  * domain model   — the column's most frequent undetected values.

Candidate generation and feature assembly are Spark joins end to end;
only the labeled candidate rows (tens) are collected to fit the ranking
logistic regression, whose weights score all candidates distributedly.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.cells import TID, materialize, to_cells
from repro.core.context import RepairContext, register
from repro.detect.raha_lite import raha_lite
from repro.repair.common import finish

#: Domain-model candidates per column.
_TOP_K = 5
#: Acceptance threshold on the ranked score.
_THRESHOLD = 0.5
#: Margin by which a replacement must beat the original value's score.
_MARGIN = 0.05
#: Candidate features: value-model hit, domain frequency, vicinity
#: max/mean co-occurrence, and whether the candidate is the cell's *top*
#: vicinity match (the sharpest separator between the true value and the
#: co-occurrence noise floor).
_FEATS = ("f_value", "f_domain", "f_vic_max", "f_vic_sum", "f_vic_top")
#: Fallback ranking weights (bias last) when labels give a single class.
_DEFAULT_W = np.array([2.0, 0.5, 2.0, 1.0, 1.5, -1.5])

_TRANSFORMS = (
    lambda c: F.trim(c),
    lambda c: F.regexp_replace(c, r"\s+", " "),
    lambda c: F.regexp_replace(F.trim(c), r" ?\.$", ""),
    lambda c: F.upper(c),
    lambda c: F.lower(c),
    lambda c: F.initcap(c),
    lambda c: F.regexp_replace(F.trim(c), r"^\s+", ""),
)


def _candidates(
    dirty: DataFrame, det: DataFrame, labeled: DataFrame | None
) -> DataFrame:
    """All scored candidate features: ``(tid, attr, candidate, *_FEATS)``."""
    # Lineage breaks: every candidate model re-reads these frames several
    # times; leaving the stack/semi-join plans inline makes the merged
    # candidate union quadratic-size for Catalyst to analyze.
    cells = materialize(to_cells(dirty))
    det = det.select(TID, "attr").distinct()
    det_cells = materialize(cells.join(det, [TID, "attr"], "left_semi"))
    ok_cells = materialize(
        cells.join(det, [TID, "attr"], "left_anti").where(
            F.col("value").isNotNull()
        )
    )

    # --- value model: *learned* transformations + direct replacements.
    # Baran learns (error -> fix) patterns from the labeled corrections:
    # only transformation ops that fix at least one labeled cell are
    # applied at inference (all ops in the unsupervised fallback).
    # Unvalidated ops firing on correct-but-flagged cells would otherwise
    # manufacture introduced errors.
    active = list(range(len(_TRANSFORMS)))
    lab = None
    if labeled is not None:
        lab = to_cells(labeled).withColumnRenamed("value", "clean_value")
        lab_dirty = cells.join(lab, [TID, "attr"]).where(
            ~F.col("value").eqNullSafe(F.col("clean_value"))
            & F.col("value").isNotNull()
            & F.col("clean_value").isNotNull()
        )
        counts = lab_dirty.agg(
            F.count("*").alias("n_dirty"),
            *[
                F.sum(
                    t(F.col("value"))
                    .eqNullSafe(F.col("clean_value"))
                    .cast("long")
                ).alias(f"t{i}")
                for i, t in enumerate(_TRANSFORMS)
            ]
        ).collect()[0]
        if (counts["n_dirty"] or 0) > 0:
            active = [
                i
                for i in range(len(_TRANSFORMS))
                if (counts[f"t{i}"] or 0) > 0
            ]
        # else: no labeled corrections to learn from -> keep the full op
        # library (the unsupervised fallback).
    v_parts = [
        det_cells.limit(0).select(
            TID, "attr", F.col("value").alias("candidate")
        )
    ]
    for i in active:
        t = _TRANSFORMS[i]
        v_parts.append(
            det_cells.where(F.col("value").isNotNull())
            .select(
                TID, "attr", "value", t(F.col("value")).alias("candidate")
            )
            .where(~F.col("candidate").eqNullSafe(F.col("value")))
            .select(TID, "attr", "candidate")
        )
    if labeled is not None:
        repl = (
            cells.join(lab, [TID, "attr"])
            .where(
                ~F.col("value").eqNullSafe(F.col("clean_value"))
                & F.col("value").isNotNull()
                & F.col("clean_value").isNotNull()
            )
            .select("attr", "value", F.col("clean_value").alias("candidate"))
            .distinct()
        )
        # Leave-one-out: labeled cells never receive their own direct
        # replacement — otherwise training data is circular ("correct iff
        # value-model hit") and the classifier unlearns the vicinity
        # model.
        labeled_cells = lab.select(TID, "attr")
        v_parts.append(
            det_cells.join(labeled_cells, [TID, "attr"], "left_anti")
            .join(repl, ["attr", "value"])
            .select(TID, "attr", "candidate")
        )
    value_cand = v_parts[0]
    for p in v_parts[1:]:
        value_cand = value_cand.unionByName(p)
    value_cand = (
        value_cand.where(F.col("candidate").isNotNull())
        .distinct()
        .withColumn("f_value", F.lit(1.0))
    )

    # --- domain model: top-k frequent undetected values per column.
    freq = ok_cells.groupBy("attr", "value").agg(F.count("*").alias("cnt"))
    w = Window.partitionBy("attr").orderBy(F.desc("cnt"), "value")
    top = (
        freq.withColumn("rk", F.row_number().over(w))
        .where(F.col("rk") <= _TOP_K)
        .select(
            "attr",
            F.col("value").alias("candidate"),
            (F.col("cnt")).alias("dom_cnt"),
        )
    )
    col_n = ok_cells.groupBy("attr").agg(F.count("*").alias("col_n"))
    domain_cand = (
        det_cells.select(TID, "attr")
        .join(top, "attr")
        .join(col_n, "attr")
        .select(
            TID,
            "attr",
            "candidate",
            (F.col("dom_cnt") / F.col("col_n")).alias("f_domain"),
        )
    )

    # --- vicinity model: co-occurrence with the tuple's reliable cells.
    pairs = (
        ok_cells.alias("x")
        .join(ok_cells.alias("y"), TID)
        .where(F.col("x.attr") != F.col("y.attr"))
        .select(
            F.col("x.attr").alias("attr"),
            F.col("x.value").alias("candidate"),
            F.col("y.attr").alias("battr"),
            F.col("y.value").alias("bvalue"),
        )
    )
    cooc = pairs.groupBy("attr", "candidate", "battr", "bvalue").agg(
        F.count("*").alias("cc")
    )
    b_tot = cooc.groupBy("attr", "battr", "bvalue").agg(
        F.sum("cc").alias("bc")
    )
    cooc_p = materialize(
        cooc.join(b_tot, ["attr", "battr", "bvalue"]).select(
            "attr", "candidate", "battr", "bvalue",
            (F.col("cc") / F.col("bc")).alias("p"),
        )
    )
    evidence = det_cells.select(TID, "attr").join(
        ok_cells.select(
            TID,
            F.col("attr").alias("battr"),
            F.col("value").alias("bvalue"),
        ),
        TID,
    )
    vicinity_cand = (
        evidence.join(cooc_p, ["attr", "battr", "bvalue"])
        .groupBy(TID, "attr", "candidate")
        .agg(
            F.max("p").alias("f_vic_max"),
            (F.sum("p") / F.count("*")).alias("f_vic_sum"),
        )
    )

    # --- merge models into one feature table per (cell, candidate).
    keys = [TID, "attr", "candidate"]
    merged = (
        value_cand.select(*keys, "f_value")
        .unionByName(
            domain_cand.select(*keys, "f_domain"), allowMissingColumns=True
        )
        .unionByName(
            vicinity_cand.select(*keys, "f_vic_max", "f_vic_sum"),
            allowMissingColumns=True,
        )
        .groupBy(*keys)
        .agg(
            F.coalesce(F.max("f_value"), F.lit(0.0)).alias("f_value"),
            F.coalesce(F.max("f_domain"), F.lit(0.0)).alias("f_domain"),
            F.coalesce(F.max("f_vic_max"), F.lit(0.0)).alias("f_vic_max"),
            F.coalesce(F.max("f_vic_sum"), F.lit(0.0)).alias("f_vic_sum"),
        )
    )
    vic_rank = Window.partitionBy(TID, "attr").orderBy(
        F.desc("f_vic_max"), "candidate"
    )
    merged = merged.withColumn(
        "f_vic_top",
        (
            (F.row_number().over(vic_rank) == 1) & (F.col("f_vic_max") > 0)
        ).cast("double"),
    )
    orig = det_cells.select(TID, "attr", F.col("value").alias("orig"))
    # The original value stays in the table (flagged f_orig=1): its row
    # supplies the evidence baseline a replacement must beat — Baran's
    # guard against imprecise detection inputs.
    return materialize(
        merged.join(orig, [TID, "attr"]).withColumn(
            "f_orig",
            F.col("candidate").eqNullSafe(F.col("orig")).cast("double"),
        )
    )


def _fit(
    cand: DataFrame, labeled: DataFrame, seed: int
) -> tuple[np.ndarray, float]:
    """Fit the candidate-ranking classifier on the labeled tuples'
    *replacement* candidates (original-value rows are the comparison
    baseline, not training examples). Returns the weights plus a
    self-calibrated acceptance threshold: the probability cut that
    maximizes F1 on the labeled candidates — Baran tunes itself from its
    20 labels instead of assuming a fixed operating point."""
    lab = to_cells(labeled).withColumnRenamed("value", "clean_value")
    train = cand.where(F.col("f_orig") == 0.0).join(lab, [TID, "attr"]).select(
        *_FEATS,
        F.col("candidate").eqNullSafe(F.col("clean_value"))
        .cast("double")
        .alias("y"),
    )
    pdf = train.toPandas()
    if len(pdf) == 0 or pdf["y"].nunique() < 2:
        return _DEFAULT_W, _THRESHOLD
    X = np.hstack(
        [pdf[list(_FEATS)].to_numpy(float), np.ones((len(pdf), 1))]
    )
    y = pdf["y"].to_numpy(float)
    rng = np.random.default_rng(seed)
    w = 0.01 * rng.standard_normal(X.shape[1])
    pos = max(y.sum(), 1.0)
    neg = max(len(y) - y.sum(), 1.0)
    sw = np.where(y > 0.5, len(y) / (2 * pos), len(y) / (2 * neg))
    for _ in range(1200):
        p = 1.0 / (1.0 + np.exp(-(X @ w)))
        w -= 0.5 * (X.T @ (sw * (p - y)) / sw.sum() + 1e-3 * w)
    p = 1.0 / (1.0 + np.exp(-(X @ w)))
    best_thr, best_f1 = _THRESHOLD, -1.0
    for thr in np.linspace(0.2, 0.8, 25):
        pred = p > thr
        tp = float((pred & (y > 0.5)).sum())
        prec = tp / max(pred.sum(), 1)
        rec = tp / max(y.sum(), 1)
        f1 = 2 * prec * rec / max(prec + rec, 1e-9)
        if f1 > best_f1:
            best_f1, best_thr = f1, float(thr)
    return w, best_thr


@register("Baran")
def baran(dirty: DataFrame, ctx: RepairContext) -> DataFrame:
    """Generate, rank, and apply the best candidate per detected cell."""
    det = ctx.detections
    if det is None:
        det = raha_lite(dirty, ctx.rules, ctx.labeled, seed=ctx.seed)
    cand = _candidates(dirty, det, ctx.labeled).cache()
    ctx.budget.check()
    if ctx.labeled is not None:
        w, threshold = _fit(cand, ctx.labeled, ctx.seed)
    else:
        w, threshold = _DEFAULT_W, _THRESHOLD
    score = F.lit(float(w[-1]))
    for f, wi in zip(_FEATS, w[:-1]):
        score = score + F.lit(float(wi)) * F.col(f)
    prob = F.lit(1.0) / (F.lit(1.0) + F.exp(-score))
    ranked = cand.withColumn("p", prob)
    # The current value's own score is the bar to clear: repair only when
    # the best replacement both clears the absolute threshold and beats
    # the original's evidence by a margin.
    orig_p = (
        ranked.where(F.col("f_orig") == 1.0)
        .groupBy(TID, "attr")
        .agg(F.max("p").alias("orig_p"))
    )
    repl = ranked.where(F.col("f_orig") == 0.0)
    win = Window.partitionBy(TID, "attr").orderBy(
        F.desc("p"), "candidate"
    )
    best = (
        repl.withColumn("rk", F.row_number().over(win))
        .where((F.col("rk") == 1) & (F.col("p") > threshold))
        .join(orig_p, [TID, "attr"], "left")
        .where(
            F.col("p") > F.coalesce(F.col("orig_p"), F.lit(0.0)) + _MARGIN
        )
        .select(TID, "attr", F.col("candidate").alias("new_value"))
    )
    out = finish(dirty, best, ctx)
    cand.unpersist()
    return out
