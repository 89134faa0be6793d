"""Shared run loop: one (algorithm, dataset-variant) execution with
timing, budget handling, and the Table 3 input wiring (§4.1 defaults)."""
from __future__ import annotations

import os
import time
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.budget import Budget, BudgetExceeded
from repro.core.cells import TID
from repro.core.context import REGISTRY, RepairContext
from repro.datasets.base import Dataset
from repro.detect.raha_lite import raha_lite
from repro.metrics.edr import RepairScores, score_repair
from repro.optimize.guard import guarded_repair

#: Algorithms whose Table 3 input includes detection results (ADR/PDR).
DETECTION_CONSUMERS = ("Baran", "Scare")
#: Paper default: 20 labeled tuples for methods that use labels.
N_LABELED = 20


def default_budget_s(fallback: float = 300.0) -> float:
    """Per-algorithm wall-clock budget (env ``REPRO_BUDGET_S``)."""
    return float(os.environ.get("REPRO_BUDGET_S", fallback))


@dataclass
class RunResult:
    """Outcome of one algorithm run on one dirty frame."""

    algorithm: str
    dataset: str
    seconds: float
    status: str  # "ok" | "n/a"
    scores: RepairScores | None

    def metric(self, name: str) -> float | None:
        if self.scores is None:
            return None
        return getattr(self.scores, name)


def labeled_tuples(ds: Dataset, n: int = N_LABELED) -> DataFrame:
    """The paper's uniform default: clean values of the first n tuples."""
    return ds.clean.orderBy(TID).limit(n)


def detections_for(ds: Dataset, dirty: DataFrame, seed: int) -> DataFrame:
    """Raha-lite detections over a dirty frame (the §4.1 ADR input)."""
    return raha_lite(dirty, ds.rules, labeled_tuples(ds), seed=seed)


def run_algorithm(
    spark: SparkSession,
    name: str,
    ds: Dataset,
    dirty: DataFrame,
    *,
    detections: DataFrame | None,
    budget_s: float | None,
    seed: int = 0,
    guard: bool = False,
    score: bool = True,
) -> RunResult:
    """Execute one registered algorithm; ``n/a`` on budget exhaustion.

    ``guard=True`` wraps the run in the §4.4 detection guard using
    ``detections``. Scoring (EDR/F1) can be disabled for pure-runtime
    experiments (Table 6).
    """
    fn = REGISTRY[name]
    ctx = RepairContext(
        spark=spark,
        rules=ds.rules,
        labeled=labeled_tuples(ds),
        detections=detections if name in DETECTION_CONSUMERS else None,
        numeric_attrs=ds.numeric_attrs,
        label_attr=ds.label_attr,
        seed=seed,
        budget=Budget(budget_s),
    )
    t0 = time.monotonic()
    try:
        if guard:
            if detections is None:
                raise ValueError("guarded run requires detections")
            repaired = guarded_repair(fn, dirty, ctx, detections)
        else:
            repaired = fn(dirty, ctx)
        # Force materialization inside the timed window.
        repaired = repaired.cache()
        repaired.count()
        ctx.budget.check()
        elapsed = time.monotonic() - t0
    except BudgetExceeded:
        return RunResult(name, ds.name, time.monotonic() - t0, "n/a", None)
    scores = None
    if score:
        scores = score_repair(dirty, repaired, ds.clean)
    repaired.unpersist()
    return RunResult(name, ds.name, elapsed, "ok", scores)


def repaired_frame(
    spark: SparkSession,
    name: str,
    ds: Dataset,
    dirty: DataFrame,
    *,
    detections: DataFrame | None,
    budget_s: float | None,
    seed: int = 0,
    guard: bool = False,
) -> DataFrame | None:
    """Like ``run_algorithm`` but returns the repaired frame itself (for
    downstream-task experiments); None on budget exhaustion."""
    fn = REGISTRY[name]
    ctx = RepairContext(
        spark=spark,
        rules=ds.rules,
        labeled=labeled_tuples(ds),
        detections=detections if name in DETECTION_CONSUMERS else None,
        numeric_attrs=ds.numeric_attrs,
        label_attr=ds.label_attr,
        seed=seed,
        budget=Budget(budget_s),
    )
    try:
        if guard:
            return guarded_repair(fn, dirty, ctx, detections)
        return fn(dirty, ctx)
    except BudgetExceeded:
        return None
