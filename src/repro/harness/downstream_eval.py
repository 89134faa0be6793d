"""Supplementary shape check for Figures 7-10: downstream task
performance on dirty vs repaired vs clean variants (§4.5)."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.registry import load
from repro.downstream.tasks import evaluate_downstream
from repro.errors.inject import mixed_spec
from repro.harness.runner import (
    default_budget_s,
    detections_for,
    repaired_frame,
)

#: Representative algorithms for the downstream experiments (the paper's
#: figures plot a similar subset; Daisy/Relative are excluded as in §4.3).
DOWNSTREAM_ALGORITHMS = (
    "Holistic", "Nadeef", "MLNClean", "Horizon", "Baran", "Scare",
    "HoloClean", "Unified", "BoostClean",
)


def run_downstream(
    spark: SparkSession,
    *,
    dataset: str,
    rates: tuple[float, ...] = (0.1, 0.3, 0.5),
    task: str = "classification",
    model: str = "mlp",
    scale: float = 1.0,
    seed: int = 0,
    algorithms: tuple[str, ...] = DOWNSTREAM_ALGORITHMS,
    budget_s: float | None = None,
    guard: bool = False,
) -> pd.DataFrame:
    """Task metric per (rate, variant) where variant is dirty / clean /
    each algorithm's repaired data. Classification -> accuracy (higher
    better); regression -> MSE (lower better)."""
    if budget_s is None:
        budget_s = default_budget_s()
    ds = load(dataset, spark, scale=scale, seed=seed)
    label = ds.label_attr if task == "classification" else ds.regression_attr
    if label is None:
        raise ValueError(f"{dataset} has no target for task {task!r}")
    ds.clean.cache().count()
    rows = []
    clean_score = evaluate_downstream(
        ds.clean, label_attr=label, task=task, model=model, seed=seed
    )
    for rate in rates:
        dirty = ds.redirty(mixed_spec(rate)).cache()
        dirty.count()
        det = detections_for(ds, dirty, seed).cache()
        det.count()
        rows.append(
            {
                "dataset": dataset, "rate": rate, "variant": "clean",
                "task": task, "model": model, "score": clean_score,
            }
        )
        rows.append(
            {
                "dataset": dataset, "rate": rate, "variant": "dirty",
                "task": task, "model": model,
                "score": evaluate_downstream(
                    dirty, label_attr=label, task=task, model=model,
                    seed=seed,
                ),
            }
        )
        for alg in algorithms:
            rep = repaired_frame(
                spark, alg, ds, dirty,
                detections=det, budget_s=budget_s, seed=seed, guard=guard,
            )
            score = (
                None
                if rep is None
                else evaluate_downstream(
                    rep, label_attr=label, task=task, model=model, seed=seed
                )
            )
            rows.append(
                {
                    "dataset": dataset, "rate": rate, "variant": alg,
                    "task": task, "model": model, "score": score,
                }
            )
        det.unpersist()
        dirty.unpersist()
    ds.clean.unpersist()
    return pd.DataFrame(rows)
