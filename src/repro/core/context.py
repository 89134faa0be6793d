"""Shared inputs for repair algorithms, mirroring Table 3's input column.

The paper's algorithms consume different subsets of: rules (R), original
data (OD), all/partial detection results (ADR/PDR), labeled data (LD), and
a downstream model (DM). ``RepairContext`` bundles them once per run so
every algorithm sees the same hyper-parameter defaults (§4.1): 20 labeled
tuples, Raha-lite detections for data-driven methods, and a wall-clock
budget standing in for the 24 h timeout.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import TYPE_CHECKING, Callable

from pyspark.sql import DataFrame, SparkSession

from repro.core.budget import Budget

if TYPE_CHECKING:  # pragma: no cover - import cycle guard
    from repro.rules.model import DenialConstraint


@dataclass
class RepairContext:
    """Everything a repair algorithm may draw on, per Table 3.

    Attributes:
        spark: the session (all algorithms are SparkSession-in,
            DataFrame-out functions).
        rules: the dataset's denial constraints (FDs are expressed as DCs,
            Definition 2.2).
        labeled: clean values for the 20 labeled tuples — a wide frame
            whose ``tid`` values exist in the dirty data (LD input).
        detections: ``(tid, attr)`` cells flagged erroneous by the
            detector (ADR/PDR input for data-driven methods and for the
            §4.4 optimization guard). None when the algorithm must detect
            for itself.
        numeric_attrs: attributes that parse as numbers (order DCs,
            Gaussian noise, mean/median repairs apply only here).
        label_attr: downstream classification target (DM input for
            BoostClean).
        seed: master seed for every stochastic choice.
        budget: cooperative wall-clock budget (the 24 h rule).
    """

    spark: SparkSession
    rules: list["DenialConstraint"] = field(default_factory=list)
    labeled: DataFrame | None = None
    detections: DataFrame | None = None
    numeric_attrs: tuple[str, ...] = ()
    label_attr: str | None = None
    seed: int = 0
    budget: Budget = field(default_factory=lambda: Budget(None))


#: name -> repair function ``(dirty, ctx) -> repaired``; populated by
#: ``repro.repair`` at import time and consumed by the table harnesses.
REGISTRY: dict[str, Callable[[DataFrame, RepairContext], DataFrame]] = {}


def register(name: str):
    """Decorator registering a repair algorithm under the paper's name."""

    def deco(fn):
        REGISTRY[name] = fn
        fn.algorithm_name = name
        return fn

    return deco
