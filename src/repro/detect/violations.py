"""Rule-violation detector — the detection stage every rule-driven
algorithm shares (Table 3: "Detection Goal: Rule Violations")."""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.rules.engine import violation_cells
from repro.rules.model import DenialConstraint


def rule_violation_cells(
    df: DataFrame, rules: list[DenialConstraint]
) -> DataFrame:
    """Distinct ``(tid, attr)`` cells implicated in any DC violation."""
    return violation_cells(df, rules).select("tid", "attr").distinct()
