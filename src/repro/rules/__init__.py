"""FD / denial-constraint model and Spark violation engine (Section 2.1)."""
from repro.rules.engine import (
    equivalence_classes,
    violating_pairs,
    violation_cells,
)
from repro.rules.model import FD, DenialConstraint, Predicate

__all__ = [
    "FD",
    "DenialConstraint",
    "Predicate",
    "equivalence_classes",
    "violating_pairs",
    "violation_cells",
]
