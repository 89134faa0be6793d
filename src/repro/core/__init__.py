"""Core substrate: cell-format conversion, budgets, repair context."""
from repro.core.budget import Budget, BudgetExceeded
from repro.core.cells import (
    TID,
    apply_fixes,
    data_attrs,
    from_cells,
    to_cells,
)
from repro.core.context import RepairContext

__all__ = [
    "TID",
    "Budget",
    "BudgetExceeded",
    "RepairContext",
    "apply_fixes",
    "data_attrs",
    "from_cells",
    "to_cells",
]
