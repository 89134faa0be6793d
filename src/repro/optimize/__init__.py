"""The paper's unified optimization strategy (Section 4.4)."""
from repro.optimize.guard import guarded_repair

__all__ = ["guarded_repair"]
