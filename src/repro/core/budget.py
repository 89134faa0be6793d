"""Cooperative wall-clock budgets — the paper's 24-hour "n/a" rule.

The paper marks an algorithm "n/a" when it cannot finish within 24 hours
(Table 4/6). We reproduce the semantics with a cooperative budget:
algorithms call ``budget.check()`` between stages and raise
``BudgetExceeded`` once the wall clock runs out; the table harness catches
it and records "n/a". Default budgets are set by the harness
(``REPRO_BUDGET_S`` env, 300 s in benches, 60 s in tests).
"""
from __future__ import annotations

import time


class BudgetExceeded(RuntimeError):
    """Raised by ``Budget.check`` once the wall-clock budget is spent."""


class Budget:
    """A monotonic wall-clock deadline with cooperative checks.

    ``Budget(None)`` is unlimited (checks never raise). ``consume(frac)``
    lets inherently super-polynomial algorithms (Relative) charge abstract
    work against the budget so they exhaust it deterministically even when
    a single Spark stage would be the thing that blows the clock.
    """

    def __init__(self, seconds: float | None):
        self.seconds = seconds
        self._t0 = time.monotonic()
        self._extra = 0.0

    def elapsed(self) -> float:
        """Wall-clock seconds since construction, plus charged work."""
        return time.monotonic() - self._t0 + self._extra

    def remaining(self) -> float | None:
        """Seconds left, or None for an unlimited budget."""
        if self.seconds is None:
            return None
        return self.seconds - self.elapsed()

    def exceeded(self) -> bool:
        rem = self.remaining()
        return rem is not None and rem <= 0

    def check(self) -> None:
        """Raise ``BudgetExceeded`` if the budget is spent."""
        if self.exceeded():
            raise BudgetExceeded(
                f"budget of {self.seconds:.0f}s exhausted "
                f"(elapsed {self.elapsed():.1f}s)"
            )

    def consume(self, seconds: float) -> None:
        """Charge ``seconds`` of abstract work and re-check."""
        self._extra += seconds
        self.check()
