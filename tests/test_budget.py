"""Unit tests for the cooperative wall-clock budget (24 h "n/a" rule)."""
import time

import pytest

from repro.core.budget import Budget, BudgetExceeded


def test_unlimited_budget_never_raises():
    b = Budget(None)
    b.check()
    b.consume(1e9)
    assert b.remaining() is None
    assert not b.exceeded()


def test_budget_remaining_decreases():
    b = Budget(100.0)
    r1 = b.remaining()
    time.sleep(0.01)
    r2 = b.remaining()
    assert r2 < r1 <= 100.0


def test_budget_check_raises_when_exhausted():
    b = Budget(0.001)
    time.sleep(0.01)
    assert b.exceeded()
    with pytest.raises(BudgetExceeded):
        b.check()


def test_consume_charges_abstract_work():
    b = Budget(10.0)
    b.consume(3.0)
    assert b.remaining() < 7.01
    with pytest.raises(BudgetExceeded):
        b.consume(100.0)


def test_elapsed_monotonic():
    b = Budget(None)
    e1 = b.elapsed()
    time.sleep(0.005)
    assert b.elapsed() > e1


@pytest.mark.parametrize("seconds", [0.5, 5.0, 500.0])
def test_fresh_budget_not_exceeded(seconds):
    assert not Budget(seconds).exceeded()


def test_exceeded_message_contains_elapsed():
    b = Budget(0.0)
    with pytest.raises(BudgetExceeded, match="budget of"):
        b.check()
