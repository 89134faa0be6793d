"""Unit tests for the rule model (Definitions 2.1 / 2.2)."""
import pytest

from repro.rules.model import FD, DenialConstraint, Predicate, fds_of


def test_predicate_requires_exactly_one_rhs():
    with pytest.raises(ValueError):
        Predicate("a", "=")
    with pytest.raises(ValueError):
        Predicate("a", "=", rhs="b", const="c")


@pytest.mark.parametrize("op", ["=", "!=", "<", "<=", ">", ">="])
def test_predicate_accepts_all_builtin_operators(op):
    p = Predicate("a", op, rhs="b")
    assert p.op == op


def test_predicate_rejects_unknown_operator():
    with pytest.raises(ValueError):
        Predicate("a", "~", rhs="b")


def test_predicate_unary_and_attrs():
    p = Predicate("a", "=", const="x")
    assert p.unary
    assert p.attrs() == {"a"}
    q = Predicate("a", "<", rhs="b")
    assert not q.unary
    assert q.attrs() == {"a", "b"}


def test_predicate_sql_string_and_numeric():
    p = Predicate("a", "=", rhs="a")
    assert p.sql() == "(t1.`a` = t2.`a`)"
    q = Predicate("salary", ">", rhs="salary", numeric=True)
    assert "try_cast" in q.sql()


def test_dc_requires_predicates():
    with pytest.raises(ValueError):
        DenialConstraint("empty", ())


def test_fd_to_dc_roundtrip():
    fd = FD("f", ("city", "zip"), "state")
    dc = fd.to_dc()
    assert dc.as_fd() == FD("f", ("city", "zip"), "state")
    assert not dc.unary
    assert sorted(dc.equality_keys()) == ["city", "zip"]
    assert dc.attrs() == {"city", "zip", "state"}


def test_non_fd_dc_as_fd_is_none():
    dc = DenialConstraint(
        "order",
        (
            Predicate("state", "=", rhs="state"),
            Predicate("salary", ">", rhs="salary", numeric=True),
            Predicate("rate", "<", rhs="rate", numeric=True),
        ),
    )
    assert dc.as_fd() is None
    assert dc.equality_keys() == ["state"]


def test_unary_dc():
    dc = DenialConstraint(
        "u", (Predicate("abv", ">", const="0.2", numeric=True),)
    )
    assert dc.unary
    assert dc.equality_keys() == []


def test_fds_of_filters_fd_shaped_rules():
    fd_dc = FD("f", ("a",), "b").to_dc()
    unary = DenialConstraint("u", (Predicate("a", "=", const="x"),))
    fds = fds_of([fd_dc, unary])
    assert len(fds) == 1
    assert fds[0].rhs == "b"


def test_dc_condition_sql_conjunction():
    fd = FD("f", ("a",), "b")
    sql = fd.to_dc().condition_sql()
    assert sql == "(t1.`a` = t2.`a`) AND (t1.`b` != t2.`b`)"
