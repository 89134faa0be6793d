"""Rule model: predicates, denial constraints, functional dependencies.

Follows Definitions 2.1/2.2 of the paper. A denial constraint
``forall t1, t2: NOT (p1 AND ... AND pm)`` is *violated* by any tuple pair
for which every predicate holds. An FD ``X -> A`` is the special DC
``NOT (t1.X = t2.X AND t1.A != t2.A)`` (``FD.to_dc``). Unary DCs
(predicates referencing only ``t1``, e.g. BART's tax rules such as
"has_child = 'N' implies child_exemp = 0") are supported: they are
violated by single tuples.
"""
from __future__ import annotations

from dataclasses import dataclass, field

_OPS = {"=", "!=", "<", "<=", ">", ">="}


@dataclass(frozen=True)
class Predicate:
    """One atom ``t1.lhs OP t2.rhs`` or ``t1.lhs OP const``.

    ``rhs`` names an attribute on the *second* tuple; exactly one of
    ``rhs`` / ``const`` must be set. ``numeric=True`` compares after a
    cast to double (required for order operators over string storage).
    """

    lhs: str
    op: str
    rhs: str | None = None
    const: str | None = None
    numeric: bool = False

    def __post_init__(self):
        if self.op not in _OPS:
            raise ValueError(f"unknown operator {self.op!r}")
        if (self.rhs is None) == (self.const is None):
            raise ValueError("exactly one of rhs/const must be given")

    @property
    def unary(self) -> bool:
        """True when the atom references only the first tuple."""
        return self.rhs is None

    def attrs(self) -> set[str]:
        out = {self.lhs}
        if self.rhs is not None:
            out.add(self.rhs)
        return out

    def sql(self, t1: str = "t1", t2: str = "t2") -> str:
        """SQL fragment over aliased sides ``t1`` / ``t2``.

        Equality/inequality are null-rejecting (a NULL never *violates* a
        constraint — same convention as the paper's DC engines).
        """
        lhs = f"{t1}.`{self.lhs}`"
        rhs = f"'{self.const}'" if self.rhs is None else f"{t2}.`{self.rhs}`"
        if self.numeric:
            # try_cast: a non-numeric (dirty) value compares as NULL and
            # therefore never violates — Spark 4 ANSI mode would throw on
            # a plain cast.
            lhs = f"try_cast({lhs} as double)"
            rhs = f"try_cast({rhs} as double)"
        return f"({lhs} {self.op} {rhs})"


@dataclass(frozen=True)
class DenialConstraint:
    """``forall t1, t2: NOT (AND of predicates)`` (Definition 2.2)."""

    name: str
    predicates: tuple[Predicate, ...]

    def __post_init__(self):
        if not self.predicates:
            raise ValueError("a DC needs at least one predicate")

    @property
    def unary(self) -> bool:
        """True when every predicate references only ``t1``."""
        return all(p.unary for p in self.predicates)

    def attrs(self) -> set[str]:
        """All attributes mentioned by any predicate."""
        out: set[str] = set()
        for p in self.predicates:
            out |= p.attrs()
        return out

    def equality_keys(self) -> list[str]:
        """Attributes compared with ``t1.A = t2.A`` — the blocking keys.

        The violation self-join hashes on these, which is exactly
        BigDansing's *Block* operator; a DC with no such key degenerates
        to a (cross) theta-join.
        """
        return [
            p.lhs
            for p in self.predicates
            if p.op == "=" and p.rhs == p.lhs and not p.unary
        ]

    def condition_sql(self, t1: str = "t1", t2: str = "t2") -> str:
        return " AND ".join(p.sql(t1, t2) for p in self.predicates)

    def as_fd(self) -> "FD | None":
        """Recover the FD shape if this DC is one, else None."""
        eq = [p for p in self.predicates if p.op == "=" and p.rhs == p.lhs]
        ne = [p for p in self.predicates if p.op == "!=" and p.rhs == p.lhs]
        if (
            len(ne) == 1
            and len(eq) + len(ne) == len(self.predicates)
            and eq
        ):
            return FD(
                name=self.name,
                lhs=tuple(sorted(p.lhs for p in eq)),
                rhs=ne[0].lhs,
            )
        return None


@dataclass(frozen=True)
class FD:
    """Functional dependency ``lhs -> rhs`` (Definition 2.1)."""

    name: str
    lhs: tuple[str, ...]
    rhs: str

    def to_dc(self) -> DenialConstraint:
        """The equivalent DC per Section 2.1."""
        preds = tuple(
            Predicate(lhs=a, op="=", rhs=a) for a in self.lhs
        ) + (Predicate(lhs=self.rhs, op="!=", rhs=self.rhs),)
        return DenialConstraint(name=self.name, predicates=preds)


def fds_of(rules: list[DenialConstraint]) -> list[FD]:
    """The FD-shaped subset of a DC rule set (Horizon/Unified/Relative
    operate only on these)."""
    out = []
    for dc in rules:
        fd = dc.as_fd()
        if fd is not None:
            out.append(fd)
    return out
