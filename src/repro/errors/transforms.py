"""Per-kind corruption expressions (BigDaMa error-generator equivalents).

Each function returns a Spark ``Column`` computing the corrupted value of
``attr`` for *every* row; the injector gates it behind the hash-based
selection mask. All transforms are pure SQL expressions — no UDFs — so
corruption runs fully distributed and partition-invariant.

Kinds (mapping Table 5's error-type taxonomy):
  * ``inner``      — VAD: in-domain random swap (improper value assignment)
  * ``typo``       — T:  one character insert / delete / substitute / swap
  * ``missing``    — MV: explicit NULL or implicit tokens ('', 'N/A', '-')
  * ``formatting`` — FI: case flips, stray whitespace/punctuation
  * ``noise``      — Gaussian-approximate numeric perturbation
"""
from __future__ import annotations

import math

from pyspark.sql import Column
from pyspark.sql import functions as F

from repro.errors.hashing import randint, uniform


def inner(attr: str, seed: int, domain: list[str]) -> Column:
    """Swap in a different value drawn from the column's (sampled) domain."""
    if not domain:
        return F.lit(None).cast("string")
    arr = F.array(*[F.lit(v) for v in domain])
    n = len(domain)
    i = randint(seed, attr, "inner", n)
    cand = F.element_at(arr, (i + 1).cast("int"))
    alt = F.element_at(arr, (F.pmod(i + 1, F.lit(n)) + 1).cast("int"))
    return F.when(cand.eqNullSafe(F.col(attr)), alt).otherwise(cand)


def typo(attr: str, seed: int) -> Column:
    """One character-level edit at a hash-chosen position."""
    v = f"`{attr}`"
    p = (
        f"(pmod(xxhash64({seed}, tid, '{attr}', 'tp'),"
        f" greatest(length({v}), 1)) + 1)"
    )
    op = f"pmod(xxhash64({seed}, tid, '{attr}', 'to'), 4)"
    ch = f"char(97 + pmod(xxhash64({seed}, tid, '{attr}', 'tc'), 26))"
    sub = f"concat(substring({v}, 1, {p} - 1), {ch}, substring({v}, {p} + 1))"
    dele = f"concat(substring({v}, 1, {p} - 1), substring({v}, {p} + 1))"
    ins = f"concat(substring({v}, 1, {p}), {ch}, substring({v}, {p} + 1))"
    swap = (
        f"concat(substring({v}, 1, {p} - 1), substring({v}, {p} + 1, 1),"
        f" substring({v}, {p}, 1), substring({v}, {p} + 2))"
    )
    return F.expr(
        f"""
        CASE
          WHEN {v} IS NULL THEN NULL
          WHEN length({v}) = 0 THEN {ch}
          WHEN {op} = 0 THEN {sub}
          WHEN {op} = 1 AND length({v}) > 1 THEN {dele}
          WHEN {op} = 2 THEN {ins}
          WHEN {op} = 3 AND {p} < length({v}) THEN {swap}
          ELSE {sub}
        END
        """
    )


def missing(attr: str, seed: int) -> Column:
    """Explicit NULL or an implicit missing token."""
    m = randint(seed, attr, "mm", 4)
    return (
        F.when(m == 0, F.lit(None).cast("string"))
        .when(m == 1, F.lit(""))
        .when(m == 2, F.lit("N/A"))
        .otherwise(F.lit("-"))
    )


def formatting(attr: str, seed: int) -> Column:
    """Case flips and stray whitespace/punctuation (never a no-op on
    non-empty values: upper falls back to lower when already upper)."""
    v = F.col(attr)
    m = randint(seed, attr, "fm", 4)
    flip_case = F.when(v == F.upper(v), F.lower(v)).otherwise(F.upper(v))
    return (
        F.when(v.isNull(), F.lit(None).cast("string"))
        .when(m == 0, flip_case)
        .when(m == 1, F.concat(F.lit("  "), v))
        .when(m == 2, F.concat(v, F.lit(" .")))
        .otherwise(F.initcap(F.concat(F.lit(" "), v)))
    )


def noise(attr: str, seed: int) -> Column:
    """Gaussian-approximate numeric noise: v * (1 + 0.1 z), z ~ sum of
    four uniforms (Irwin–Hall), falling back to a typo-free pass-through
    for values that do not parse as numbers."""
    us = [uniform(seed, attr, f"nz{i}") for i in range(4)]
    z = (sum(us) - F.lit(2.0)) * F.lit(math.sqrt(3.0))
    x = F.expr(f"try_cast(`{attr}` as double)")
    perturbed = F.round(x * (F.lit(1.0) + F.lit(0.1) * z) + F.lit(0.01) * z, 2)
    return F.when(x.isNull(), F.col(attr)).otherwise(
        perturbed.cast("string")
    )
