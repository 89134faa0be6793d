"""Partition-invariant randomness for distributed corruption.

Cell-level random choices are derived from ``xxhash64(seed, tid, attr,
salt)`` so the dirty dataset is a pure function of ``(clean, spec, seed)``
— identical under any partitioning or executor count. No RNG state ever
crosses a partition boundary.
"""
from __future__ import annotations

from pyspark.sql import Column
from pyspark.sql import functions as F

#: Resolution of the uniform draw (1e-6 granularity on rates).
RES = 1_000_000


def cell_hash(seed: int, attr: str, salt: str) -> Column:
    """A 64-bit hash column for the (seed, tid, attr, salt) cell key."""
    return F.xxhash64(
        F.lit(int(seed)), F.col("tid"), F.lit(attr), F.lit(salt)
    )


def uniform(seed: int, attr: str, salt: str) -> Column:
    """Deterministic U[0, 1) draw per cell."""
    return F.pmod(cell_hash(seed, attr, salt), F.lit(RES)) / F.lit(
        float(RES)
    )


def randint(seed: int, attr: str, salt: str, n: Column | int) -> Column:
    """Deterministic integer draw in [0, n) per cell."""
    return F.pmod(cell_hash(seed, attr, salt), F.lit(n) if isinstance(n, int) else n)
