"""Cell-level error injection at a target rate with a kind mix.

Reproduces §4.1 "Error Generation" / §4.3: errors strike cells uniformly
and independently; *inner* errors are in-domain swaps, *outer* errors are
typos / missing values / formatting issues / numeric noise, mixed
inner:outer = 1:4 by default (``mixed_spec``). Cell selection, kind
choice, and every random draw are hash-deterministic (see
``repro.errors.hashing``), so ``inject(clean, spec, seed)`` is a pure
function.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.cells import TID, data_attrs, to_cells
from repro.errors import transforms
from repro.errors.hashing import randint, uniform

#: Max distinct values sampled per column as the inner-swap domain.
_DOMAIN_CAP = 1000

KINDS = ("inner", "typo", "missing", "formatting", "noise")


@dataclass(frozen=True)
class ErrorSpec:
    """What to corrupt and how.

    ``rate`` is the per-cell corruption probability over ``attrs``
    (default: all data attributes). ``kinds``/``weights`` define the
    error-type mixture; a ``noise`` draw on a non-numeric attribute falls
    back to ``typo``, and an ``inner`` draw on a column with an empty
    domain falls back to ``missing``.
    """

    rate: float
    kinds: tuple[str, ...]
    weights: tuple[int, ...] | None = None
    attrs: tuple[str, ...] | None = None

    def __post_init__(self):
        if not 0.0 <= self.rate <= 1.0:
            raise ValueError(f"rate must be in [0, 1], got {self.rate}")
        unknown = set(self.kinds) - set(KINDS)
        if unknown:
            raise ValueError(f"unknown error kinds: {sorted(unknown)}")
        if self.weights is not None and len(self.weights) != len(self.kinds):
            raise ValueError("weights must align with kinds")

    def norm_weights(self) -> tuple[int, ...]:
        return self.weights or tuple(1 for _ in self.kinds)


def mixed_spec(
    rate: float, attrs: tuple[str, ...] | None = None
) -> ErrorSpec:
    """The §4.3 default: inner:outer = 1:4 with all four outer kinds."""
    return ErrorSpec(
        rate=rate,
        kinds=("inner", "typo", "missing", "formatting", "noise"),
        weights=(4, 4, 4, 4, 4),
        attrs=attrs,
    )


def inner_spec(rate: float, attrs: tuple[str, ...] | None = None) -> ErrorSpec:
    """Inner errors only (Figure 5 left / Figure 8 'inner')."""
    return ErrorSpec(rate=rate, kinds=("inner",), attrs=attrs)


def outer_spec(rate: float, attrs: tuple[str, ...] | None = None) -> ErrorSpec:
    """Outer errors only (Figure 5 right / Figure 8 'outer')."""
    return ErrorSpec(
        rate=rate, kinds=("typo", "missing", "formatting", "noise"), attrs=attrs
    )


def _column_domains(
    clean: DataFrame, attrs: list[str], seed: int
) -> dict[str, list[str]]:
    """A deterministic sample (<= cap) of each column's distinct values.

    One Spark job for all columns (a per-column collect would pay the
    job-scheduling overhead |attrs| times)."""
    from pyspark.sql.window import Window

    cells = to_cells(clean, attrs)
    w = Window.partitionBy("attr").orderBy(
        F.xxhash64(F.col("value"), F.lit(seed))
    )
    top = (
        cells.where(F.col("value").isNotNull())
        .select("attr", "value")
        .distinct()
        .withColumn("rk", F.row_number().over(w))
        .where(F.col("rk") <= _DOMAIN_CAP)
    )
    out: dict[str, list[str]] = {a: [] for a in attrs}
    for r in top.collect():
        out[r["attr"]].append(r["value"])
    return {a: sorted(vs) for a, vs in out.items()}


def _corrupted_value(
    attr: str,
    spec: ErrorSpec,
    seed: int,
    domain: list[str],
    numeric: bool,
) -> Column:
    """The kind-mixed corrupted value for one attribute."""
    kinds = list(spec.kinds)
    weights = list(spec.norm_weights())
    # Resolve fallbacks statically per attribute.
    resolved = []
    for k in kinds:
        if k == "noise" and not numeric:
            k = "typo"
        if k == "inner" and not domain:
            k = "missing"
        resolved.append(k)
    total = sum(weights)
    draw = randint(seed, attr, "kind", total)
    exprs = {
        "inner": lambda: transforms.inner(attr, seed, domain),
        "typo": lambda: transforms.typo(attr, seed),
        "missing": lambda: transforms.missing(attr, seed),
        "formatting": lambda: transforms.formatting(attr, seed),
        "noise": lambda: transforms.noise(attr, seed),
    }
    col = None
    cum = 0
    for k, w in zip(resolved, weights):
        cum += w
        branch = exprs[k]()
        col = (
            F.when(draw < cum, branch)
            if col is None
            else col.when(draw < cum, branch)
        )
    return col.otherwise(F.col(attr))


def inject(
    clean: DataFrame,
    spec: ErrorSpec,
    *,
    seed: int,
    numeric_attrs: tuple[str, ...] = (),
) -> DataFrame:
    """Corrupt ``clean`` per ``spec``; returns the dirty wide frame.

    Every data attribute is cast to string on the way through (the repair
    pipeline is string-typed, §2.2). Rows keep their ``tid``.
    """
    attrs = list(spec.attrs) if spec.attrs else data_attrs(clean)
    all_attrs = data_attrs(clean)
    domains = _column_domains(clean, attrs, seed)
    cols: list[Column] = [F.col(TID)]
    for a in all_attrs:
        base = F.col(a).cast("string")
        if a not in attrs or spec.rate == 0.0:
            cols.append(base.alias(a))
            continue
        hit = uniform(seed, a, "sel") < F.lit(spec.rate)
        corrupted = _corrupted_value(
            a, spec, seed, domains[a], a in numeric_attrs
        )
        cols.append(F.when(hit, corrupted).otherwise(base).alias(a))
    return clean.select(*cols)


def observed_error_rate(dirty: DataFrame, clean: DataFrame) -> float:
    """Fraction of cells whose dirty value differs (null-safe) from clean
    — the audit used to validate Table 5's error-rate column."""
    d = to_cells(dirty).withColumnRenamed("value", "dv")
    c = to_cells(clean).withColumnRenamed("value", "cv")
    row = (
        d.join(c, [TID, "attr"])
        .agg(
            F.count("*").alias("n"),
            F.sum(
                (~F.col("dv").eqNullSafe(F.col("cv"))).cast("long")
            ).alias("err"),
        )
        .collect()[0]
    )
    return (row["err"] or 0) / max(row["n"], 1)
