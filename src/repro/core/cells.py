"""Wide <-> long ("cell") conversion for repair dataflow.

Every dataset in this reproduction is a *wide* Spark DataFrame of
string-typed attributes plus a ``tid`` long key (the cleaning literature,
and the paper, treat all values as strings). Metrics, detectors, and most
repair algorithms operate on the *long* cell format ``(tid, attr, value)``;
these helpers convert between the two, and apply sparse cell-level fixes
back onto a wide frame.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: Reserved tuple-id column name. Dataset generators must not use it as a
#: data attribute.
TID = "tid"


def data_attrs(df: DataFrame) -> list[str]:
    """Data attributes of a wide frame (everything except ``tid``)."""
    return [c for c in df.columns if c != TID]


def to_cells(df: DataFrame, attrs: list[str] | None = None) -> DataFrame:
    """Explode a wide frame into ``(tid, attr, value)`` cells via ``stack``.

    ``attrs`` restricts the explosion to a subset of columns (defaults to
    all data attributes). Output has exactly ``len(attrs) * |df|`` rows;
    NULL cells are preserved as NULL values.
    """
    attrs = attrs if attrs is not None else data_attrs(df)
    if not attrs:
        raise ValueError("to_cells requires at least one data attribute")
    pairs = ", ".join(f"'{a}', cast(`{a}` as string)" for a in attrs)
    stacked = f"stack({len(attrs)}, {pairs}) as (attr, value)"
    return df.select(F.col(TID), F.expr(stacked))


def from_cells(cells: DataFrame, attrs: list[str]) -> DataFrame:
    """Pivot ``(tid, attr, value)`` cells back into a wide frame.

    ``attrs`` fixes both the pivot domain and the output column order, so
    the result schema is deterministic regardless of which attrs appear in
    ``cells``. Missing (tid, attr) combinations become NULL.
    """
    wide = (
        cells.groupBy(TID)
        .pivot("attr", attrs)
        .agg(F.first("value", ignorenulls=False))
    )
    return wide.select(TID, *attrs)


def apply_fixes(df: DataFrame, fixes: DataFrame) -> DataFrame:
    """Apply sparse cell fixes ``(tid, attr, new_value)`` onto a wide frame.

    Cells not present in ``fixes`` keep their input value; fixed cells take
    ``new_value`` (which may be NULL — an explicit fix *to* NULL wins over
    the original value). If ``fixes`` contains duplicate (tid, attr) keys
    the lexicographically smallest ``new_value`` wins, keeping the result
    deterministic.
    """
    attrs = data_attrs(df)
    one_fix = fixes.groupBy(TID, "attr").agg(
        F.min_by(F.col("new_value"), F.coalesce(F.col("new_value"), F.lit("￿"))).alias(
            "new_value"
        ),
        F.lit(True).alias("__fixed__"),
    )
    cells = to_cells(df)
    patched = (
        cells.join(one_fix, [TID, "attr"], "left")
        .select(
            TID,
            "attr",
            F.when(F.col("__fixed__").isNotNull(), F.col("new_value"))
            .otherwise(F.col("value"))
            .alias("value"),
        )
    )
    return from_cells(patched, attrs)


def materialize(df: DataFrame) -> DataFrame:
    """Compute ``df`` and truncate its Catalyst lineage.

    Iterative repair algorithms (Horizon, Nadeef) re-derive the frame
    each round; without a lineage break the plan nests one pivot per
    round and Catalyst analysis time explodes (and eventually overflows
    the JVM stack). ``localCheckpoint`` stores the partitions and
    replaces the plan with a leaf."""
    return df.localCheckpoint(eager=True)


def diff_cells(before: DataFrame, after: DataFrame) -> DataFrame:
    """Cells whose value differs (null-safe) between two wide frames.

    Returns ``(tid, attr, old_value, new_value)``. Both frames must share
    the same schema and tid domain.
    """
    b = to_cells(before).withColumnRenamed("value", "old_value")
    a = to_cells(after).withColumnRenamed("value", "new_value")
    return (
        b.join(a, [TID, "attr"])
        .where(~F.col("old_value").eqNullSafe(F.col("new_value")))
    )
