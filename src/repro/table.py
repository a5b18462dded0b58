"""Table model shared by every matcher.

A :class:`Table` is a named Spark DataFrame plus derived column metadata
(the *type class* of each column: string / numeric / date / boolean).
Matchers never look at raw Spark schemata directly — they go through this
wrapper so schema-level information (names, types) and instance-level
information (a long-format ``(column, value)`` melt) are produced in one
audited place.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import reduce

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

#: The coarse type classes matchers reason about (Valentine's "Data Type"
#: match facet works at this granularity, not exact SQL types).
TYPE_CLASSES = ("string", "numeric", "date", "boolean")


def type_class_of(dt: T.DataType) -> str:
    """Collapse a Spark SQL type into one of :data:`TYPE_CLASSES`."""
    if isinstance(dt, (T.ByteType, T.ShortType, T.IntegerType, T.LongType,
                       T.FloatType, T.DoubleType, T.DecimalType)):
        return "numeric"
    if isinstance(dt, (T.DateType, T.TimestampType, T.TimestampNTZType)):
        return "date"
    if isinstance(dt, T.BooleanType):
        return "boolean"
    return "string"


@dataclass
class Table:
    """A named dataset participating in a matching experiment.

    ``name`` is the relation name (used by name-path matchers and the
    table-name-prefix schema-noise transform). ``df`` holds the data.
    """

    name: str
    df: DataFrame
    _types: dict[str, str] = field(default=None, repr=False)  # lazy cache

    @property
    def columns(self) -> list[str]:
        """Column names, in schema order."""
        return list(self.df.columns)

    @property
    def column_types(self) -> dict[str, str]:
        """Mapping column name -> type class (cached; schema-only)."""
        if self._types is None:
            self._types = {
                f.name: type_class_of(f.dataType) for f in self.df.schema.fields
            }
        return self._types

    def renamed(self, mapping: dict[str, str], *, name: str | None = None) -> "Table":
        """A copy with columns renamed per ``mapping`` (missing keys kept)."""
        cols = [F.col(c).alias(mapping.get(c, c)) for c in self.columns]
        return Table(name or self.name, self.df.select(*cols))


def melt_values(table: Table, columns: list[str] | None = None) -> DataFrame:
    """Long-format view ``(col: string, value: string)`` of a table.

    Every cell is cast to its string representation; NULL cells are
    dropped. This is the entry point for all instance-based matchers, so
    they see one canonical value encoding. Uses SQL ``stack`` so the melt
    is a single narrow Catalyst projection, not N unions.
    """
    cols = columns if columns is not None else table.columns
    if not cols:
        raise ValueError(f"melt_values: table {table.name!r} has no columns")
    quoted = ", ".join(
        f"'{c}', cast(`{c}` as string)" for c in cols
    )
    melted = table.df.select(
        F.expr(f"stack({len(cols)}, {quoted}) as (col, value)")
    )
    return melted.where(F.col("value").isNotNull())


def distinct_values(table: Table, columns: list[str] | None = None,
                    *, max_values: int | None = None) -> DataFrame:
    """Distinct ``(col, value)`` pairs, optionally capped per column.

    The cap takes a deterministic sample — the ``max_values`` rows with
    the smallest ``xxhash64(value)`` per column — so repeated runs (and
    the DuckDB oracle) see identical inputs regardless of partitioning.
    """
    dv = melt_values(table, columns).distinct()
    if max_values is None:
        return dv
    from pyspark.sql import Window

    w = Window.partitionBy("col").orderBy(F.xxhash64("value"), F.col("value"))
    return (
        dv.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") <= max_values)
        .drop("_rn")
    )


def union_all(dfs: list[DataFrame]) -> DataFrame:
    """Union a non-empty list of DataFrames by column name."""
    if not dfs:
        raise ValueError("union_all: empty list")
    return reduce(lambda a, b: a.unionByName(b), dfs)
