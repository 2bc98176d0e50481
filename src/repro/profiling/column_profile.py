"""Per-column statistical profiles via DataFrame aggregations.

The profile carries exactly what the paper's prompts need: row/null
counts, distinct cardinality, and the top-K value frequencies (the
"sample frequent values (by default 1000)" of §2.1.1). Top values are
ordered by descending count with the value itself as a deterministic
tie-break so profiles — and therefore every downstream LLM decision —
are stable across runs.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class ColumnProfile:
    """Statistical summary of one (string) column."""

    name: str
    total: int
    nulls: int
    n_distinct: int
    #: top-K (value, count), count-descending; never contains NULL.
    top_values: tuple[tuple[str, int], ...]

    @property
    def non_null(self) -> int:
        return self.total - self.nulls

    @property
    def null_ratio(self) -> float:
        return self.nulls / self.total if self.total else 0.0

    @property
    def unique_ratio(self) -> float:
        return self.n_distinct / self.non_null if self.non_null else 0.0


def profile_column(df: DataFrame, column: str, *, top_k: int = 1000,
                   total: int | None = None) -> ColumnProfile:
    """Profile ``column`` with two aggregations (counts + top-K values).

    ``total`` lets callers that already know ``df.count()`` (e.g. the
    pipeline profiling every column of one cached table) skip the extra
    scan.
    """
    c = F.col(column)
    counts = df.agg(
        F.count(F.lit(1)).alias("total"),
        F.count(c).alias("non_null"),
        F.count_distinct(c).alias("n_distinct"),
    ).collect()[0]
    n_total = total if total is not None else counts["total"]
    top = (
        df.where(c.isNotNull())
        .groupBy(c.alias("v"))
        .agg(F.count(F.lit(1)).alias("cnt"))
        .orderBy(F.desc("cnt"), F.asc("v"))
        .limit(top_k)
        .collect()
    )
    return ColumnProfile(
        name=column,
        total=n_total,
        nulls=n_total - counts["non_null"],
        n_distinct=counts["n_distinct"],
        top_values=tuple((r["v"], r["cnt"]) for r in top),
    )


def profile_table(df: DataFrame, columns: list[str], *,
                  top_k: int = 1000) -> dict[str, ColumnProfile]:
    """Profile many string columns in two Spark jobs total.

    Job 1: one aggregation computes totals / non-null / distinct counts
    for every column. Job 2: the table is unpivoted to (column, value)
    cells, grouped once, and a window keeps each column's top-K values —
    one shuffle for the whole table instead of one per column.
    """
    from pyspark.sql import Window

    aggs = [F.count(F.lit(1)).alias("__total")]
    for c in columns:
        aggs.append(F.count(F.col(c)).alias(f"{c}__nn"))
        aggs.append(F.count_distinct(F.col(c)).alias(f"{c}__d"))
    stats = df.agg(*aggs).collect()[0]
    total = stats["__total"]

    melted = df.unpivot(
        ids=[], values=columns,
        variableColumnName="__col", valueColumnName="__val",
    ).where(F.col("__val").isNotNull())
    ranked = (
        melted.groupBy("__col", "__val")
        .agg(F.count(F.lit(1)).alias("__cnt"))
        .withColumn(
            "__rn",
            F.row_number().over(
                Window.partitionBy("__col")
                .orderBy(F.desc("__cnt"), F.asc("__val"))
            ),
        )
        .where(F.col("__rn") <= top_k)
        .collect()
    )
    tops: dict[str, list[tuple[str, int]]] = {c: [] for c in columns}
    for r in sorted(ranked, key=lambda r: (r["__col"], r["__rn"])):
        tops[r["__col"]].append((r["__val"], r["__cnt"]))
    return {
        c: ColumnProfile(
            name=c,
            total=total,
            nulls=total - stats[f"{c}__nn"],
            n_distinct=stats[f"{c}__d"],
            top_values=tuple(tops[c]),
        )
        for c in columns
    }


def numeric_min_max(df: DataFrame, column: str) -> tuple[float, float] | None:
    """Min/max of the values of ``column`` that parse as numbers.

    Uses ``try_cast`` semantics (``cast`` returns NULL on failure outside
    ANSI mode; we guard with a regexp so ANSI mode is also safe), so a
    column that mixes numbers with stray text still yields the numeric
    envelope the paper's §2.1.5 review needs. Returns ``None`` when no
    value is numeric.
    """
    num = F.when(
        F.col(column).rlike(r"^\s*-?\d+(\.\d+)?\s*$"),
        F.col(column).cast("double"),
    )
    row = df.agg(F.min(num).alias("lo"), F.max(num).alias("hi")).collect()[0]
    if row["lo"] is None:
        return None
    return float(row["lo"]), float(row["hi"])
