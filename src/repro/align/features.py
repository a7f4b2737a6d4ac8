"""Column profiling for holistic schema matching (ALITE's Align stage).

ALITE matches columns by *instance* evidence (it assumes headers are
unreliable); the published system embeds columns with TURL. No pretrained
model is available offline, so our profiles are value-distribution
features: a capped sample of distinct normalized values, distinct/row
counts, numeric ratio and mean length. Matching quality is evaluated
against lake ground truth in table E4.

The profiling dataflow is one Spark job over the union of all melted
tables: ``(table, column, value)`` triples -> per-column aggregates. Only
the per-column aggregate rows (a few hundred) are collected to the driver.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import reduce

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

_SAMPLE_CAP = 4096
# Includes scientific notation: Spark renders big doubles as "1.62E7".
_NUMERIC_RE = r"^\s*[+-]?\d+(\.\d+)?([eE][+-]?\d+)?\s*$"


@dataclass(frozen=True)
class ColumnProfile:
    """Instance-level profile of one column of one table."""

    table: str
    column: str
    n_values: int
    n_distinct: int
    numeric_ratio: float
    avg_len: float
    values: frozenset[str]  # up to _SAMPLE_CAP distinct normalized values

    @property
    def is_numeric(self) -> bool:
        return self.numeric_ratio >= 0.8


def melt_values(name: str, df: DataFrame) -> DataFrame:
    """``(table, column, value)`` triples of one table, values cast to
    string and normalized (lowercased/trimmed); nulls dropped."""
    stringly = df.select([F.col(c).cast("string").alias(c) for c in df.columns])
    melted = stringly.melt(
        ids=[], values=list(stringly.columns),
        variableColumnName="column", valueColumnName="value",
    )
    return (
        melted.where(F.col("value").isNotNull())
        .select(
            F.lit(name).alias("table"),
            "column",
            F.lower(F.trim(F.col("value"))).alias("value"),
        )
    )


def column_profiles(frames: dict[str, DataFrame]) -> list[ColumnProfile]:
    """Profile every column of every table in one distributed pass."""
    melted = reduce(
        DataFrame.unionByName,
        [melt_values(name, df) for name, df in frames.items()],
    )
    agg = (
        melted.groupBy("table", "column")
        .agg(
            F.count("*").alias("n_values"),
            F.countDistinct("value").alias("n_distinct"),
            F.avg(F.col("value").rlike(_NUMERIC_RE).cast("double")).alias(
                "numeric_ratio"
            ),
            F.avg(F.length("value")).alias("avg_len"),
            F.slice(F.collect_set("value"), 1, _SAMPLE_CAP).alias("sample"),
        )
        .collect()
    )
    profiles = [
        ColumnProfile(
            table=r["table"],
            column=r["column"],
            n_values=r["n_values"],
            n_distinct=r["n_distinct"],
            numeric_ratio=float(r["numeric_ratio"] or 0.0),
            avg_len=float(r["avg_len"] or 0.0),
            values=frozenset(r["sample"]),
        )
        for r in agg
    ]
    # Columns that are entirely null never appear in `melted`; profile them
    # as empty so they still receive (singleton) integration IDs.
    seen = {(p.table, p.column) for p in profiles}
    for name, df in frames.items():
        for c in df.columns:
            if (name, c) not in seen:
                profiles.append(
                    ColumnProfile(name, c, 0, 0, 0.0, 0.0, frozenset())
                )
    return sorted(profiles, key=lambda p: (p.table, p.column))
