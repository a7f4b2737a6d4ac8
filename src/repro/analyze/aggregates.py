"""Downstream analytics over an integrated table (DIALITE's Analyze stage).

The demo's Example 3 runs aggregation/correlation queries over the Fig. 3
integrated table: min/max vaccination city, Pearson correlation between
vaccination and death rates (0.16) and between case counts and
vaccination rates (0.9). Integrated open-data values are strings with
unit suffixes ("1.4M", "63%"), so analytics first parse them through
``util.parse_numeric`` (a pandas UDF over Arrow batches).
"""
from __future__ import annotations

import pandas as pd
import pyspark.sql.functions as F
import pyspark.sql.types as T
from pyspark.sql import Column, DataFrame

from ..util import parse_numeric


@F.pandas_udf(T.DoubleType())
def _parse_numeric_udf(s: pd.Series) -> pd.Series:
    return s.map(parse_numeric).astype("float64")


def numeric(col: str | Column) -> Column:
    """Column expression parsing open-data numeric strings to double."""
    c = F.col(col) if isinstance(col, str) else col
    return _parse_numeric_udf(c)


def correlation(df: DataFrame, col_a: str, col_b: str) -> float | None:
    """Pearson correlation of two (string-encoded numeric) columns over
    the rows where both are present; None if undefined (<2 points)."""
    row = df.select(
        F.corr(numeric(col_a), numeric(col_b)).alias("r")
    ).first()
    return None if row is None or row["r"] is None else float(row["r"])


def extremes(df: DataFrame, label_col: str, value_col: str) -> tuple[str, str]:
    """(label with minimum value, label with maximum value), nulls
    excluded — Example 3's 'lowest/highest vaccination rate city'."""
    parsed = df.select(
        F.col(label_col).alias("label"), numeric(value_col).alias("v")
    ).where(F.col("v").isNotNull())
    lo = parsed.orderBy(F.col("v").asc(), F.col("label")).first()
    hi = parsed.orderBy(F.col("v").desc(), F.col("label")).first()
    if lo is None or hi is None:
        raise ValueError(f"no numeric values in {value_col}")
    return lo["label"], hi["label"]


def aggregate(
    df: DataFrame, group_col: str, value_col: str,
    aggs: tuple[str, ...] = ("count", "avg", "min", "max"),
) -> DataFrame:
    """Common aggregations of a numeric column per group (null groups and
    null values excluded), e.g. average vaccination rate per country."""
    fns = {"count": F.count, "avg": F.avg, "min": F.min, "max": F.max,
           "sum": F.sum, "stddev": F.stddev}
    unknown = set(aggs) - set(fns)
    if unknown:
        raise ValueError(f"unsupported aggregates: {sorted(unknown)}")
    parsed = df.select(
        F.col(group_col).alias("group"), numeric(value_col).alias("v")
    ).where(F.col("group").isNotNull() & F.col("v").isNotNull())
    return parsed.groupBy("group").agg(
        *[fns[a](F.col("v")).alias(a) for a in aggs]
    )


def completeness(df: DataFrame, value_cols: list[str]) -> float:
    """Fraction of non-null cells — the integration-quality statistic the
    demo surfaces when contrasting FD with outer join output."""
    total = df.count() * len(value_cols)
    if total == 0:
        return 0.0
    row = df.select(
        sum(
            (F.count(F.col(c)) for c in value_cols), start=F.lit(0)
        ).alias("nn")
    ).first()
    return float(row["nn"]) / total
