"""Aligned outer union with tuple provenance — the first step of ALITE's FD.

The outer union of an aligned integration set stacks all tuples into one
relation over the union of integration IDs, padding attributes a source
table lacks with (produced) nulls. Every tuple carries ``_tids``, an
array of source-tuple identifiers; the paper's figures show these as the
``TIDs`` column of the integrated table.
"""
from __future__ import annotations

from functools import reduce

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

TIDS = "_tids"


def with_tids(df: DataFrame, prefix: str, *, tid_col: str | None = None) -> DataFrame:
    """Attach a ``_tids`` provenance array to each row.

    If ``tid_col`` names an existing column (like the paper's ``TID``), it
    is consumed as the identifier; otherwise identifiers are generated as
    ``<prefix>r<n>``. Generated ids are only used to track provenance and
    multiplicity, never joined on across runs.
    """
    if tid_col and tid_col in df.columns:
        out = df.withColumn(TIDS, F.array(F.col(tid_col).cast("string")))
        return out.drop(tid_col)
    return df.withColumn(
        TIDS,
        F.array(
            F.concat(F.lit(f"{prefix}r"), F.monotonically_increasing_id())
        ),
    )


def outer_union(dfs: list[DataFrame], *, tid_col: str | None = None) -> DataFrame:
    """Outer union of aligned tables (all value columns string-typed,
    named by integration ID), with provenance. Rows whose value columns
    are all null are dropped — they denote no fact."""
    tagged = []
    for i, df in enumerate(dfs):
        t = with_tids(df, f"T{i}", tid_col=tid_col)
        tagged.append(
            t.select(
                [F.col(c).cast("string").alias(c)
                 for c in t.columns if c != TIDS] + [F.col(TIDS)]
            )
        )
    u = reduce(
        lambda a, b: a.unionByName(b, allowMissingColumns=True), tagged
    )
    value_cols = [c for c in u.columns if c != TIDS]
    any_value = reduce(
        lambda a, b: a | b, [F.col(c).isNotNull() for c in value_cols]
    )
    return u.where(any_value).select(*value_cols, TIDS)
