"""Exact-overlap search (JOSIE-lite) and the paper's Fig. 4 user function.

JOSIE answers top-k joinability by *exact* set-overlap between the query
column and lake columns. At our lake scale exhaustive exact overlap is
feasible as one Spark join, which doubles as the ground-truth comparator
for LSH Ensemble's approximate results (table E3).

``inner_join_similarity`` is the demo's Fig. 4 snippet verbatim — a
user-defined pairwise discovery function over pandas frames — used by
the extensibility tests through ``PairwiseDiscovery``.
"""
from __future__ import annotations

from functools import reduce

import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from ..align.features import melt_values
from ..lake.catalog import Catalog
from .base import ScoredTable


def inner_join_similarity(df1: pd.DataFrame, df2: pd.DataFrame) -> float:
    """The paper's Fig. 4 user-defined discovery algorithm, as printed:
    |df1 ⋈ df2| / max(|df1|, |df2|) over the natural inner join."""
    shared = [c for c in df1.columns if c in df2.columns]
    if not shared or len(df1) == 0 or len(df2) == 0:
        return 0.0
    # Open-data lakes reuse meaningless headers across unrelated tables
    # ("col_2" as a city in one, a rate in another); string-type the join
    # keys so pandas merges instead of raising on dtype mismatches.
    a, b = df1.copy(), df2.copy()
    for c in shared:
        a[c] = a[c].map(lambda v: None if pd.isna(v) else str(v))
        b[c] = b[c].map(lambda v: None if pd.isna(v) else str(v))
    join_df = pd.merge(a, b, how="inner", on=shared)
    return len(join_df) / max(len(a), len(b))


class ExactOverlap:
    """Exact containment top-k search (the JOSIE role in DIALITE)."""

    name = "exact_overlap"

    def __init__(self, *, threshold: float = 0.0):
        self.threshold = threshold
        self._values: DataFrame | None = None

    def build_index(self, catalog: Catalog) -> None:
        """Materialize distinct (table, column, value) triples."""
        self._values = (
            reduce(
                DataFrame.unionByName,
                [
                    melt_values(name, catalog.table(name))
                    for name in catalog.table_names()
                ],
            )
            .distinct()
            .localCheckpoint(eager=True)
        )

    def column_containments(
        self, query: DataFrame, query_col: str
    ) -> DataFrame:
        """(table, column, containment) of the query column's values in
        every lake column — one distributed join + aggregation."""
        if self._values is None:
            raise RuntimeError("build_index not called")
        qvals = (
            query.select(
                F.lower(F.trim(F.col(query_col).cast("string"))).alias("value")
            )
            .where(F.col("value").isNotNull())
            .distinct()
        )
        q_size = qvals.count()
        if q_size == 0:
            return self._values.sparkSession.createDataFrame(
                [], "table string, column string, containment double"
            )
        return (
            self._values.join(qvals, "value")
            .groupBy("table", "column")
            .agg((F.count("*") / F.lit(q_size)).alias("containment"))
        )

    def search(
        self, query: DataFrame, query_col: str, k: int
    ) -> list[ScoredTable]:
        per_col = self.column_containments(query, query_col)
        rows = (
            per_col.groupBy("table")
            .agg(F.max("containment").alias("score"))
            .where(F.col("score") > self.threshold)
            .collect()
        )
        return sorted(
            (ScoredTable(r["table"], float(r["score"])) for r in rows),
            key=lambda s: (-s.score, s.table),
        )[:k]
