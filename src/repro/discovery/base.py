"""Discovery algorithm interface (DIALITE's pluggable Discover stage).

A discovery algorithm indexes a lake (offline, like the demo's prebuilt
SANTOS / LSH Ensemble indexes) and answers top-k queries for a query
table. DIALITE persists the *union* of all algorithms' result sets as
the integration set (Sec. 3.1), so results are (table, score) pairs.

Users can also plug in a plain pairwise similarity function (the Fig. 4
extensibility path); ``PairwiseDiscovery`` lifts it to the interface by
scanning the lake.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Protocol

import pandas as pd
from pyspark.sql import DataFrame

from ..lake.catalog import Catalog


@dataclass(frozen=True)
class ScoredTable:
    """One discovery hit."""

    table: str
    score: float


class DiscoveryAlgorithm(Protocol):
    """Offline index build + online top-k search."""

    name: str

    def build_index(self, catalog: Catalog) -> None:
        """Preprocess the lake (the demo's offline indexing step)."""
        ...

    def search(
        self, query: DataFrame, query_col: str, k: int
    ) -> list[ScoredTable]:
        """Top-k lake tables related to the query table; ``query_col``
        is the user's intent/query column (Sec. 3.1)."""
        ...


class PairwiseDiscovery:
    """Adapter for user-defined similarity functions (paper Fig. 4).

    The user supplies ``sim(df1, df2) -> float`` over pandas frames —
    exactly the signature the demo shows — and DIALITE runs it against
    every lake table. Linear scan by design: this is the extensibility
    hook, not an indexed search.
    """

    def __init__(
        self,
        name: str,
        sim: Callable[[pd.DataFrame, pd.DataFrame], float],
    ):
        self.name = name
        self._sim = sim
        self._catalog: Catalog | None = None

    def build_index(self, catalog: Catalog) -> None:
        self._catalog = catalog

    def search(
        self, query: DataFrame, query_col: str, k: int
    ) -> list[ScoredTable]:
        if self._catalog is None:
            raise RuntimeError(f"{self.name}: build_index not called")
        qpdf = query.toPandas()
        scored = [
            ScoredTable(name, float(self._sim(qpdf, self._catalog.table(name).toPandas())))
            for name in self._catalog.table_names()
        ]
        scored = [s for s in scored if s.score > 0]
        return sorted(scored, key=lambda s: (-s.score, s.table))[:k]
