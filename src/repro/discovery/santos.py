"""SANTOS-style semantic union search (Khatiwada et al., SIGMOD'23-lite).

SANTOS discovers tables *unionable* with a query table by annotating
columns with knowledge-base semantic types and column pairs with KB
relationships, then scoring candidates by how well their relationship
graph covers the query's — anchored at the user's intent column. Our
substitute (DESIGN.md) keeps that pipeline with the synthetic YAGO-lite
KB: offline, one Spark pass annotates every lake column by majority KB
vote and derives typed relationship edges per table; online, the query
table is annotated the same way and candidates are ranked by
relationship overlap (intent-anchored edges weighted double) plus type
overlap.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import reduce

import pandas as pd
import pyspark.sql.functions as F
import pyspark.sql.types as T
from pyspark.sql import DataFrame

from ..align.features import melt_values
from ..lake.catalog import Catalog
from ..lake.kb import KnowledgeBase
from ..util import normalize
from .base import ScoredTable

_MIN_TYPED_FRAC = 0.5  # majority vote: >=50% of values must carry the type


@dataclass(frozen=True)
class TableSemantics:
    """Semantic annotation of one table."""

    column_types: dict[str, str]  # column -> semantic type
    relationships: frozenset[tuple[str, str, str]]  # (rel, typeA, typeB)


def _relationships(
    kb: KnowledgeBase, column_types: dict[str, str]
) -> frozenset[tuple[str, str, str]]:
    rels = set()
    types = sorted(column_types.values())
    for i, ta in enumerate(types):
        for tb in types[i + 1 :]:
            rel = kb.relationship(ta, tb)
            if rel is not None:
                rels.add((rel, *sorted((ta, tb))))
    return frozenset(rels)


class Santos:
    """Unionable-table search over a lake catalog."""

    name = "santos"

    def __init__(self, kb: KnowledgeBase):
        self.kb = kb
        self._semantics: dict[str, TableSemantics] = {}

    # -- offline -----------------------------------------------------------

    def build_index(self, catalog: Catalog) -> None:
        """Annotate every lake column with its majority KB type in one
        distributed pass; derive per-table relationship edges."""
        melted = reduce(
            DataFrame.unionByName,
            [
                melt_values(name, catalog.table(name))
                for name in catalog.table_names()
            ],
        )
        entity_types = self.kb.entity_types  # plain dict, shipped in closure

        @F.udf(T.StringType())
        def type_of(value: str) -> str | None:
            return entity_types.get(normalize(value))

        typed = melted.withColumn("type", type_of(F.col("value")))
        counts = (
            typed.groupBy("table", "column")
            .agg(
                F.count("*").alias("n"),
                *[
                    F.sum((F.col("type") == t).cast("long")).alias(f"n_{t}")
                    for t in sorted(set(entity_types.values()))
                ],
            )
            .collect()
        )
        col_types: dict[str, dict[str, str]] = {}
        type_names = sorted(set(entity_types.values()))
        for r in counts:
            votes = {t: (r[f"n_{t}"] or 0) for t in type_names}
            t_best, n_best = max(
                votes.items(), key=lambda kv: (kv[1], kv[0])
            )
            if r["n"] > 0 and n_best / r["n"] >= _MIN_TYPED_FRAC:
                col_types.setdefault(r["table"], {})[r["column"]] = t_best
        self._semantics = {
            name: TableSemantics(
                column_types=col_types.get(name, {}),
                relationships=_relationships(self.kb, col_types.get(name, {})),
            )
            for name in catalog.table_names()
        }

    # -- online ------------------------------------------------------------

    def annotate_query(self, query: DataFrame) -> TableSemantics:
        """Driver-side annotation of the (small) query table."""
        pdf = query.toPandas()
        column_types: dict[str, str] = {}
        for c in pdf.columns:
            vals = [v for v in pdf[c].tolist() if v is not None and not pd.isna(v)]
            if not vals:
                continue
            votes: dict[str, int] = {}
            for v in vals:
                t = self.kb.type_of(v)
                if t is not None:
                    votes[t] = votes.get(t, 0) + 1
            if votes:
                t_best, n_best = max(
                    votes.items(), key=lambda kv: (kv[1], kv[0])
                )
                if n_best / len(vals) >= _MIN_TYPED_FRAC:
                    column_types[c] = t_best
        return TableSemantics(
            column_types=column_types,
            relationships=_relationships(self.kb, column_types),
        )

    def search(
        self, query: DataFrame, query_col: str, k: int
    ) -> list[ScoredTable]:
        if not self._semantics:
            raise RuntimeError("build_index not called")
        q = self.annotate_query(query)
        intent_type = q.column_types.get(query_col)
        scored = []
        for name, sem in sorted(self._semantics.items()):
            shared_rels = q.relationships & sem.relationships
            anchored = {
                r for r in shared_rels if intent_type in (r[1], r[2])
            }
            shared_types = set(q.column_types.values()) & set(
                sem.column_types.values()
            )
            intent_bonus = (
                1.0
                if intent_type is not None
                and intent_type in sem.column_types.values()
                else 0.0
            )
            score = (
                2.0 * len(anchored)
                + 1.0 * len(shared_rels - anchored)
                + 0.5 * len(shared_types)
                + intent_bonus
            )
            if score > 0:
                scored.append(ScoredTable(name, score))
        return sorted(scored, key=lambda s: (-s.score, s.table))[:k]
