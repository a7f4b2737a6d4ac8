"""Naive integration baselines from DIALITE's related-work comparison.

Auctus-style operators: pairwise **inner join** (drops any fact without a
match in every table) and plain **union** (outer union without
complementation — facts about the same entity stay split across rows).
Both carry ``_tids`` provenance so the E-series quality harnesses can
score them alongside FD and outer join.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .outer_union import TIDS, outer_union, with_tids


def union_integrate(dfs: list[DataFrame], *, tid_col: str | None = None) -> DataFrame:
    """Outer union with exact-duplicate merging (tids accumulate)."""
    u = outer_union(dfs, tid_col=tid_col)
    value_cols = [c for c in u.columns if c != TIDS]
    return (
        u.select(*value_cols, F.explode(TIDS).alias("_tid"))
        .groupBy(*value_cols)
        .agg(F.array_sort(F.collect_set("_tid")).alias(TIDS))
    )


def inner_join_integrate(
    dfs: list[DataFrame], *, tid_col: str | None = None
) -> DataFrame:
    """Left-fold of inner natural joins on shared integration IDs (SQL
    null semantics: null keys never match)."""
    tagged = []
    for i, df in enumerate(dfs):
        t = with_tids(df, f"T{i}", tid_col=tid_col)
        tagged.append(
            t.select(
                [F.col(c).cast("string").alias(c) for c in t.columns if c != TIDS]
                + [F.col(TIDS)]
            )
        )
    acc = tagged[0]
    for nxt in tagged[1:]:
        shared = [c for c in acc.columns if c in nxt.columns and c != TIDS]
        l, r = acc.alias("l"), nxt.alias("r")
        if not shared:
            joined = l.crossJoin(r)
        else:
            cond = None
            for c in shared:
                eq = F.col(f"l.{c}") == F.col(f"r.{c}")
                cond = eq if cond is None else (cond & eq)
            joined = l.join(r, cond, "inner")
        cols = [
            F.col(f"l.{c}").alias(c) for c in acc.columns if c != TIDS
        ] + [
            F.col(f"r.{c}").alias(c)
            for c in nxt.columns
            if c not in acc.columns and c != TIDS
        ]
        cols.append(
            F.concat(F.col(f"l.{TIDS}"), F.col(f"r.{TIDS}")).alias(TIDS)
        )
        acc = joined.select(cols)
    value_cols = [c for c in acc.columns if c != TIDS]
    return acc.select(*value_cols, TIDS)
