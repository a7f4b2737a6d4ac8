"""Outer-join integration baseline (the paper's Fig. 6 alternative).

Left-fold of SQL FULL OUTER JOINs over the shared integration IDs of the
accumulated result and the next table, coalescing shared columns. This is
the integration operator DIALITE's demo contrasts with ALITE's FD:
it is **not associative** (the result depends on table order) and —
because SQL join predicates never match on null keys — it fails to
connect facts transitively (Fig. 8a misses the J&J-approver tuple that FD
recovers in Fig. 8b).

Provenance: ``_tids`` arrays concatenate when rows join, so the baseline
is scored by the same downstream harnesses as FD.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .outer_union import TIDS, with_tids


def _join_two(left: DataFrame, right: DataFrame) -> DataFrame:
    shared = [
        c for c in left.columns if c in right.columns and c != TIDS
    ]
    l, r = left.alias("l"), right.alias("r")
    if not shared:
        # SQL outer join without a predicate degenerates; the conventional
        # integration fallback (what pandas' merge refuses outright) is the
        # outer union of the two sides.
        return l.unionByName(r, allowMissingColumns=True)
    cond = None
    for c in shared:
        eq = F.col(f"l.{c}") == F.col(f"r.{c}")
        cond = eq if cond is None else (cond & eq)
    joined = l.join(r, cond, "full_outer")
    cols = []
    for c in left.columns:
        if c == TIDS:
            continue
        if c in shared:
            cols.append(F.coalesce(F.col(f"l.{c}"), F.col(f"r.{c}")).alias(c))
        else:
            cols.append(F.col(f"l.{c}").alias(c))
    for c in right.columns:
        if c not in left.columns and c != TIDS:
            cols.append(F.col(f"r.{c}").alias(c))
    cols.append(
        F.concat(
            F.coalesce(F.col(f"l.{TIDS}"), F.array()),
            F.coalesce(F.col(f"r.{TIDS}"), F.array()),
        ).alias(TIDS)
    )
    return joined.select(cols)


def outer_join_integrate(
    dfs: list[DataFrame], *, tid_col: str | None = None
) -> DataFrame:
    """Integrate aligned tables by sequential full outer joins, in the
    given order (order matters — outer join is not associative)."""
    tagged = [
        with_tids(df, f"T{i}", tid_col=tid_col) for i, df in enumerate(dfs)
    ]
    tagged = [
        t.select(
            [F.col(c).cast("string").alias(c) for c in t.columns if c != TIDS]
            + [F.col(TIDS)]
        )
        for t in tagged
    ]
    acc = tagged[0]
    for nxt in tagged[1:]:
        acc = _join_two(acc, nxt)
    value_cols = [c for c in acc.columns if c != TIDS]
    return acc.select(*value_cols, TIDS)
