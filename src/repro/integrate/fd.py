"""ALITE-style Full Disjunction as a Spark dataflow.

Semantics (ALITE, PVLDB'22): align columns by integration ID, take the
**outer union** of all tuples, apply **complementation** to a fixpoint —
two tuples merge iff they agree on every attribute where both are
non-null and share at least one non-null attribute — and finally remove
**subsumed** tuples. The result is the natural full disjunction, the
associative outer-join variant that maximally connects partial facts
(Galindo-Legaria '94, Rajaraman & Ullman '96).

Distribution strategy: complementation can only ever combine tuples that
share a ``(column, value)`` pair, so the closure is local to connected
components of the tuple <-> value bipartite graph. We compute components
with distributed label propagation (``components.py``) and run the
closure per component in an Arrow-backed ``applyInPandas`` kernel with
(column, value)-blocked candidate generation. Worst-case FD is
exponential (inherently — so is ALITE); ``max_component_tuples`` bounds a
single component's closure and raises instead of silently truncating.

Provenance: each output tuple carries ``_tids`` = the ids of exactly
those input tuples it subsumes, matching the ``TIDs`` sets shown in the
paper's Figs. 3 and 8 (an input tuple may support several output tuples,
like t13 appearing in both f8 and f13).
"""
from __future__ import annotations

from collections import deque

import pandas as pd
import pyspark.sql.functions as F
import pyspark.sql.types as T
from pyspark.sql import DataFrame

from .components import connected_components
from .outer_union import TIDS, outer_union

_SEP = "\x01"


def _merge(a: tuple, b: tuple) -> tuple | None:
    """Complementation merge, or None if not complementable."""
    shared = False
    out = []
    for x, y in zip(a, b):
        if x is None:
            out.append(y)
        elif y is None:
            out.append(x)
        elif x == y:
            out.append(x)
            shared = True
        else:
            return None
    return tuple(out) if shared else None


def _subsumes(s: tuple, t: tuple) -> bool:
    """True iff t's non-null values all appear identically in s."""
    return all(tv is None or tv == sv for sv, tv in zip(s, t))


def _sort_key(t: tuple) -> tuple:
    """Total order over value tuples containing Nones (determinism)."""
    return tuple((v is None, v or "") for v in t)


def _component_closure(
    rows: list[tuple[tuple, set[str]]], max_tuples: int
) -> list[tuple[tuple, list[str]]]:
    """Complementation closure + subsumption removal + provenance for the
    tuples of one connected component. Pure Python on small groups."""
    # Dedup identical input tuples, accumulating their tids.
    inputs: dict[tuple, set[str]] = {}
    for values, tids in rows:
        inputs.setdefault(values, set()).update(tids)

    keys: set[tuple] = set(inputs)
    index: dict[tuple[int, str], set[tuple]] = {}

    def _index_add(t: tuple) -> None:
        for ci, v in enumerate(t):
            if v is not None:
                index.setdefault((ci, v), set()).add(t)

    for t in keys:
        _index_add(t)

    queue: deque[tuple] = deque(sorted(keys, key=_sort_key))
    while queue:
        t = queue.popleft()
        cands: set[tuple] = set()
        for ci, v in enumerate(t):
            if v is not None:
                cands |= index[(ci, v)]
        cands.discard(t)
        for c in cands:
            m = _merge(t, c)
            if m is None or m in keys:
                continue
            if len(keys) >= max_tuples:
                raise RuntimeError(
                    f"FD component closure exceeded {max_tuples} tuples; "
                    "raise max_component_tuples if this is intended"
                )
            keys.add(m)
            _index_add(m)
            queue.append(m)

    # Subsumption removal: walk keys by descending non-null count; any
    # subsumer of t has >= count, so checking t against already-kept
    # tuples suffices (equal count + subsumption implies equality).
    kept: list[tuple] = []
    kept_index: dict[tuple[int, str], set[tuple]] = {}
    for t in sorted(
        keys, key=lambda k: (-sum(v is not None for v in k), _sort_key(k))
    ):
        cands2: set[tuple] = set()
        for ci, v in enumerate(t):
            if v is not None:
                cands2 |= kept_index.get((ci, v), set())
        if any(_subsumes(s, t) for s in cands2):
            continue
        kept.append(t)
        for ci, v in enumerate(t):
            if v is not None:
                kept_index.setdefault((ci, v), set()).add(t)

    # Provenance: an output tuple's TIDs are the input tuples it subsumes.
    out: list[tuple[tuple, list[str]]] = []
    for t in kept:
        tids: set[str] = set()
        for src, src_tids in inputs.items():
            if _subsumes(t, src):
                tids.update(src_tids)
        out.append((t, sorted(tids)))
    return out


def full_disjunction(
    dfs: list[DataFrame],
    *,
    tid_col: str | None = None,
    max_component_tuples: int = 100_000,
) -> DataFrame:
    """Natural FD of aligned tables (columns named by integration ID).

    Returns a DataFrame over the union of integration IDs (string-typed)
    plus a ``_tids`` array<string> provenance column.
    """
    u = outer_union(dfs, tid_col=tid_col).localCheckpoint(eager=True)
    value_cols = [c for c in u.columns if c != TIDS]

    pairs = F.array(
        *[
            F.struct(F.lit(c).alias("c"), F.col(c).alias("v"))
            for c in value_cols
        ]
    )
    exploded = (
        u.select(F.element_at(F.col(TIDS), 1).alias("tid"), F.explode(pairs).alias("p"))
        .where(F.col("p.v").isNotNull())
    )
    edges = exploded.select(
        F.concat(F.lit("t:"), F.col("tid")).alias("src"),
        F.concat(F.lit("v:"), F.col("p.c"), F.lit(_SEP), F.col("p.v")).alias("dst"),
    )
    comps = connected_components(edges)
    labeled = u.join(
        comps.where(F.col("node").startswith("t:")).select(
            F.expr("substring(node, 3)").alias("tid"), "component"
        ),
        F.element_at(F.col(TIDS), 1) == F.col("tid"),
    ).drop("tid")

    schema = T.StructType(
        [T.StructField(c, T.StringType()) for c in value_cols]
        + [T.StructField(TIDS, T.ArrayType(T.StringType()))]
    )

    def kernel(pdf: pd.DataFrame) -> pd.DataFrame:
        rows = [
            (
                tuple(
                    None if pd.isna(row[c]) else row[c] for c in value_cols
                ),
                set(row[TIDS]),
            )
            for _, row in pdf.iterrows()
        ]
        result = _component_closure(rows, max_component_tuples)
        return pd.DataFrame(
            [
                {**{c: v for c, v in zip(value_cols, values)}, TIDS: tids}
                for values, tids in result
            ],
            columns=value_cols + [TIDS],
        )

    return labeled.groupBy("component").applyInPandas(kernel, schema)


def annotate_null_kinds(
    fd_df: DataFrame,
    tid_table: dict[str, str],
    table_columns: dict[str, set[str]],
) -> pd.DataFrame:
    """Display helper reconstructing the paper's two null symbols.

    For each null cell of the FD result: ``±`` ("missing null" — some
    contributing source table *has* the attribute but the value was null
    in the input) vs ``⊥`` ("produced null" — no contributing table has
    the attribute at all). ``tid_table`` maps tuple ids to their source
    table; ``table_columns`` maps tables to their integration IDs.
    Driver-side pandas, intended for small demo-scale tables.
    """
    rows = fd_df.collect()
    value_cols = [c for c in fd_df.columns if c != TIDS]
    out = []
    for r in rows:
        tables = {tid_table[t] for t in r[TIDS]}
        rec = {}
        for c in value_cols:
            v = r[c]
            if v is not None:
                rec[c] = v
            elif any(c in table_columns[t] for t in tables):
                rec[c] = "±"
            else:
                rec[c] = "⊥"
        rec[TIDS] = ",".join(sorted(r[TIDS]))
        out.append(rec)
    return pd.DataFrame(out, columns=value_cols + [TIDS])
