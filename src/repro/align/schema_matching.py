"""Holistic schema matching: assign integration IDs across an integration
set (ALITE's Align stage).

Pipeline: profile every column (one Spark pass, ``features.py``) ->
pairwise instance similarity between columns of *different* tables ->
constrained clustering (``clustering.py``) -> an :class:`Alignment` that
renames each table's columns to their integration IDs.

Similarity is value-overlap based: max of Jaccard and min-containment of
the distinct-value samples (containment matters because lake tables are
row-fragments of different sizes — two 20% samples of the same attribute
have modest Jaccard but high small-in-large containment). Headers are
deliberately ignored, matching ALITE's no-reliable-metadata assumption.
"""
from __future__ import annotations

from dataclasses import dataclass

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

import re

from ..util import normalize
from .clustering import cluster_columns
from .features import ColumnProfile, column_profiles

DEFAULT_THRESHOLD = 0.25

# Headers that carry no semantics ("col_3", "unnamed_0") — equality between
# them is an artifact of positional naming, not evidence of a match.
_UNINFORMATIVE_RE = re.compile(r"^(col|column|attr|field|unnamed|var)[ _]?\d*$")

_HEADER_WEIGHT = 0.9


def _header_similarity(p: ColumnProfile, q: ColumnProfile) -> float:
    """Header-name evidence: exact normalized equality of *informative*
    headers. Our matcher is primarily instance-based (ALITE assumes
    unreliable metadata), but unionable tables with disjoint rows — the
    paper's T1/T2 — have zero value overlap, where ALITE's semantic
    embeddings would still align them; consistent headers are the
    offline-computable stand-in for that semantic signal."""
    a, b = normalize(p.column), normalize(q.column)
    if not a or not b:
        return 0.0
    if _UNINFORMATIVE_RE.match(a) or _UNINFORMATIVE_RE.match(b):
        return 0.0
    return 1.0 if a == b else 0.0


def column_similarity(p: ColumnProfile, q: ColumnProfile) -> float:
    """Similarity of two columns in [0, 1]: instance value overlap,
    falling back to informative-header equality."""
    header = _header_similarity(p, q) * _HEADER_WEIGHT
    if not p.values or not q.values:
        return header
    # A numeric column should not match a non-numeric one even if a few
    # string forms collide ("2020" in a name column, say).
    if p.is_numeric != q.is_numeric:
        return 0.0
    inter = len(p.values & q.values)
    if inter == 0:
        return header
    jac = inter / len(p.values | q.values)
    cont = inter / min(len(p.values), len(q.values))
    return max(jac, cont * 0.8, header)


@dataclass(frozen=True)
class Alignment:
    """column -> integration ID assignment for an integration set."""

    assignments: dict[tuple[str, str], str]  # (table, column) -> iid

    def iid(self, table: str, column: str) -> str:
        return self.assignments[(table, column)]

    def clusters(self) -> dict[str, list[tuple[str, str]]]:
        """integration ID -> member (table, column) list."""
        out: dict[str, list[tuple[str, str]]] = {}
        for tc, iid in sorted(self.assignments.items()):
            out.setdefault(iid, []).append(tc)
        return out

    def apply(self, frames: dict[str, DataFrame],
              *, keep: tuple[str, ...] = ()) -> dict[str, DataFrame]:
        """Rename every column of every frame to its integration ID and
        cast values to string (FD compares values as strings, as ALITE
        does over heterogeneous open data). ``keep`` columns (e.g. a TID
        provenance column) pass through unrenamed."""
        out: dict[str, DataFrame] = {}
        for name, df in frames.items():
            cols = []
            for c in df.columns:
                if c in keep:
                    cols.append(F.col(c))
                else:
                    cols.append(
                        F.col(c).cast("string").alias(self.iid(name, c))
                    )
            out[name] = df.select(cols)
        return out


def _iid_names(clusters: dict[int, list[tuple[str, str]]]) -> dict[int, str]:
    """Human-readable integration IDs: the most common original header in
    the cluster (ties broken lexicographically), de-duplicated with a
    numeric suffix. Falls back to ``iid_<k>``."""
    names: dict[int, str] = {}
    used: set[str] = set()
    for cid in sorted(clusters):
        members = clusters[cid]
        counts: dict[str, int] = {}
        for _, col in members:
            counts[col] = counts.get(col, 0) + 1
        base = sorted(counts.items(), key=lambda kv: (-kv[1], kv[0]))[0][0]
        name = base
        k = 1
        while name in used:
            name = f"{base}_{k}"
            k += 1
        used.add(name)
        names[cid] = name
    return names


def align(frames: dict[str, DataFrame], *,
          threshold: float = DEFAULT_THRESHOLD,
          exclude: tuple[str, ...] = ()) -> Alignment:
    """Holistically match the columns of an integration set.

    ``exclude`` columns (provenance columns like TID) are not profiled or
    matched. Returns the integration-ID assignment for every remaining
    column; unmatched columns get singleton IDs.
    """
    to_profile = {
        name: df.select([c for c in df.columns if c not in exclude])
        for name, df in frames.items()
    }
    profiles = column_profiles(to_profile)
    columns = [(p.table, p.column) for p in profiles]
    edges = []
    for i, p in enumerate(profiles):
        for q in profiles[i + 1:]:
            if p.table == q.table:
                continue
            s = column_similarity(p, q)
            if s >= threshold:
                edges.append(((p.table, p.column), (q.table, q.column), s))
    clustered = cluster_columns(columns, edges)
    by_cid: dict[int, list[tuple[str, str]]] = {}
    for tc, cid in clustered.items():
        by_cid.setdefault(cid, []).append(tc)
    names = _iid_names(by_cid)
    return Alignment(
        assignments={tc: names[cid] for tc, cid in clustered.items()}
    )
