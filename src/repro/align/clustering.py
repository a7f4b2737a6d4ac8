"""Constrained clustering of column-match edges into integration IDs.

ALITE assigns one integration ID per group of matching columns, with the
natural constraint that two columns of the *same* table describe different
attributes and must never share an ID. We realize this as greedy
constrained agglomeration: process candidate edges in descending
similarity and union two clusters only if the merge keeps at most one
column per table. This is the classic correlation-clustering heuristic
used by holistic matchers.
"""
from __future__ import annotations

from collections import defaultdict


class _UnionFind:
    """Union-find over hashable items with per-root table multisets so the
    one-column-per-table constraint can be checked before a union."""

    def __init__(self, items: list[tuple[str, str]]):
        self.parent = {x: x for x in items}
        self.tables: dict[tuple[str, str], set[str]] = {
            x: {x[0]} for x in items
        }

    def find(self, x):
        root = x
        while self.parent[root] != root:
            root = self.parent[root]
        while self.parent[x] != root:  # path compression
            self.parent[x], x = root, self.parent[x]
        return root

    def can_union(self, a, b) -> bool:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return True
        return not (self.tables[ra] & self.tables[rb])

    def union(self, a, b) -> bool:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return True
        if self.tables[ra] & self.tables[rb]:
            return False
        if len(self.tables[ra]) < len(self.tables[rb]):
            ra, rb = rb, ra
        self.parent[rb] = ra
        self.tables[ra] |= self.tables.pop(rb)
        return True


def cluster_columns(
    columns: list[tuple[str, str]],
    edges: list[tuple[tuple[str, str], tuple[str, str], float]],
) -> dict[tuple[str, str], int]:
    """Cluster ``(table, column)`` nodes given scored candidate edges.

    Returns a dense cluster id per column. Edges are applied best-first;
    an edge that would put two same-table columns in one cluster is
    skipped (ALITE's integration-ID constraint).
    """
    uf = _UnionFind(list(columns))
    for a, b, _score in sorted(edges, key=lambda e: (-e[2], e[0], e[1])):
        if a[0] != b[0]:  # same-table pairs are never match candidates
            uf.union(a, b)
    roots: dict[tuple[str, str], int] = {}
    out: dict[tuple[str, str], int] = {}
    by_root: dict[tuple[str, str], list] = defaultdict(list)
    for c in columns:
        by_root[uf.find(c)].append(c)
    # Deterministic dense ids ordered by the smallest member of each cluster.
    for root in sorted(by_root, key=lambda r: min(by_root[r])):
        roots[root] = len(roots)
    for c in columns:
        out[c] = roots[uf.find(c)]
    return out
