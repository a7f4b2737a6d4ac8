"""Distributed connected components via hash-min label propagation.

FD's complementation closure is local to connected components of the
tuple <-> (column, value) bipartite graph (two tuples can only ever merge
if they agree on some non-null value, i.e. share a value node). This
module computes those components with the standard hash-min fixpoint:
every node repeatedly adopts the minimum label in its neighbourhood.
Rounds are O(component diameter); entity-shaped integration data has
small diameters. ``localCheckpoint`` truncates lineage each round so the
plan does not grow unboundedly.
"""
from __future__ import annotations

import pyspark.sql.functions as F
import pyspark.sql.types as T
from pyspark.sql import DataFrame

MAX_ROUNDS = 50

# Below this many edges the graph fits trivially on the driver and a
# union-find beats the per-round fixed cost of Spark jobs by orders of
# magnitude. The distributed fixpoint kicks in past it.
DRIVER_THRESHOLD = 200_000


def _driver_components(edge_rows: list) -> list[tuple[str, str]]:
    """Union-find with path compression; component = min node label."""
    parent: dict[str, str] = {}

    def find(x: str) -> str:
        root = x
        while parent[root] != root:
            root = parent[root]
        while parent[x] != root:
            parent[x], x = root, parent[x]
        return root

    for r in edge_rows:
        a, b = r["src"], r["dst"]
        parent.setdefault(a, a)
        parent.setdefault(b, b)
        ra, rb = find(a), find(b)
        if ra != rb:
            # Union by label order so the root is the smallest label.
            if rb < ra:
                ra, rb = rb, ra
            parent[rb] = ra
    # A root chosen by rank could exceed members; normalize to min label.
    members: dict[str, list[str]] = {}
    for n in parent:
        members.setdefault(find(n), []).append(n)
    out = []
    for nodes in members.values():
        label = min(nodes)
        out.extend((n, label) for n in nodes)
    return out


def connected_components(
    edges: DataFrame,
    *,
    max_rounds: int = MAX_ROUNDS,
    driver_threshold: int = DRIVER_THRESHOLD,
) -> DataFrame:
    """Components of an undirected graph given as ``(src, dst)`` string
    pairs. Returns ``(node, component)`` where ``component`` is the
    lexicographically smallest node label in the component.

    Adaptive execution: a graph under ``driver_threshold`` edges is
    solved by driver union-find (each Spark fixpoint round costs more in
    scheduling than the whole small graph); larger graphs run the
    distributed hash-min fixpoint. Raises ``RuntimeError`` if that
    fixpoint does not converge within ``max_rounds`` (a pathological
    diameter) rather than returning a silently wrong partition.
    """
    small = edges.limit(driver_threshold + 1).collect()
    if len(small) <= driver_threshold:
        rows = _driver_components(small)
        schema = T.StructType(
            [
                T.StructField("node", T.StringType()),
                T.StructField("component", T.StringType()),
            ]
        )
        return edges.sparkSession.createDataFrame(rows, schema)
    edges = (
        edges.selectExpr("src", "dst")
        .union(edges.selectExpr("dst as src", "src as dst"))
        .distinct()
        .localCheckpoint(eager=True)
    )
    labels = (
        edges.select(F.col("src").alias("node"))
        .distinct()
        .withColumn("component", F.col("node"))
        .localCheckpoint(eager=True)
    )
    for _ in range(max_rounds):
        # Each node's new label: min over its own and its neighbours'.
        neighbour = (
            edges.join(labels, edges.dst == labels.node)
            .select(F.col("src").alias("node"), "component")
        )
        new_labels = (
            labels.unionByName(neighbour)
            .groupBy("node")
            .agg(F.min("component").alias("component"))
            .localCheckpoint(eager=True)
        )
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "node")
            .where(F.col("n.component") != F.col("o.component"))
            .limit(1)
            .count()
        )
        labels = new_labels
        if changed == 0:
            return labels
    raise RuntimeError(
        f"connected_components did not converge in {max_rounds} rounds"
    )
