"""Tests for distributed connected components (FD's partitioning step)."""
import pytest

from repro.integrate.components import connected_components


def cc(spark, pairs, **kw):
    edges = spark.createDataFrame(pairs, "src string, dst string")
    rows = connected_components(edges, **kw).collect()
    comp = {}
    for r in rows:
        comp.setdefault(r["component"], set()).add(r["node"])
    return sorted(frozenset(s) for s in comp.values())


class TestConnectedComponents:
    def test_single_edge(self, spark):
        assert cc(spark, [("a", "b")]) == [frozenset({"a", "b"})]

    def test_two_components(self, spark):
        got = cc(spark, [("a", "b"), ("c", "d")])
        assert sorted(got) == sorted(
            [frozenset({"a", "b"}), frozenset({"c", "d"})]
        )

    def test_chain(self, spark):
        got = cc(spark, [("a", "b"), ("b", "c"), ("c", "d"), ("d", "e")])
        assert got == [frozenset("abcde")]

    def test_self_loop(self, spark):
        assert cc(spark, [("x", "x")]) == [frozenset({"x"})]

    def test_star(self, spark):
        got = cc(spark, [("hub", f"s{i}") for i in range(6)])
        assert got == [frozenset({"hub"} | {f"s{i}" for i in range(6)})]

    def test_component_label_is_min_node(self, spark):
        edges = spark.createDataFrame(
            [("b", "c"), ("a", "b")], "src string, dst string"
        )
        rows = connected_components(edges).collect()
        assert all(r["component"] == "a" for r in rows)

    def test_nonconvergence_raises(self, spark):
        edges = spark.createDataFrame(
            [(f"n{i:03d}", f"n{i + 1:03d}") for i in range(8)],
            "src string, dst string",
        )
        with pytest.raises(RuntimeError, match="converge"):
            connected_components(edges, max_rounds=1, driver_threshold=0)

    def test_distributed_path_matches_driver_path(self, spark):
        pairs = [("a", "b"), ("b", "c"), ("d", "e"), ("f", "f")]
        edges = spark.createDataFrame(pairs, "src string, dst string")
        fast = sorted(
            tuple(r) for r in connected_components(edges).collect()
        )
        dist = sorted(
            tuple(r)
            for r in connected_components(edges, driver_threshold=0).collect()
        )
        assert fast == dist
