"""Tests for ALITE's Align stage: profiling, similarity, constrained
clustering and end-to-end integration-ID quality against lake ground
truth."""
import pandas as pd
import pytest

from repro.align.clustering import cluster_columns
from repro.align.features import ColumnProfile, column_profiles
from repro.align.schema_matching import align, column_similarity


def profile(table, column, values, numeric=False, n=None):
    vals = frozenset(values)
    return ColumnProfile(
        table=table,
        column=column,
        n_values=n or len(values),
        n_distinct=len(vals),
        numeric_ratio=1.0 if numeric else 0.0,
        avg_len=4.0,
        values=vals,
    )


class TestColumnSimilarity:
    def test_identical_values(self):
        p = profile("t1", "x", ["a", "b", "c"])
        q = profile("t2", "y", ["a", "b", "c"])
        assert column_similarity(p, q) == 1.0

    def test_disjoint_values_no_headers(self):
        p = profile("t1", "col_0", ["a", "b"])
        q = profile("t2", "col_0", ["c", "d"])
        # Same garbled header must NOT count as evidence.
        assert column_similarity(p, q) == 0.0

    def test_disjoint_values_informative_headers(self):
        p = profile("t1", "country", ["germany", "spain"])
        q = profile("t2", "country", ["canada", "mexico"])
        assert column_similarity(p, q) >= 0.8

    def test_numeric_string_mismatch_blocked(self):
        p = profile("t1", "a", ["1", "2", "3"], numeric=True)
        q = profile("t2", "b", ["1", "x", "y"], numeric=False)
        assert column_similarity(p, q) == 0.0

    def test_containment_boost_for_fragments(self):
        big = profile("t1", "a", [f"v{i}" for i in range(100)])
        small = profile("t2", "b", [f"v{i}" for i in range(10)])
        # Jaccard is 0.1 but small-in-large containment is 1.0.
        assert column_similarity(big, small) >= 0.7

    def test_empty_profile(self):
        p = profile("t1", "a", [])
        q = profile("t2", "b", ["x"])
        assert column_similarity(p, q) == 0.0


class TestClustering:
    def test_transitive_merge(self):
        cols = [("t1", "a"), ("t2", "b"), ("t3", "c")]
        edges = [
            (("t1", "a"), ("t2", "b"), 0.9),
            (("t2", "b"), ("t3", "c"), 0.8),
        ]
        out = cluster_columns(cols, edges)
        assert out[("t1", "a")] == out[("t2", "b")] == out[("t3", "c")]

    def test_same_table_constraint(self):
        """Two columns of one table never share a cluster even when both
        match the same foreign column (ALITE's integration-ID rule)."""
        cols = [("t1", "a"), ("t1", "b"), ("t2", "c")]
        edges = [
            (("t1", "a"), ("t2", "c"), 0.9),
            (("t1", "b"), ("t2", "c"), 0.8),
        ]
        out = cluster_columns(cols, edges)
        assert out[("t1", "a")] != out[("t1", "b")]
        assert out[("t2", "c")] == out[("t1", "a")]  # best edge wins

    def test_no_edges_all_singletons(self):
        cols = [("t1", "a"), ("t2", "b")]
        out = cluster_columns(cols, [])
        assert out[("t1", "a")] != out[("t2", "b")]

    def test_deterministic_ids(self):
        cols = [("t1", "a"), ("t2", "b"), ("t3", "c")]
        edges = [(("t1", "a"), ("t2", "b"), 0.9)]
        assert cluster_columns(cols, edges) == cluster_columns(cols, edges)


class TestColumnProfiles:
    def test_profiles_cover_all_columns(self, spark):
        frames = {
            "x": spark.createDataFrame(pd.DataFrame({"a": ["1"], "b": ["2"]})),
            "y": spark.createDataFrame(pd.DataFrame({"c": ["3"]})),
        }
        ps = column_profiles(frames)
        assert {(p.table, p.column) for p in ps} == {
            ("x", "a"), ("x", "b"), ("y", "c")
        }

    def test_all_null_column_profiled_empty(self, spark):
        frames = {
            "x": spark.createDataFrame(
                pd.DataFrame({"a": ["1", "2"], "b": [None, None]})
            )
        }
        ps = {p.column: p for p in column_profiles(frames)}
        assert ps["b"].n_values == 0
        assert ps["b"].values == frozenset()

    def test_counts_and_numeric_ratio(self, spark):
        frames = {
            "x": spark.createDataFrame(
                pd.DataFrame({"a": ["1", "2", "2", "x"]})
            )
        }
        p = column_profiles(frames)[0]
        assert p.n_values == 4
        assert p.n_distinct == 3
        assert p.numeric_ratio == pytest.approx(0.75)


class TestAlignOnLake:
    """Integration-ID quality against lake ground truth (a small E4)."""

    @pytest.fixture(scope="class")
    def lake_alignment(self, small_lake, small_catalog):
        frames = {
            n: small_catalog.table(n) for n in small_catalog.table_names()
        }
        return align(frames)

    def test_every_column_assigned(self, small_lake, lake_alignment):
        for name, t in small_lake.truth.items():
            for header in t.columns:
                assert (name, header) in lake_alignment.assignments

    def test_same_table_columns_distinct(self, small_lake, lake_alignment):
        for name, t in small_lake.truth.items():
            iids = [
                lake_alignment.iid(name, h) for h in t.columns
            ]
            assert len(iids) == len(set(iids))

    def test_cluster_quality(self, small_lake, lake_alignment):
        """Pairwise P/R vs gold canonical attributes: the matcher should
        be strong on this lake (fragments share entity values)."""
        gold, pred = {}, {}
        for name, t in small_lake.truth.items():
            for header, attr in t.columns.items():
                gold[(name, header)] = attr
                pred[(name, header)] = lake_alignment.iid(name, header)
        cols = sorted(gold)
        tp = fp = fn = 0
        for i, a in enumerate(cols):
            for b in cols[i + 1:]:
                same_gold = gold[a] == gold[b]
                same_pred = pred[a] == pred[b]
                tp += same_gold and same_pred
                fp += (not same_gold) and same_pred
                fn += same_gold and not same_pred
        precision = tp / (tp + fp) if tp + fp else 1.0
        recall = tp / (tp + fn) if tp + fn else 1.0
        assert precision >= 0.9, (precision, recall)
        assert recall >= 0.7, (precision, recall)

    def test_apply_renames_and_casts(self, small_catalog, lake_alignment):
        name = small_catalog.table_names()[0]
        out = lake_alignment.apply({name: small_catalog.table(name)})[name]
        assert all(t == "string" for _, t in out.dtypes)
