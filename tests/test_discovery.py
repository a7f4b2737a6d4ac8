"""Tests for the discovery substrates: LSH Ensemble, SANTOS-lite, exact
overlap and the Fig. 4 pairwise adapter — scored against lake ground
truth where applicable."""
import pandas as pd
import pytest

from repro.discovery.base import PairwiseDiscovery
from repro.discovery.lsh_ensemble import LSHEnsemble
from repro.discovery.overlap import ExactOverlap, inner_join_similarity
from repro.discovery.santos import Santos
from repro.lake.generator import DOMAIN_ATTRS


def key_header(lake, name):
    t = lake.truth[name]
    key_attr = DOMAIN_ATTRS[t.domain][0]
    return [h for h, a in t.columns.items() if a == key_attr][0], key_attr


@pytest.fixture(scope="module")
def lshe(small_catalog):
    algo = LSHEnsemble(threshold=0.5)
    algo.build_index(small_catalog)
    return algo


@pytest.fixture(scope="module")
def santos(small_lake, small_catalog):
    algo = Santos(small_lake.kb)
    algo.build_index(small_catalog)
    return algo


@pytest.fixture(scope="module")
def exact(small_catalog):
    algo = ExactOverlap()
    algo.build_index(small_catalog)
    return algo


class TestLSHEnsemble:
    def test_self_retrieval(self, small_lake, small_catalog, lshe):
        """A lake table queried by its own key column must come back with
        containment ~1."""
        name = small_catalog.table_names()[0]
        header, _ = key_header(small_lake, name)
        hits = lshe.search(small_catalog.table(name), header, k=10)
        by_name = {h.table: h.score for h in hits}
        assert name in by_name
        assert by_name[name] >= 0.9

    def test_matches_joinability_ground_truth(
        self, small_lake, small_catalog, lshe
    ):
        """Recall vs gold joinable tables at containment 0.5. Queried
        with a city-domain table: its key domain has hundreds of values,
        where 128-perm MinHash containment estimates are reliable (a
        vaccine table's ~4-value domain is estimation noise by design —
        LSH Ensemble targets large domains)."""
        name = [
            n for n in small_catalog.table_names()
            if small_lake.truth[n].domain == "city_stats"
        ][0]
        header, key_attr = key_header(small_lake, name)
        gold = {
            b
            for b in small_lake.table_names()
            if small_lake.joinable(name, key_attr, b, threshold=0.5)
        }
        hits = {
            h.table
            for h in lshe.search(
                small_catalog.table(name), header, k=len(small_lake.frames)
            )
        }
        assert gold, "ground truth should not be empty (self at least)"
        recall = len(gold & hits) / len(gold)
        assert recall >= 0.7, (gold, hits)

    def test_empty_query_column(self, spark, lshe):
        q = spark.createDataFrame(pd.DataFrame({"c": [None, None]}, dtype=object))
        assert lshe.search(q, "c", k=5) == []

    def test_unbuilt_raises(self, spark):
        algo = LSHEnsemble()
        q = spark.createDataFrame(pd.DataFrame({"c": ["x"]}))
        with pytest.raises(RuntimeError, match="build_index"):
            algo.search(q, "c", k=1)

    def test_k_limits_results(self, small_lake, small_catalog, lshe):
        name = small_catalog.table_names()[0]
        header, _ = key_header(small_lake, name)
        assert len(lshe.search(small_catalog.table(name), header, k=1)) == 1


class TestSantos:
    def test_self_retrieval_top(self, small_lake, small_catalog, santos):
        name = small_catalog.table_names()[0]
        header, _ = key_header(small_lake, name)
        hits = santos.search(small_catalog.table(name), header, k=3)
        assert hits
        assert any(h.table == name for h in hits)

    def test_unionable_domain_separation(
        self, small_lake, small_catalog, santos
    ):
        """Querying a city table must rank city-domain tables above
        vaccine-domain tables (SANTOS's unionability semantics)."""
        names = small_catalog.table_names()
        cities = [n for n in names if small_lake.truth[n].domain == "city_stats"]
        name = cities[0]
        header, _ = key_header(small_lake, name)
        hits = santos.search(
            small_catalog.table(name), header, k=len(names)
        )
        ranked = [h.table for h in hits]
        gold_unionable = {
            b for b in names if small_lake.unionable(name, b)
        }
        top = set(ranked[: len(gold_unionable)])
        prec_at_gold = len(top & gold_unionable) / len(gold_unionable)
        assert prec_at_gold >= 0.7, (ranked, sorted(gold_unionable))

    def test_annotate_query(self, spark, santos):
        q = spark.createDataFrame(
            pd.DataFrame(
                {"place": ["Berlin", "Boston"], "land": ["Germany", "USA"]}
            )
        )
        sem = santos.annotate_query(q)
        assert sem.column_types == {"place": "city", "land": "country"}
        assert ("locatedIn", "city", "country") in sem.relationships

    def test_unbuilt_raises(self, spark, small_lake):
        algo = Santos(small_lake.kb)
        q = spark.createDataFrame(pd.DataFrame({"c": ["x"]}))
        with pytest.raises(RuntimeError, match="build_index"):
            algo.search(q, "c", k=1)


class TestExactOverlap:
    def test_self_containment_one(self, small_lake, small_catalog, exact):
        name = small_catalog.table_names()[0]
        header, _ = key_header(small_lake, name)
        hits = exact.search(small_catalog.table(name), header, k=5)
        assert hits[0].table == name or any(
            h.table == name and h.score >= 0.999 for h in hits
        )

    def test_agrees_with_lsh_on_strong_hits(
        self, small_lake, small_catalog, exact, lshe
    ):
        """LSH Ensemble's verified results should be a subset of exact
        containment >= threshold - estimation slack."""
        name = small_catalog.table_names()[1]
        header, _ = key_header(small_lake, name)
        q = small_catalog.table(name)
        exact_scores = {
            h.table: h.score
            for h in exact.search(q, header, k=len(small_lake.frames))
        }
        for h in lshe.search(q, header, k=len(small_lake.frames)):
            assert exact_scores.get(h.table, 0.0) >= 0.25, (h, exact_scores)

    def test_column_containments_shape(self, small_lake, small_catalog, exact):
        name = small_catalog.table_names()[0]
        header, _ = key_header(small_lake, name)
        out = exact.column_containments(small_catalog.table(name), header)
        assert set(out.columns) == {"table", "column", "containment"}
        assert out.count() > 0


class TestPairwiseDiscovery:
    def test_fig4_snippet(self):
        df1 = pd.DataFrame({"k": ["a", "b", "c"]})
        df2 = pd.DataFrame({"k": ["b", "c", "d", "e"]})
        assert inner_join_similarity(df1, df2) == pytest.approx(0.5)

    def test_no_shared_columns(self):
        assert inner_join_similarity(
            pd.DataFrame({"a": [1]}), pd.DataFrame({"b": [1]})
        ) == 0.0

    def test_adapter_search(self, small_lake, small_catalog):
        algo = PairwiseDiscovery("fig4", inner_join_similarity)
        algo.build_index(small_catalog)
        name = small_catalog.table_names()[0]
        hits = algo.search(small_catalog.table(name), "ignored", k=3)
        assert hits
        assert hits[0].score <= 1.0

    def test_adapter_unbuilt_raises(self, spark):
        algo = PairwiseDiscovery("fig4", inner_join_similarity)
        q = spark.createDataFrame(pd.DataFrame({"c": ["x"]}))
        with pytest.raises(RuntimeError, match="build_index"):
            algo.search(q, "c", k=1)
