"""End-to-end DIALITE pipeline tests: discover -> align & integrate ->
analyze over the test lake, plus the Sec. 3.2 extensibility paths
(user-defined discovery via Fig. 4, user-defined integration via Fig. 6,
GPT-3-style query generation via Fig. 5)."""
import pandas as pd
import pytest

from repro.core.pipeline import DIALITE
from repro.core.query_gen import randomly_generate_query_table
from repro.core.registry import Registry
from repro.discovery.lsh_ensemble import LSHEnsemble
from repro.discovery.overlap import inner_join_similarity
from repro.discovery.santos import Santos
from repro.integrate.outer_union import TIDS, outer_union
from repro.lake.generator import DOMAIN_ATTRS


@pytest.fixture(scope="module")
def dialite(spark, small_lake, small_catalog):
    d = DIALITE(spark, small_catalog)
    d.register_discovery(Santos(small_lake.kb))
    d.register_discovery(LSHEnsemble(threshold=0.5))
    return d


@pytest.fixture(scope="module")
def query(small_lake, small_catalog):
    """A lake city table doubling as the query (its key column is the
    intent column, like Example 1)."""
    name = [
        n for n in small_catalog.table_names()
        if small_lake.truth[n].domain == "city_stats"
    ][0]
    t = small_lake.truth[name]
    key_header = [
        h for h, a in t.columns.items() if a == DOMAIN_ATTRS[t.domain][0]
    ][0]
    return name, key_header, small_catalog.table(name)


class TestRegistry:
    def test_register_and_get(self):
        r = Registry("thing")
        r.register("a", 1)
        assert r.get("a") == 1
        assert "a" in r and len(r) == 1

    def test_duplicate_rejected(self):
        r = Registry("thing")
        r.register("a", 1)
        with pytest.raises(ValueError, match="already registered"):
            r.register("a", 2)
        r.register("a", 2, replace=True)
        assert r.get("a") == 2

    def test_unknown_name(self):
        r = Registry("thing")
        with pytest.raises(KeyError, match="unknown thing"):
            r.get("nope")

    def test_empty_name_rejected(self):
        with pytest.raises(ValueError):
            Registry("thing").register("", 1)


class TestDiscoverStage:
    def test_integration_set_is_union(self, dialite, query):
        _, key_header, qdf = query
        outcome = dialite.discover(qdf, key_header, k=4)
        assert set(outcome.per_algorithm) == {"santos", "lsh_ensemble"}
        all_hits = {
            h.table
            for hits in outcome.per_algorithm.values()
            for h in hits
        }
        assert set(outcome.integration_set) == all_hits
        assert len(outcome.integration_set) >= 1

    def test_algorithm_subset(self, dialite, query):
        _, key_header, qdf = query
        outcome = dialite.discover(qdf, key_header, k=3, algorithms=["santos"])
        assert list(outcome.per_algorithm) == ["santos"]


class TestIntegrateStage:
    def test_alite_end_to_end(self, dialite, query):
        name, key_header, qdf = query
        outcome, result = dialite.run(qdf, key_header, k=3)
        assert result.method == "alite"
        assert TIDS in result.table.columns
        assert result.table.count() > 0
        # The query table is part of the integration set.
        assert "_query" in result.sources

    def test_outer_join_method(self, dialite, query):
        _, key_header, qdf = query
        outcome = dialite.discover(qdf, key_header, k=2)
        result = dialite.integrate(
            outcome.integration_set[:2], query=qdf, method="outer_join"
        )
        assert result.method == "outer_join"
        assert result.table.count() > 0

    def test_user_supplied_integration_set(self, spark, dialite):
        """The traditional scenario: the user uploads the tables."""
        frames = {
            "u1": spark.createDataFrame(
                pd.DataFrame({"k": ["a", "b"], "x": ["1", "2"]})
            ),
            "u2": spark.createDataFrame(
                pd.DataFrame({"k": ["b", "c"], "y": ["7", "8"]})
            ),
        }
        result = dialite.integrate(frames, method="alite")
        assert result.table.count() == 3  # a, b (joined), c

    def test_unknown_method(self, dialite, query):
        _, _, qdf = query
        with pytest.raises(KeyError, match="integration operator"):
            dialite.integrate({"q": qdf}, method="nope")


class TestAnalyzeStage:
    def test_completeness_analysis(self, dialite, query):
        _, key_header, qdf = query
        result = dialite.integrate({"q": qdf}, method="alite")
        c = dialite.analyze(
            "completeness", result.table, result.value_columns
        )
        assert 0 < c <= 1.0

    def test_er_analysis_registered(self, dialite):
        assert "entity_resolution" in dialite.analyzers


class TestExtensibility:
    def test_fig4_user_discovery(self, dialite, query):
        """Sec. 3.2 / Fig. 4: plug in an inner-join similarity function."""
        name, key_header, qdf = query
        dialite.register_pairwise_discovery(
            "user_inner_join", inner_join_similarity
        )
        try:
            outcome = dialite.discover(
                qdf, key_header, k=3, algorithms=["user_inner_join"]
            )
            assert outcome.integration_set
            # The query table itself joins with similarity 1.
            assert outcome.per_algorithm["user_inner_join"][0].table == name
        finally:
            dialite.discovery.unregister("user_inner_join")

    def test_fig6_user_integrator(self, spark, dialite):
        """Sec. 3.2 / Fig. 6: plug in a custom integration operator (the
        paper's outer-join snippet shape: fold over the set)."""

        def user_outer_union(dfs):
            return outer_union(dfs)

        dialite.integrators.register("user_union", user_outer_union)
        try:
            frames = {
                "u1": spark.createDataFrame(pd.DataFrame({"k": ["a"]})),
                "u2": spark.createDataFrame(pd.DataFrame({"k": ["b"]})),
            }
            result = dialite.integrate(frames, method="user_union")
            assert result.table.count() == 2
        finally:
            dialite.integrators.unregister("user_union")


class TestQueryGeneration:
    def test_fig5_cases_table(self, spark):
        q = randomly_generate_query_table(
            spark, "Generate a table about COVID-19 cases", rows=5
        )
        assert q.columns == ["Country", "Cases", "Deaths", "Recovered", "Active"]
        assert q.count() == 5

    def test_deterministic_in_prompt(self, spark):
        a = randomly_generate_query_table(spark, "covid cases", rows=4)
        b = randomly_generate_query_table(spark, "covid cases", rows=4)
        assert a.collect() == b.collect()

    def test_prompt_routes_templates(self, spark):
        v = randomly_generate_query_table(spark, "vaccine approvals", rows=3)
        assert "Vaccine" in v.columns and "Approver" in v.columns
        c = randomly_generate_query_table(spark, "city vaccination rates", rows=3)
        assert "City" in c.columns

    def test_generated_query_drives_pipeline(self, spark, dialite, small_lake):
        """Fig. 5 -> Example 1: a generated query table can seed
        discovery. The generator is handed the lake's vocabulary so the
        query is in-domain (the paper's footnote 6 warns that off-topic
        query tables may yield no results)."""
        q = randomly_generate_query_table(
            spark, "city vaccination rates", rows=8, vocab=small_lake.vocab
        )
        outcome = dialite.discover(q, "City", k=3)
        assert outcome.integration_set
