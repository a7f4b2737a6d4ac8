"""Unit tests for the integration-quality metrics (tables E1/E5)."""
import pandas as pd
import pytest

from repro.analyze.metrics import (
    CoverageReport,
    entity_metrics,
    er_pair_metrics,
    fact_coverage,
    gold_facts_for,
    tid_entities_for,
)
from repro.lake.generator import generate_lake, spec_for_sf


def frame(rows):
    return pd.DataFrame(rows)


class TestFactCoverage:
    GOLD = {
        "berlin": {"country": "Germany", "vax": "63"},
        "boston": {"country": "USA", "vax": "62"},
    }

    def test_perfect_single_tuples(self):
        pdf = frame(
            [
                {"city": "berlin", "country": "Germany", "vax": "63"},
                {"city": "boston", "country": "USA", "vax": "62"},
            ]
        )
        rep = fact_coverage(pdf, "city", self.GOLD)
        assert rep.mean_coverage == 1.0
        assert rep.complete_entities == 1.0
        assert rep.n_entities == 2

    def test_split_facts_halve_coverage(self):
        pdf = frame(
            [
                {"city": "berlin", "country": "Germany", "vax": None},
                {"city": "berlin", "country": None, "vax": "63"},
                {"city": "boston", "country": "USA", "vax": "62"},
            ]
        )
        rep = fact_coverage(pdf, "city", self.GOLD)
        assert rep.mean_coverage == pytest.approx(0.75)  # (0.5 + 1) / 2
        assert rep.complete_entities == pytest.approx(0.5)

    def test_wrong_value_not_counted(self):
        pdf = frame([{"city": "berlin", "country": "France", "vax": "63"}])
        rep = fact_coverage(pdf, "city", {"berlin": self.GOLD["berlin"]})
        assert rep.mean_coverage == pytest.approx(0.5)

    def test_unknown_entities_ignored(self):
        pdf = frame([{"city": "paris", "country": "France", "vax": "1"}])
        rep = fact_coverage(pdf, "city", self.GOLD)
        assert rep.mean_coverage == 0.0

    def test_empty_output(self):
        rep = fact_coverage(
            frame([]).reindex(columns=["city", "country"]), "city", self.GOLD
        )
        assert rep == CoverageReport(0.0, 0.0, 2, 0)


class TestEntityMetrics:
    TID_ENTITY = {"a1": "e1", "a2": "e1", "b1": "e2"}

    def test_pure_rows(self):
        pdf = frame(
            [{"x": "1", "_tids": ["a1", "a2"]}, {"x": "2", "_tids": ["b1"]}]
        )
        rep = entity_metrics(pdf, self.TID_ENTITY)
        assert rep.purity == 1.0
        assert rep.fragmentation == 1.0

    def test_mixed_row_impure(self):
        pdf = frame([{"x": "1", "_tids": ["a1", "b1"]}])
        rep = entity_metrics(pdf, self.TID_ENTITY)
        assert rep.purity == 0.0

    def test_fragmentation_counts_rows_per_entity(self):
        pdf = frame(
            [{"x": "1", "_tids": ["a1"]}, {"x": "2", "_tids": ["a2"]},
             {"x": "3", "_tids": ["b1"]}]
        )
        rep = entity_metrics(pdf, self.TID_ENTITY)
        assert rep.fragmentation == pytest.approx((2 + 1) / 2)

    def test_no_tids_column(self):
        rep = entity_metrics(frame([{"x": "1"}]), self.TID_ENTITY)
        assert rep.purity == 1.0


class TestErPairMetrics:
    TID_ENTITY = {"a1": "e1", "a2": "e1", "a3": "e1", "b1": "e2"}

    def test_perfect(self):
        pdf = frame([{"_tids": ["a1", "a2", "a3"]}, {"_tids": ["b1"]}])
        rep = er_pair_metrics(pdf, self.TID_ENTITY)
        assert rep.precision == 1.0 and rep.recall == 1.0 and rep.f1 == 1.0

    def test_under_merged_recall(self):
        pdf = frame([{"_tids": ["a1", "a2"]}, {"_tids": ["a3"]},
                     {"_tids": ["b1"]}])
        rep = er_pair_metrics(pdf, self.TID_ENTITY)
        assert rep.precision == 1.0
        assert rep.recall == pytest.approx(1 / 3)

    def test_over_merged_precision(self):
        pdf = frame([{"_tids": ["a1", "b1"]}])
        rep = er_pair_metrics(pdf, self.TID_ENTITY)
        assert rep.precision == 0.0

    def test_unknown_tids_ignored(self):
        pdf = frame([{"_tids": ["zz", "a1", "a2"]}])
        rep = er_pair_metrics(pdf, self.TID_ENTITY)
        assert rep.precision == 1.0


class TestGoldHelpers:
    @pytest.fixture(scope="class")
    def lake(self):
        return generate_lake(spec_for_sf(0.01, seed=5))

    def test_gold_facts_nonempty(self, lake):
        names = lake.table_names()[:2]
        gold = gold_facts_for(lake, names)
        assert gold
        some_entity = next(iter(gold))
        assert gold[some_entity]

    def test_tid_entities_cover_rows(self, lake):
        names = lake.table_names()[:2]
        te = tid_entities_for(lake, names)
        assert len(te) == sum(lake.truth[n].n_rows for n in names)
        assert all(":" in t for t in te)
