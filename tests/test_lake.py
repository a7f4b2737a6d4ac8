"""Tests for the synthetic open-data lake substrate."""
import numpy as np
import pandas as pd
import pytest

from repro.lake.catalog import Catalog, load_ground_truth
from repro.lake.generator import (
    DOMAIN_ATTRS,
    LakeSpec,
    generate_lake,
    spec_for_sf,
)
from repro.lake.kb import build_kb
from repro.lake.vocab import build_vocab


@pytest.fixture(scope="module")
def lake():
    return generate_lake(spec_for_sf(0.01, seed=3))


class TestVocab:
    def test_sizes(self):
        v = build_vocab(n_cities=50, n_countries=12, n_vaccines=9, seed=0)
        assert len(v.cities) == 50
        assert len(v.countries) == 12
        assert len(v.vaccines) == 9

    def test_seed_entities_present(self):
        v = build_vocab(seed=0)
        assert "Berlin" in v.cities
        assert "USA" in v.countries
        assert v.city_country["Boston"] == "USA"
        assert v.vaccine_approver["Pfizer"] == "FDA"

    def test_deterministic(self):
        a = build_vocab(n_cities=40, seed=5)
        b = build_vocab(n_cities=40, seed=5)
        assert a.cities == b.cities
        assert a.city_country == b.city_country

    def test_every_city_has_country(self):
        v = build_vocab(n_cities=100, seed=1)
        assert set(v.city_country) == set(v.cities)
        assert set(v.city_country.values()) <= set(v.countries)


class TestKb:
    def test_types(self):
        v = build_vocab(seed=0)
        kb = build_kb(v)
        assert kb.type_of("Berlin") == "city"
        assert kb.type_of("  GERMANY ") == "country"
        assert kb.type_of("Pfizer") == "vaccine"
        assert kb.type_of("FDA") == "agency"
        assert kb.type_of("not an entity") is None

    def test_relationships_symmetric(self):
        kb = build_kb(build_vocab(seed=0))
        assert kb.relationship("city", "country") == "locatedIn"
        assert kb.relationship("country", "city") == "locatedIn"
        assert kb.relationship("city", "agency") is None


class TestGenerator:
    def test_table_count(self, lake):
        assert len(lake.frames) == lake.spec.n_tables

    def test_deterministic(self):
        a = generate_lake(spec_for_sf(0.01, seed=3))
        b = generate_lake(spec_for_sf(0.01, seed=3))
        for name in a.frames:
            pd.testing.assert_frame_equal(a.frames[name], b.frames[name])

    def test_truth_columns_cover_frames(self, lake):
        for name, pdf in lake.frames.items():
            t = lake.truth[name]
            assert set(t.columns) == set(pdf.columns)
            assert set(t.columns.values()) <= set(DOMAIN_ATTRS[t.domain])

    def test_key_column_never_null(self, lake):
        for name, pdf in lake.frames.items():
            t = lake.truth[name]
            key_attr = DOMAIN_ATTRS[t.domain][0]
            key_header = [h for h, a in t.columns.items() if a == key_attr]
            assert len(key_header) == 1
            assert pdf[key_header[0]].notna().all()

    def test_numeric_dtypes_uniform(self, lake):
        """All numeric columns are float64 so string forms agree across
        fragments (the '12' vs '12.0' trap)."""
        for pdf in lake.frames.values():
            for c in pdf.columns:
                if pd.api.types.is_numeric_dtype(pdf[c]):
                    assert pdf[c].dtype == np.float64

    def test_null_injection_present(self, lake):
        assert any(pdf.isna().any().any() for pdf in lake.frames.values())

    def test_variant_noise(self):
        spec = LakeSpec(
            n_tables=6, n_cities=40, n_countries=10, n_vaccines=8,
            variant_noise=0.5, seed=9,
        )
        lake = generate_lake(spec)
        surface = set()
        for pdf in lake.frames.values():
            for c in pdf.columns:
                if pdf[c].dtype == object:
                    surface |= set(pdf[c].dropna())
        # Some surface forms are not canonical entity names.
        canonical = (
            set(lake.vocab.cities) | set(lake.vocab.countries)
            | set(lake.vocab.vaccines) | set(lake.vocab.agencies)
        )
        assert surface - canonical


class TestGroundTruthRelations:
    def test_unionable_same_domain(self, lake):
        names = lake.table_names()
        cities = [n for n in names if lake.truth[n].domain == "city_stats"]
        vaccines = [n for n in names if lake.truth[n].domain == "vaccine_info"]
        if cities and vaccines:
            assert not lake.unionable(cities[0], vaccines[0])

    def test_unionable_reflexive_shape(self, lake):
        names = lake.table_names()
        for n in names[:3]:
            assert lake.unionable(n, n)

    def test_joinable_self(self, lake):
        name = lake.table_names()[0]
        key_attr = DOMAIN_ATTRS[lake.truth[name].domain][0]
        assert lake.joinable(name, key_attr, name, threshold=0.99)

    def test_joinable_missing_attr(self, lake):
        name = lake.table_names()[0]
        assert not lake.joinable(name, "no_such_attr", name)


class TestPersistence:
    def test_write_and_catalog_roundtrip(self, lake, spark, tmp_path):
        out = str(tmp_path / "lake")
        lake.write(out)
        cat = Catalog.from_dir(spark, out)
        assert cat.table_names() == lake.table_names()
        name = cat.table_names()[0]
        got = cat.table(name).toPandas()
        assert len(got) == lake.truth[name].n_rows
        assert set(got.columns) == set(lake.frames[name].columns)

    def test_ground_truth_sidecar(self, lake, tmp_path):
        out = str(tmp_path / "lake2")
        lake.write(out)
        gt = load_ground_truth(out)
        assert set(gt) == set(lake.truth)
        name = next(iter(gt))
        assert gt[name].domain == lake.truth[name].domain
        assert gt[name].columns == lake.truth[name].columns

    def test_catalog_from_lake(self, lake, spark):
        cat = Catalog.from_lake(spark, lake)
        assert len(cat) == len(lake.frames)
        assert cat.table_names()[0] in cat


class TestSpecForSf:
    def test_scaling(self):
        small, big = spec_for_sf(0.01), spec_for_sf(0.1)
        assert big.n_tables > small.n_tables
        assert big.n_cities > small.n_cities

    def test_minimums(self):
        tiny = spec_for_sf(0.0001)
        assert tiny.n_tables >= 8
        assert tiny.n_cities >= 30
