"""Additional pure-Python unit coverage: paper-table consistency, iid
naming, banding edge cases, generator variants, registry iteration."""
import numpy as np
import pytest

from repro.align.schema_matching import _iid_names
from repro.core import paper_tables as pt
from repro.core.registry import Registry
from repro.discovery.lsh_ensemble import choose_banding
from repro.discovery.minhash import signature
from repro.lake.generator import SPECIAL_VARIANTS, _variant
from repro.util import normalize


class TestPaperTablesConsistency:
    def test_tid_table_covers_all_tids(self):
        expected = {f"t{i}" for i in range(1, 17)}
        assert set(pt.TID_TABLE) == expected

    def test_fig3_expected_shape(self):
        f = pt.fig3_expected()
        assert len(f) == 7
        assert list(f.columns)[-1] == "tids"
        # t13 appears in two Fig. 8b tuples; Fig. 3 tids are disjoint.
        all_tids = [t for ts in f["tids"] for t in ts.split(",")]
        assert len(all_tids) == len(set(all_tids))

    def test_fig8b_t13_in_two_tuples(self):
        f = pt.fig8b_expected()
        hits = [ts for ts in f["tids"] if "t13" in ts.split(",")]
        assert len(hits) == 2

    def test_fig8a_has_five_rows_fig8b_three(self):
        assert len(pt.fig8a_expected()) == 5
        assert len(pt.fig8b_expected()) == 3

    def test_table_columns_match_figures(self):
        assert pt.TABLE_COLUMNS["T3"] == {"City", "Total_Cases", "Death_Rate"}
        assert pt.TABLE_COLUMNS["T4"] == {"Vaccine", "Approver"}


class TestIidNames:
    def test_most_common_header_wins(self):
        clusters = {
            0: [("t1", "city"), ("t2", "city"), ("t3", "place")],
            1: [("t1", "country")],
        }
        names = _iid_names(clusters)
        assert names[0] == "city"
        assert names[1] == "country"

    def test_duplicate_names_suffixed(self):
        clusters = {0: [("t1", "x")], 1: [("t2", "x")]}
        names = _iid_names(clusters)
        assert names[0] == "x"
        assert names[1] == "x_1"

    def test_tie_broken_lexicographically(self):
        clusters = {0: [("t1", "b"), ("t2", "a")]}
        assert _iid_names(clusters)[0] == "a"


class TestBandingEdges:
    def test_tiny_num_perm(self):
        b, r = choose_banding(4, 0.5)
        assert b * r <= 4
        assert b >= 1 and r >= 1

    def test_threshold_extremes(self):
        b_lo, r_lo = choose_banding(128, 0.01)
        b_hi, r_hi = choose_banding(128, 0.99)
        assert r_lo >= 1
        assert r_hi >= r_lo

    def test_signature_num_perm_respected(self):
        assert signature(["a"], num_perm=32).shape == (32,)


class TestVariants:
    def g(self):
        return np.random.default_rng(0)

    def test_special_pairs(self):
        assert _variant("USA", self.g()) in SPECIAL_VARIANTS["USA"]
        assert _variant("JnJ", self.g()) == "J&J"

    def test_short_names_unchanged(self):
        assert _variant("Lima", self.g()) == "Lima"

    def test_variant_is_recoverable(self):
        """Every generated variant stays edit-close to the original
        under normalization (ER's job is possible by construction)."""
        from repro.analyze.er import value_similarity

        g = np.random.default_rng(3)
        for name in ["Kaloriburg", "Venota City", "Grazenfal"]:
            for _ in range(10):
                v = _variant(name, g)
                if normalize(v) == normalize(name):
                    continue
                assert value_similarity(name, v) >= 0.65, (name, v)


class TestRegistryIteration:
    def test_iter_and_names_order(self):
        r = Registry("x")
        r.register("b", 2)
        r.register("a", 1)
        assert r.names() == ["b", "a"]  # insertion order
        assert list(r) == [("b", 2), ("a", 1)]

    def test_unregister_missing_is_noop(self):
        r = Registry("x")
        r.unregister("nope")
        assert len(r) == 0


class TestExpectedFramesRoundTrip:
    def test_fig3_expected_nulls_are_none(self):
        f = pt.fig3_expected()
        assert f.isna().sum().sum() == 9  # 2+2+3+2 null cells in Fig. 3

    def test_fig8a_null_count(self):
        f = pt.fig8a_expected()
        assert f.isna().sum().sum() == 6  # f9:2, f10:2, f11:1, f12:1


class TestSpecialVariantNormalization:
    @pytest.mark.parametrize("a,b", [("USA", "United States"), ("JnJ", "J&J")])
    def test_pairs_not_trivially_equal(self, a, b):
        """The paper's pairs need real ER — normalization alone must not
        collapse them."""
        assert normalize(a) != normalize(b)
