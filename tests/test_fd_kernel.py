"""Unit tests for the FD complementation kernel (pure Python, no Spark).

The kernel is the semantic heart of ALITE's FD: complementation closure
plus subsumption removal plus subsumption-based provenance. These tests
pin its behaviour on the paper's examples and on adversarial corners.
"""
import pytest

from repro.integrate.fd import _component_closure, _merge, _subsumes


def run(rows, max_tuples=10_000):
    out = _component_closure(
        [(t, set(ts)) for t, ts in rows], max_tuples
    )
    return {t: tuple(ts) for t, ts in out}


class TestMerge:
    def test_basic_merge(self):
        assert _merge(("a", None), ("a", "b")) == ("a", "b")

    def test_no_shared_nonnull(self):
        assert _merge(("a", None), (None, "b")) is None

    def test_conflict(self):
        assert _merge(("a", "x"), ("a", "y")) is None

    def test_identical(self):
        assert _merge(("a", "b"), ("a", "b")) == ("a", "b")

    def test_fill_both_directions(self):
        assert _merge((None, "x", "c"), ("a", "x", None)) == ("a", "x", "c")


class TestSubsumes:
    def test_subset(self):
        assert _subsumes(("a", "b"), ("a", None))
        assert _subsumes(("a", "b"), (None, None))
        assert _subsumes(("a", "b"), ("a", "b"))

    def test_not_subset(self):
        assert not _subsumes(("a", None), ("a", "b"))
        assert not _subsumes(("a", "b"), ("c", None))


class TestClosure:
    def test_single_tuple(self):
        out = run([(("a", "b"), {"t1"})])
        assert out == {("a", "b"): ("t1",)}

    def test_paper_fig3_component(self):
        # t1 (Germany, Berlin, 63, -, -) + t7 (-, Berlin, -, 1.4M, 147)
        out = run(
            [
                (("Germany", "Berlin", "63", None, None), {"t1"}),
                ((None, "Berlin", None, "1.4M", "147"), {"t7"}),
            ]
        )
        assert out == {
            ("Germany", "Berlin", "63", "1.4M", "147"): ("t1", "t7")
        }

    def test_paper_fig8b_jnj_chain(self):
        # t12 (JnJ, -, -), t14 (-, -, USA), t16 (JnJ, -, USA): transitive
        # closure connects all three into one tuple.
        out = run(
            [
                (("JnJ", None, None), {"t12"}),
                ((None, None, "USA"), {"t14"}),
                (("JnJ", None, "USA"), {"t16"}),
            ]
        )
        assert out == {("JnJ", None, "USA"): ("t12", "t14", "t16")}

    def test_conflicting_tuples_stay_separate(self):
        out = run(
            [
                (("a", "x"), {"t1"}),
                (("a", "y"), {"t2"}),
            ]
        )
        assert set(out) == {("a", "x"), ("a", "y")}
        # Neither output absorbs the other's provenance.
        assert out[("a", "x")] == ("t1",)
        assert out[("a", "y")] == ("t2",)

    def test_duplicate_inputs_union_tids(self):
        out = run([(("a", "b"), {"t1"}), (("a", "b"), {"t2"})])
        assert out == {("a", "b"): ("t1", "t2")}

    def test_shared_tuple_supports_multiple_outputs(self):
        # Paper: t13 appears in both f8 and f13. A hub tuple that is
        # compatible with two mutually-incompatible tuples yields two
        # outputs, both carrying the hub's tid.
        out = run(
            [
                (("Pfizer", "FDA", None), {"t11"}),
                ((None, "FDA", "United States"), {"t13"}),
                (("J&J", None, "United States"), {"t15"}),
            ]
        )
        assert out == {
            ("Pfizer", "FDA", "United States"): ("t11", "t13"),
            ("J&J", "FDA", "United States"): ("t13", "t15"),
        }

    def test_three_way_chain(self):
        # a-b via col1, b-c via col2: full transitive integration.
        out = run(
            [
                (("k1", None, "v1"), {"a"}),
                (("k1", "k2", None), {"b"}),
                ((None, "k2", None), {"c"}),
            ]
        )
        assert out == {("k1", "k2", "v1"): ("a", "b", "c")}

    def test_subsumed_input_dropped_but_credited(self):
        out = run(
            [
                (("a", "b"), {"t1"}),
                (("a", None), {"t2"}),
            ]
        )
        assert out == {("a", "b"): ("t1", "t2")}

    def test_max_tuples_guard(self):
        # A clique of pairwise-complementable tuples forces closure growth.
        rows = [
            (("k", f"v{i}", None, None), {f"t{i}"}) for i in range(3)
        ]
        # All share col0="k" but conflict on col1 -> no growth, no raise.
        run(rows, max_tuples=5)
        rows2 = [
            (tuple("k" if j == 0 else (f"v{i}" if j == i + 1 else None)
                   for j in range(5)), {f"t{i}"})
            for i in range(4)
        ]
        with pytest.raises(RuntimeError, match="exceeded"):
            run(rows2, max_tuples=6)

    def test_all_null_columns_tolerated(self):
        out = run([(("a", None), {"t1"}), (("a", None), {"t2"})])
        assert out == {("a", None): ("t1", "t2")}

    def test_closure_is_order_insensitive(self):
        rows = [
            (("x", None, None), {"a"}),
            (("x", "y", None), {"b"}),
            ((None, "y", "z"), {"c"}),
        ]
        assert run(rows) == run(list(reversed(rows)))
