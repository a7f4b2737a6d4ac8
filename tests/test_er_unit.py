"""Unit tests for the ER engine's pure-Python pieces."""
import pytest

from repro.analyze.er import (
    _canonical,
    _clusters,
    levenshtein,
    pair_score,
    value_similarity,
)


class TestLevenshtein:
    @pytest.mark.parametrize(
        "a,b,d",
        [
            ("", "", 0), ("a", "", 1), ("", "abc", 3),
            ("kitten", "sitting", 3), ("usa", "us", 1),
            ("jnj", "jj", 1), ("abc", "abc", 0), ("abc", "cba", 2),
        ],
    )
    def test_cases(self, a, b, d):
        assert levenshtein(a, b) == d
        assert levenshtein(b, a) == d  # symmetric


class TestValueSimilarity:
    def test_exact(self):
        assert value_similarity("FDA", "fda") == 1.0

    def test_null_gives_none(self):
        assert value_similarity(None, "x") is None
        assert value_similarity("x", None) is None
        assert value_similarity(None, None) is None

    def test_jnj_variants(self):
        """The paper's Fig. 8: JnJ and J&J must be similar."""
        assert value_similarity("JnJ", "J&J") >= 0.6

    def test_usa_united_states(self):
        """USA ~ United States via acronym evidence."""
        assert value_similarity("USA", "United States") >= 0.6

    def test_numeric_values_compare_as_numbers(self):
        assert value_similarity("63.5", "63.1") == 0.0
        assert value_similarity("1.4M", "1400000") == 1.0
        assert value_similarity("63%", "63") == 1.0
        assert value_similarity("147", "Berlin") == 0.0

    def test_unrelated_values_low(self):
        assert value_similarity("Pfizer", "J&J") < 0.4
        assert value_similarity("Berlin", "Boston") < 0.6

    def test_symmetric(self):
        for a, b in [("USA", "United States"), ("JnJ", "J&J"), ("x", "yz")]:
            assert value_similarity(a, b) == pytest.approx(
                value_similarity(b, a)
            )


class TestPairScore:
    def test_fig8_fd_pair_matches(self):
        s, n, w = pair_score(
            ["JnJ", None, "USA"], ["J&J", "FDA", "United States"]
        )
        assert n == 2
        assert s >= 0.6
        assert w >= 0.4

    def test_single_shared_attr(self):
        s, n, w = pair_score(["JnJ", None, None], ["J&J", None, "USA"])
        assert n == 1

    def test_conflicting_name_vetoed(self):
        """Pfizer vs J&J with identical approver+country: high mean but a
        weakest-attribute similarity under the veto threshold."""
        s, n, w = pair_score(
            ["Pfizer", "FDA", "United States"],
            ["J&J", "FDA", "United States"],
        )
        assert s >= 0.6 and n == 3
        assert w < 0.4

    def test_no_shared(self):
        assert pair_score(["a", None], [None, "b"]) == (0.0, 0, 0.0)


class TestClusters:
    def test_transitive(self):
        rows = [{"id1": 1, "id2": 2}, {"id1": 2, "id2": 3}]
        c = _clusters(rows, [1, 2, 3, 4])
        assert c[1] == c[2] == c[3]
        assert c[4] != c[1]

    def test_no_matches(self):
        c = _clusters([], [1, 2])
        assert c[1] != c[2]


class TestCanonical:
    def test_most_frequent_wins(self):
        assert _canonical(["USA", "USA", "United States"]) == "USA"

    def test_tie_prefers_longest(self):
        assert _canonical(["USA", "United States"]) == "United States"
        assert _canonical(["JnJ", "J&J"]) == "J&J"  # equal len -> lexicographic
