"""Unit tests for repro.util."""
import pytest

from repro.util import (
    acronym,
    containment,
    jaccard,
    ngrams,
    normalize,
    parse_numeric,
    stable_hash,
    tokens,
)


class TestNormalize:
    @pytest.mark.parametrize(
        "raw,expected",
        [
            ("  United  States ", "united states"),
            ("J&J", "j j"),
            ("JnJ", "jnj"),
            ("Mexico City", "mexico city"),
            ("63%", "63"),
            ("", ""),
            (None, ""),
            (42, "42"),
            ("Ålesund", "lesund"),  # non-ascii stripped, not crashed on
        ],
    )
    def test_cases(self, raw, expected):
        assert normalize(raw) == expected

    def test_idempotent(self):
        for v in ["United States", "a  b", "x-y", "", "ABC123"]:
            assert normalize(normalize(v)) == normalize(v)


class TestTokens:
    def test_order_preserving_dedup(self):
        assert tokens("a b a c b") == ["a", "b", "c"]

    def test_none(self):
        assert tokens(None) == []


class TestNgrams:
    def test_short_value(self):
        assert ngrams("ab", 3) == {"#ab", "ab#"}

    def test_single_char(self):
        assert ngrams("a", 3) == {"#a#"}

    def test_basic(self):
        assert "#un" in ngrams("united")
        assert "ed#" in ngrams("united")

    def test_empty(self):
        assert ngrams("") == set()
        assert ngrams(None) == set()


class TestAcronym:
    @pytest.mark.parametrize(
        "raw,expected",
        [("United States", "us"), ("New Delhi", "nd"), ("Boston", "b"), ("", "")],
    )
    def test_cases(self, raw, expected):
        assert acronym(raw) == expected


class TestStableHash:
    def test_deterministic(self):
        assert stable_hash("Berlin") == stable_hash("berlin  ")

    def test_seed_changes_hash(self):
        assert stable_hash("Berlin", 1) != stable_hash("Berlin", 2)

    def test_range(self):
        h = stable_hash("x")
        assert 0 <= h < 2**32


class TestParseNumeric:
    @pytest.mark.parametrize(
        "raw,expected",
        [
            ("1.4M", 1.4e6),
            ("263k", 263_000.0),
            ("2M", 2e6),
            ("63%", 63.0),
            ("147", 147.0),
            ("5,742,812", 5_742_812.0),
            ("2.68M", 2.68e6),
            ("3b", 3e9),
            ("1.6278383E7", 1.6278383e7),
            ("1e3", 1000.0),
            ("-2.5E-2", -0.025),
            (42, 42.0),
            (4.5, 4.5),
            ("-12.5", -12.5),
        ],
    )
    def test_valid(self, raw, expected):
        assert parse_numeric(raw) == pytest.approx(expected)

    @pytest.mark.parametrize("raw", [None, "", "Berlin", "N/A", "12abc", "%", "E7"])
    def test_invalid(self, raw):
        assert parse_numeric(raw) is None


class TestSetSims:
    def test_jaccard(self):
        assert jaccard({1, 2}, {2, 3}) == pytest.approx(1 / 3)
        assert jaccard(set(), set()) == 0.0
        assert jaccard({1}, {1}) == 1.0

    def test_containment(self):
        assert containment({1, 2}, {1, 2, 3}) == 1.0
        assert containment({1, 2, 3, 4}, {1, 2}) == 0.5
        assert containment(set(), {1}) == 0.0
