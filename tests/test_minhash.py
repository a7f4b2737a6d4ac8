"""Tests for the MinHash substrate and LSH banding math."""
import numpy as np
import pytest

from repro.discovery.lsh_ensemble import band_hashes, choose_banding
from repro.discovery.minhash import (
    containment_from_jaccard,
    est_jaccard,
    jaccard_from_containment,
    perm_params,
    signature,
)
from repro.util import jaccard as exact_jaccard


class TestSignature:
    def test_deterministic(self):
        a = signature(["x", "y", "z"])
        b = signature(["z", "x", "y"])  # order-insensitive (sets)
        assert np.array_equal(a, b)

    def test_distinct_sets_differ(self):
        assert not np.array_equal(signature(["a", "b"]), signature(["c", "d"]))

    def test_empty(self):
        s = signature([])
        assert (s == np.iinfo(np.uint64).max).all()
        assert est_jaccard(s, signature(["a"])) == 0.0

    def test_identical_sets_estimate_one(self):
        s = signature([f"v{i}" for i in range(100)])
        assert est_jaccard(s, s) == 1.0

    @pytest.mark.parametrize("overlap", [0.2, 0.5, 0.8])
    def test_estimation_accuracy(self, overlap):
        n = 400
        shared = [f"s{i}" for i in range(int(n * overlap))]
        a = set(shared + [f"a{i}" for i in range(n - len(shared))])
        b = set(shared + [f"b{i}" for i in range(n - len(shared))])
        true_j = exact_jaccard(a, b)
        est = est_jaccard(signature(a), signature(b))
        assert est == pytest.approx(true_j, abs=0.12)  # ~1/sqrt(128)

    def test_length_mismatch_raises(self):
        with pytest.raises(ValueError):
            est_jaccard(
                signature(["a"], num_perm=64), signature(["a"], num_perm=128)
            )

    def test_perm_params_deterministic(self):
        a1, b1 = perm_params(64, seed=1)
        a2, b2 = perm_params(64, seed=1)
        assert np.array_equal(a1, a2) and np.array_equal(b1, b2)


class TestContainmentConversion:
    def test_roundtrip(self):
        for c in [0.1, 0.5, 0.9]:
            j = jaccard_from_containment(c, 100, 400)
            assert containment_from_jaccard(j, 100, 400) == pytest.approx(c)

    def test_equal_sets(self):
        assert containment_from_jaccard(1.0, 50, 50) == 1.0
        assert jaccard_from_containment(1.0, 50, 50) == 1.0

    def test_empty_query(self):
        assert containment_from_jaccard(0.5, 0, 10) == 0.0

    def test_monotone_in_jaccard(self):
        cs = [
            containment_from_jaccard(j, 100, 300)
            for j in [0.1, 0.3, 0.5, 0.7]
        ]
        assert cs == sorted(cs)


class TestBanding:
    def test_threshold_approximation(self):
        for jt in [0.2, 0.5, 0.8]:
            b, r = choose_banding(128, jt)
            assert b * r <= 128
            assert (1.0 / b) ** (1.0 / r) == pytest.approx(jt, abs=0.15)

    def test_high_threshold_gives_long_rows(self):
        b_lo, r_lo = choose_banding(128, 0.1)
        b_hi, r_hi = choose_banding(128, 0.9)
        assert r_hi > r_lo

    def test_band_hashes_deterministic(self):
        sig = signature([f"v{i}" for i in range(50)])
        assert band_hashes(sig, 16, 8) == band_hashes(sig, 16, 8)
        assert len(band_hashes(sig, 16, 8)) == 16

    def test_band_collision_for_equal_sigs(self):
        sig = signature(["a", "b", "c"])
        assert band_hashes(sig, 32, 4) == band_hashes(sig.copy(), 32, 4)
