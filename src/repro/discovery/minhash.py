"""MinHash signatures for set resemblance (substrate for LSH Ensemble).

Standard k-permutation MinHash over 32-bit value hashes with the
universal-hash family h_i(x) = (a_i * x + b_i) mod p (p Mersenne 2^61-1).
All randomness is seeded; ``util.stable_hash`` keys signatures to value
*content*, so signatures computed on different Spark workers agree.
"""
from __future__ import annotations

import numpy as np

from ..util import stable_hash

NUM_PERM = 128
_P = (1 << 61) - 1
_MAX = np.uint64(2**32 - 1)


def perm_params(num_perm: int = NUM_PERM, seed: int = 7) -> tuple[np.ndarray, np.ndarray]:
    """The (a, b) coefficients of the hash family (deterministic)."""
    g = np.random.default_rng(seed)
    a = g.integers(1, _P, num_perm, dtype=np.uint64)
    b = g.integers(0, _P, num_perm, dtype=np.uint64)
    return a, b


def signature(
    values, *, num_perm: int = NUM_PERM, seed: int = 7
) -> np.ndarray:
    """MinHash signature (uint64[num_perm]) of a collection of values.

    Empty input yields the all-max signature (matches nothing)."""
    a, b = perm_params(num_perm, seed)
    hashes = np.fromiter(
        (stable_hash(v) for v in values), dtype=np.uint64
    )
    if hashes.size == 0:
        return np.full(num_perm, np.iinfo(np.uint64).max, dtype=np.uint64)
    # (num_perm, n) matrix of permuted hashes; min along n.
    ph = (
        (np.outer(a, hashes) + b[:, None]) % np.uint64(_P)
    ) & _MAX
    return ph.min(axis=1)


def est_jaccard(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
    """Unbiased Jaccard estimate: fraction of agreeing components."""
    if sig_a.shape != sig_b.shape:
        raise ValueError("signature length mismatch")
    return float(np.mean(sig_a == sig_b))


def containment_from_jaccard(j: float, q_size: int, x_size: int) -> float:
    """Convert Jaccard to containment |Q∩X|/|Q| given set sizes:
    C = J (|Q| + |X|) / (|Q| (1 + J)) — the LSH Ensemble identity."""
    if q_size == 0:
        return 0.0
    c = j * (q_size + x_size) / (q_size * (1 + j))
    return max(0.0, min(1.0, c))


def jaccard_from_containment(c: float, q_size: int, x_size: int) -> float:
    """Inverse conversion: J = C|Q| / (|Q| + |X| - C|Q|)."""
    denom = q_size + x_size - c * q_size
    if denom <= 0:
        return 1.0
    return max(0.0, min(1.0, c * q_size / denom))
