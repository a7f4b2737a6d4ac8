"""Shared small utilities: normalization, hashing, numeric parsing.

Everything here is deterministic (no wall clock, no process-random
hashing) so that index builds, MinHash signatures and generated data are
reproducible across Spark executors and across runs.
"""
from __future__ import annotations

import re
import zlib

_MULTIPLIERS = {"k": 1e3, "m": 1e6, "b": 1e9}

_WS_RE = re.compile(r"\s+")
_PUNCT_RE = re.compile(r"[^0-9a-z ]+")
# Accepts plain/thousands-grouped/decimal numbers, scientific notation
# (Spark casts big doubles to strings like "1.6278383E7"), and open-data
# suffixes ("1.4M", "263k", "63%").
_NUM_RE = re.compile(
    r"^\s*([+-]?\d+(?:[,.]\d{3})*(?:\.\d+)?(?:[eE][+-]?\d+)?"
    r"|[+-]?\d*\.\d+(?:[eE][+-]?\d+)?)\s*([kKmMbB])?\s*(%)?\s*$"
)


def normalize(value: object) -> str:
    """Canonical string form used for matching: lowercase, punctuation
    stripped, whitespace collapsed. ``None`` maps to the empty string."""
    if value is None:
        return ""
    s = str(value).strip().lower()
    s = _PUNCT_RE.sub(" ", s)
    return _WS_RE.sub(" ", s).strip()


def tokens(value: object) -> list[str]:
    """Normalized word tokens of a value (deduplicated, order-preserving)."""
    seen: dict[str, None] = {}
    for t in normalize(value).split():
        seen.setdefault(t, None)
    return list(seen)


def ngrams(value: object, n: int = 3) -> set[str]:
    """Character n-grams of the normalized value (with boundary padding)."""
    s = normalize(value)
    if not s:
        return set()
    padded = f"#{s}#"
    if len(padded) <= n:
        return {padded}
    return {padded[i : i + n] for i in range(len(padded) - n + 1)}


def acronym(value: object) -> str:
    """First letters of the normalized words — 'United States' -> 'us'."""
    return "".join(t[0] for t in normalize(value).split())


def stable_hash(value: object, seed: int = 0) -> int:
    """Deterministic 32-bit hash of a value's normalized form.

    ``zlib.crc32`` is stable across processes (unlike builtin ``hash``),
    which matters because signatures are computed inside Spark workers.
    """
    data = f"{seed}\x00{normalize(value)}".encode("utf-8")
    return zlib.crc32(data) & 0xFFFFFFFF


def parse_numeric(value: object) -> float | None:
    """Parse open-data numeric strings: '1.4M' -> 1.4e6, '263k' -> 263000,
    '63%' -> 63.0, '5,742,812' -> 5742812. Returns None if not numeric."""
    if value is None:
        return None
    if isinstance(value, (int, float)):
        return float(value)
    m = _NUM_RE.match(str(value).replace(",", ""))
    if not m:
        return None
    num = float(m.group(1))
    if m.group(2):
        num *= _MULTIPLIERS[m.group(2).lower()]
    return num


def jaccard(a: set, b: set) -> float:
    """Exact Jaccard similarity of two sets (0.0 when both empty)."""
    if not a and not b:
        return 0.0
    return len(a & b) / len(a | b)


def containment(query: set, candidate: set) -> float:
    """Set containment |Q ∩ X| / |Q| (0.0 for an empty query)."""
    if not query:
        return 0.0
    return len(query & candidate) / len(query)
