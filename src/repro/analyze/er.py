"""Entity resolution over an integrated table (py_entitymatching-lite).

The demo applies py_entitymatching to the integrated table to merge
tuples that describe the same real-world entity under different surface
forms (JnJ vs J&J, USA vs United States — Fig. 8c/d). That package is
not installable offline, so this module implements the same pipeline
shape from scratch:

1. **Blocking** — candidate pairs share a normalized word token or a
   (column, first-character) block, so abbreviation pairs like
   USA / United States survive blocking;
2. **Feature scoring** — per-attribute similarity = max of exact match,
   Levenshtein ratio, 3-gram Jaccard and acronym similarity, computed
   over Arrow batches (``mapInPandas``);
3. **Rule matching** — a pair matches when >= ``min_shared`` attributes
   are non-null on both sides, their mean similarity >= ``threshold``,
   no attribute strongly disagrees (``min_attr`` veto), and every
   *identifier* attribute — a column whose distinct ratio is >= 0.5,
   i.e. a name-like key, detected from the data — is itself similar
   (>= ``id_threshold``). Averaging would otherwise let a low-cardinality
   exact match (two cities in the same country) outvote a disagreeing
   name, the classic ER failure mode;
4. **Clustering + merging** — connected components of the match graph;
   each cluster merges into one tuple, preferring the most frequent then
   longest surface form per attribute, with ``_tids`` provenance unioned.

Step 4's union-find runs on the driver: the match graph is orders of
magnitude smaller than the data (blocking + rule filtering), so a
distributed fixpoint would be pure overhead.
"""
from __future__ import annotations

from collections.abc import Iterator

import pandas as pd
import pyspark.sql.functions as F
import pyspark.sql.types as T
from pyspark.sql import DataFrame

from ..integrate.outer_union import TIDS
from ..util import acronym, jaccard, ngrams, normalize, parse_numeric

_RID = "_rid"


def levenshtein(a: str, b: str) -> int:
    """Classic O(|a||b|) edit distance (values here are short strings)."""
    if a == b:
        return 0
    if not a:
        return len(b)
    if not b:
        return len(a)
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(
                min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb))
            )
        prev = cur
    return prev[-1]


def _lev_ratio(a: str, b: str) -> float:
    if not a and not b:
        return 0.0
    return 1.0 - levenshtein(a, b) / max(len(a), len(b))


def value_similarity(a: object, b: object) -> float | None:
    """Similarity of two attribute values in [0, 1]; None if either side
    is null (the attribute then contributes no evidence)."""
    na, nb = normalize(a), normalize(b)
    if not na or not nb:
        return None
    if na == nb:
        return 1.0
    # Numeric values compare as numbers, never as character strings:
    # "63.5" and "63.1" are *different* measurements (edit-distance would
    # call them 75% similar and chain-merge unrelated entities), while
    # "1.4M" and "1400000" are the same number in different notations.
    num_a, num_b = parse_numeric(a), parse_numeric(b)
    if num_a is not None and num_b is not None:
        return 1.0 if abs(num_a - num_b) <= 1e-9 * max(
            1.0, abs(num_a), abs(num_b)
        ) else 0.0
    if (num_a is None) != (num_b is None):
        return 0.0  # a number vs a name is never a match
    compact_a, compact_b = na.replace(" ", ""), nb.replace(" ", "")
    feats = [
        _lev_ratio(na, nb),
        _lev_ratio(compact_a, compact_b),
        jaccard(ngrams(na), ngrams(nb)),
    ]
    # Acronym evidence: 'United States' ~ 'USA' via initials 'us'.
    ac_a, ac_b = acronym(na), acronym(nb)
    if len(ac_a) > 1:
        feats.append(_lev_ratio(ac_a, compact_b))
    if len(ac_b) > 1:
        feats.append(_lev_ratio(compact_a, ac_b))
    return max(feats)


def pair_score(
    row_a: list[object], row_b: list[object]
) -> tuple[float, int, float]:
    """(mean similarity, count of shared non-null attributes, weakest
    attribute similarity). The weakest value feeds a veto rule: a pair
    whose names strongly disagree must not merge even if its other
    attributes agree exactly (Pfizer vs J&J both approved by the FDA in
    the United States are different entities)."""
    sims = [
        s
        for s in (value_similarity(x, y) for x, y in zip(row_a, row_b))
        if s is not None
    ]
    if not sims:
        return 0.0, 0, 0.0
    return sum(sims) / len(sims), len(sims), min(sims)


def _with_rids(df: DataFrame) -> DataFrame:
    return df.withColumn(_RID, F.monotonically_increasing_id())


def _block_keys(df: DataFrame, value_cols: list[str]) -> DataFrame:
    """(rid, key) blocking pairs: word tokens and (column, first char)."""
    parts = []
    for c in value_cols:
        norm = F.lower(F.regexp_replace(F.col(c), r"[^0-9A-Za-z ]+", " "))
        parts.append(
            df.where(F.col(c).isNotNull())
            .select(
                F.col(_RID),
                F.explode(
                    F.filter(F.split(F.trim(norm), r"\s+"), lambda t: t != "")
                ).alias("tok"),
            )
            .select(
                F.col(_RID), F.concat(F.lit("w:"), F.col("tok")).alias("key")
            )
        )
        parts.append(
            df.where(F.col(c).isNotNull()).select(
                F.col(_RID),
                F.concat(
                    F.lit(f"c:{c}:"), F.substring(F.trim(norm), 1, 1)
                ).alias("key"),
            )
        )
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out.where(F.col("key").isNotNull()).distinct()


def candidate_pairs(df: DataFrame, value_cols: list[str]) -> DataFrame:
    """Blocked candidate pairs ``(id1, id2)`` with id1 < id2."""
    keys = _block_keys(df, value_cols)
    a = keys.alias("a")
    b = keys.alias("b")
    return (
        a.join(b, F.col("a.key") == F.col("b.key"))
        .where(F.col(f"a.{_RID}") < F.col(f"b.{_RID}"))
        .select(
            F.col(f"a.{_RID}").alias("id1"), F.col(f"b.{_RID}").alias("id2")
        )
        .distinct()
    )


IDENTIFIER_DISTINCT_RATIO = 0.5


def identifier_columns(df: DataFrame, value_cols: list[str]) -> list[str]:
    """Columns behaving like entity identifiers: >= half their non-null
    values are distinct (city/vaccine names qualify; a country column
    shared by dozens of rows does not)."""
    aggs = []
    for c in value_cols:
        aggs.append(F.countDistinct(F.col(c)).alias(f"d_{c}"))
        aggs.append(F.count(F.col(c)).alias(f"n_{c}"))
    row = df.agg(*aggs).first()
    out = []
    for c in value_cols:
        n = row[f"n_{c}"]
        if n and row[f"d_{c}"] / n >= IDENTIFIER_DISTINCT_RATIO:
            out.append(c)
    return out


def match_pairs(
    df: DataFrame,
    value_cols: list[str],
    *,
    threshold: float = 0.6,
    min_shared: int = 2,
    min_attr: float = 0.4,
    id_threshold: float = 0.65,
) -> DataFrame:
    """Score blocked pairs and keep matches: ``(id1, id2, score, shared,
    weakest, id_min)``.

    ``df`` must already carry ``_rid`` (use ``resolve`` for the
    end-to-end path)."""
    id_cols = set(identifier_columns(df, value_cols))
    pairs = candidate_pairs(df, value_cols)
    struct = F.struct(*[F.col(c) for c in value_cols])
    v1 = df.select(F.col(_RID).alias("rid1"), struct.alias("v1"))
    v2 = df.select(F.col(_RID).alias("rid2"), struct.alias("v2"))
    joined = (
        pairs.join(v1, pairs.id1 == v1.rid1)
        .join(v2, pairs.id2 == v2.rid2)
        .select("id1", "id2", "v1", "v2")
    )
    schema = T.StructType(
        [
            T.StructField("id1", T.LongType()),
            T.StructField("id2", T.LongType()),
            T.StructField("score", T.DoubleType()),
            T.StructField("shared", T.IntegerType()),
            T.StructField("weakest", T.DoubleType()),
            T.StructField("id_min", T.DoubleType()),
        ]
    )

    def score_batches(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            recs = []
            for r in pdf.itertuples(index=False):
                # Arrow materializes struct columns as python dicts.
                va = [r.v1.get(c) for c in value_cols]
                vb = [r.v2.get(c) for c in value_cols]
                s, n, w = pair_score(va, vb)
                id_sims = [
                    sim
                    for c, x, y in zip(value_cols, va, vb)
                    if c in id_cols
                    for sim in [value_similarity(x, y)]
                    if sim is not None
                ]
                recs.append(
                    (r.id1, r.id2, s, n, w, min(id_sims) if id_sims else 1.0)
                )
            yield pd.DataFrame(
                recs,
                columns=["id1", "id2", "score", "shared", "weakest", "id_min"],
            )

    scored = joined.mapInPandas(score_batches, schema)
    return scored.where(
        (F.col("score") >= threshold)
        & (F.col("shared") >= min_shared)
        & (F.col("weakest") >= min_attr)
        & (F.col("id_min") >= id_threshold)
    )


def _clusters(match_rows: list, rids: list[int]) -> dict[int, int]:
    """Driver-side union-find over the (small) match graph."""
    parent = {r: r for r in rids}

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for m in match_rows:
        ra, rb = find(m["id1"]), find(m["id2"])
        if ra != rb:
            parent[max(ra, rb)] = min(ra, rb)
    return {r: find(r) for r in rids}


def _canonical(values: list[str]) -> str:
    """Merge policy: most frequent surface form, then longest (prefers
    'United States' over 'USA'), then lexicographic."""
    counts: dict[str, int] = {}
    for v in values:
        counts[v] = counts.get(v, 0) + 1
    return sorted(counts.items(), key=lambda kv: (-kv[1], -len(kv[0]), kv[0]))[0][0]


def resolve(
    df: DataFrame,
    value_cols: list[str] | None = None,
    *,
    threshold: float = 0.6,
    min_shared: int = 2,
    min_attr: float = 0.4,
    id_threshold: float = 0.65,
) -> DataFrame:
    """End-to-end ER: block, score, match, cluster and merge.

    Input is an integrated table (value columns + optional ``_tids``);
    output has the same shape with matched tuples merged.
    """
    has_tids = TIDS in df.columns
    if value_cols is None:
        value_cols = [c for c in df.columns if c != TIDS]
    work = _with_rids(df).localCheckpoint(eager=True)
    matches = match_pairs(
        work, value_cols, threshold=threshold, min_shared=min_shared,
        min_attr=min_attr, id_threshold=id_threshold,
    ).collect()
    rids = [r[_RID] for r in work.select(_RID).collect()]
    cluster_of = _clusters(matches, rids)
    spark = df.sparkSession
    mapping = spark.createDataFrame(
        [(int(k), int(v)) for k, v in cluster_of.items()],
        schema=T.StructType(
            [
                T.StructField(_RID, T.LongType()),
                T.StructField("_cluster", T.LongType()),
            ]
        ),
    )
    labeled = work.join(mapping, _RID)

    out_fields = [T.StructField(c, T.StringType()) for c in value_cols]
    if has_tids:
        out_fields.append(T.StructField(TIDS, T.ArrayType(T.StringType())))
    schema = T.StructType(out_fields)

    def merge(pdf: pd.DataFrame) -> pd.DataFrame:
        rec: dict[str, object] = {}
        for c in value_cols:
            vals = [v for v in pdf[c].tolist() if v is not None and not pd.isna(v)]
            rec[c] = _canonical([str(v) for v in vals]) if vals else None
        if has_tids:
            tids: set[str] = set()
            for arr in pdf[TIDS]:
                tids.update(arr)
            rec[TIDS] = sorted(tids)
        return pd.DataFrame([rec], columns=[f.name for f in out_fields])

    return labeled.groupBy("_cluster").applyInPandas(merge, schema)
