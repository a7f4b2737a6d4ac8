"""Table E3 — LSH Ensemble vs exact containment (JOSIE-lite as oracle).

For each query, exact column containment over the lake defines the gold
set of tables with containment >= t*; LSHE's approximate results are
scored against it (candidate precision/recall) alongside query latency
of both. Expected shape: LSHE recall near 1 with precision moderated by
MinHash estimation error, at similar-or-better latency than the exact
scan as the lake grows.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..discovery.lsh_ensemble import LSHEnsemble
from ..discovery.overlap import ExactOverlap
from ..lake.catalog import Catalog
from ..lake.generator import DOMAIN_ATTRS, Lake, generate_lake, spec_for_sf


def run(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    thresholds: tuple[float, ...] = (0.5, 0.7),
    n_queries: int = 6,
    seed: int = 7,
    lake: Lake | None = None,
) -> pd.DataFrame:
    lake = lake or generate_lake(spec_for_sf(sf, seed=seed))
    catalog = Catalog.from_lake(spark, lake)
    exact = ExactOverlap()
    exact.build_index(catalog)
    rows = []
    queries = lake.table_names()[:n_queries]
    for t in thresholds:
        lshe = LSHEnsemble(threshold=t)
        lshe.build_index(catalog)
        ps, rs, lshe_secs, exact_secs = [], [], [], []
        for q in queries:
            truth = lake.truth[q]
            key_attr = DOMAIN_ATTRS[truth.domain][0]
            header = [
                h for h, a in truth.columns.items() if a == key_attr
            ][0]
            qdf = catalog.table(q)
            t0 = time.perf_counter()
            gold = {
                s.table
                for s in exact.search(qdf, header, k=len(lake.frames))
                if s.score >= t
            }
            exact_secs.append(time.perf_counter() - t0)
            t0 = time.perf_counter()
            got = {
                s.table
                for s in lshe.search(qdf, header, k=len(lake.frames))
            }
            lshe_secs.append(time.perf_counter() - t0)
            tp = len(got & gold)
            ps.append(tp / len(got) if got else 1.0)
            rs.append(tp / len(gold) if gold else 1.0)
        rows.append(
            {
                "containment_t": t,
                "candidate_precision": round(sum(ps) / len(ps), 3),
                "candidate_recall": round(sum(rs) / len(rs), 3),
                "lshe_query_seconds": round(sum(lshe_secs) / len(lshe_secs), 2),
                "exact_query_seconds": round(
                    sum(exact_secs) / len(exact_secs), 2
                ),
            }
        )
    return pd.DataFrame(rows)
