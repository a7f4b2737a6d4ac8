"""Table E2 — discovery quality: SANTOS-lite (unionable) and LSH
Ensemble (joinable) precision/recall@k against lake ground truth.

Each lake table in turn plays the query (intent column = its key);
gold unionable = same-domain tables sharing >= 2 canonical attributes,
gold joinable = tables holding the key attribute with containment >=
the LSH threshold. Expected shape: both searchers well above a random
baseline, SANTOS strong on unionable, LSHE strong on joinable.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..discovery.lsh_ensemble import LSHEnsemble
from ..discovery.santos import Santos
from ..lake.catalog import Catalog
from ..lake.generator import DOMAIN_ATTRS, Lake, generate_lake, spec_for_sf


def _key_header(lake: Lake, name: str) -> tuple[str, str]:
    t = lake.truth[name]
    key_attr = DOMAIN_ATTRS[t.domain][0]
    return [h for h, a in t.columns.items() if a == key_attr][0], key_attr


def _pr_at_k(hits: list[str], gold: set[str], k: int) -> tuple[float, float]:
    top = hits[:k]
    tp = len(set(top) & gold)
    precision = tp / len(top) if top else 0.0
    recall = tp / min(len(gold), k) if gold else 1.0
    return precision, recall


def run(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    ks: tuple[int, ...] = (3, 5),
    n_queries: int = 6,
    threshold: float = 0.5,
    seed: int = 7,
    lake: Lake | None = None,
) -> pd.DataFrame:
    lake = lake or generate_lake(spec_for_sf(sf, seed=seed))
    catalog = Catalog.from_lake(spark, lake)
    santos = Santos(lake.kb)
    lshe = LSHEnsemble(threshold=threshold)
    t0 = time.perf_counter()
    santos.build_index(catalog)
    santos_build = time.perf_counter() - t0
    t0 = time.perf_counter()
    lshe.build_index(catalog)
    lshe_build = time.perf_counter() - t0

    queries = lake.table_names()[:n_queries]
    # One ranked search per (algorithm, query) at the largest k; the
    # per-k metrics slice that ranking (top-k of a ranked list).
    k_max = max(ks)
    per_query: dict[str, dict] = {}
    for q in queries:
        header, key_attr = _key_header(lake, q)
        qdf = catalog.table(q)
        t0 = time.perf_counter()
        s_hits = [h.table for h in santos.search(qdf, header, k_max)]
        s_sec = time.perf_counter() - t0
        t0 = time.perf_counter()
        l_hits = [h.table for h in lshe.search(qdf, header, k_max)]
        l_sec = time.perf_counter() - t0
        per_query[q] = {
            "santos": (s_hits, s_sec),
            "lsh_ensemble": (l_hits, l_sec),
            "gold_union": {
                b for b in lake.table_names() if lake.unionable(q, b)
            },
            "gold_join": {
                b
                for b in lake.table_names()
                if lake.joinable(q, key_attr, b, threshold=threshold)
            },
        }
    rows = []
    for k in ks:
        agg = {
            "santos": {"p": [], "r": [], "s": []},
            "lsh_ensemble": {"p": [], "r": [], "s": []},
        }
        for q in queries:
            info = per_query[q]
            for algo, gold_key in [
                ("santos", "gold_union"), ("lsh_ensemble", "gold_join")
            ]:
                hits, sec = info[algo]
                p, r = _pr_at_k(hits, info[gold_key], k)
                agg[algo]["p"].append(p)
                agg[algo]["r"].append(r)
                agg[algo]["s"].append(sec)
        for algo, a in agg.items():
            rows.append(
                {
                    "algorithm": algo,
                    "task": "unionable" if algo == "santos" else "joinable",
                    "k": k,
                    "precision_at_k": round(sum(a["p"]) / len(a["p"]), 3),
                    "recall_at_k": round(sum(a["r"]) / len(a["r"]), 3),
                    "avg_query_seconds": round(sum(a["s"]) / len(a["s"]), 2),
                    "index_build_seconds": round(
                        santos_build if algo == "santos" else lshe_build, 2
                    ),
                }
            )
    return pd.DataFrame(rows)
