"""Table E4 — holistic schema matching quality (ALITE's Align stage).

Pairwise precision/recall/F1 of the integration-ID clustering against
gold canonical attributes, swept over the match threshold. Expected
shape: high precision across thresholds (the same-table constraint and
value evidence are strong), recall dropping as the threshold rises.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..align.schema_matching import align
from ..lake.catalog import Catalog
from ..lake.generator import Lake, generate_lake, spec_for_sf


def pairwise_prf(
    gold: dict[tuple[str, str], str], pred: dict[tuple[str, str], str]
) -> tuple[float, float, float]:
    cols = sorted(gold)
    tp = fp = fn = 0
    for i, a in enumerate(cols):
        for b in cols[i + 1:]:
            same_gold = gold[a] == gold[b]
            same_pred = pred[a] == pred[b]
            tp += same_gold and same_pred
            fp += (not same_gold) and same_pred
            fn += same_gold and (not same_pred)
    p = tp / (tp + fp) if tp + fp else 1.0
    r = tp / (tp + fn) if tp + fn else 1.0
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return p, r, f1


def run(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    thresholds: tuple[float, ...] = (0.15, 0.25, 0.4),
    seed: int = 7,
    lake: Lake | None = None,
) -> pd.DataFrame:
    lake = lake or generate_lake(spec_for_sf(sf, seed=seed))
    catalog = Catalog.from_lake(spark, lake)
    frames = {n: catalog.table(n) for n in catalog.table_names()}
    gold = {
        (name, header): attr
        for name, t in lake.truth.items()
        for header, attr in t.columns.items()
    }
    rows = []
    for thr in thresholds:
        t0 = time.perf_counter()
        alignment = align(frames, threshold=thr)
        elapsed = time.perf_counter() - t0
        pred = {tc: iid for tc, iid in alignment.assignments.items()}
        p, r, f1 = pairwise_prf(gold, pred)
        rows.append(
            {
                "threshold": thr,
                "n_columns": len(gold),
                "n_integration_ids": len(set(pred.values())),
                "precision": round(p, 3),
                "recall": round(r, 3),
                "f1": round(f1, 3),
                "seconds": round(elapsed, 2),
            }
        )
    return pd.DataFrame(rows)
