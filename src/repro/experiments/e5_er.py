"""Table E5 — downstream ER quality over FD vs outer join vs union
(the demo's Example 5 claim, at lake scale).

A lake generated with entity-name variant noise (JnJ/J&J, USA/United
States style) is integrated with each operator, then the ER engine
resolves the result; provenance pairwise P/R/F1 against gold entities
measures how much the integration semantics helps the downstream task.
Expected shape: ER over FD dominates ER over outer join (null join keys
block connections the matcher needed), which dominates ER over union.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..align.schema_matching import align
from ..analyze.er import resolve
from ..analyze.metrics import (
    collect_integrated,
    er_pair_metrics,
    tag_tids,
    tid_entities_for,
)
from ..integrate.fd import full_disjunction
from ..integrate.naive import union_integrate
from ..integrate.outer_join import outer_join_integrate
from ..lake.catalog import Catalog
from ..lake.generator import Lake, generate_lake, spec_for_sf

METHODS = {
    "alite_fd": full_disjunction,
    "outer_join": outer_join_integrate,
    "union": union_integrate,
}


def run(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    k: int = 4,
    variant_noise: float = 0.15,
    seed: int = 11,
    lake: Lake | None = None,
) -> pd.DataFrame:
    lake = lake or generate_lake(
        spec_for_sf(sf, seed=seed, variant_noise=variant_noise)
    )
    catalog = Catalog.from_lake(spark, lake)
    names = [
        n for n in lake.table_names()
        if lake.truth[n].domain == "city_stats"
    ][:k]
    frames = tag_tids(lake, catalog, names)
    alignment = align(frames, exclude=("TID",))
    aligned = alignment.apply(frames, keep=("TID",))
    dfs = [aligned[n] for n in names]
    tid_entity = tid_entities_for(lake, names)
    rows = []
    for method, fn in METHODS.items():
        t0 = time.perf_counter()
        integrated = fn(dfs, tid_col="TID")
        before = er_pair_metrics(collect_integrated(integrated), tid_entity)
        resolved = collect_integrated(resolve(integrated))
        after = er_pair_metrics(resolved, tid_entity)
        elapsed = time.perf_counter() - t0
        rows.append(
            {
                "method": method,
                "tuples_after_er": len(resolved),
                "f1_before_er": round(before.f1, 3),
                "er_precision": round(after.precision, 3),
                "er_recall": round(after.recall, 3),
                "er_f1": round(after.f1, 3),
                "seconds": round(elapsed, 2),
            }
        )
    return pd.DataFrame(rows)
