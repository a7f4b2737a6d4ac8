"""Table E1 — integration at scale: ALITE FD vs outer join vs union.

For k same-domain lake tables (the discovery-output shape), integrate
with each operator and report output size, completeness, ground-truth
fact coverage, entity fragmentation, provenance ER-F1 and wall time.
Expected shape (the demo's claims): FD's coverage ~1 and best F1 with
the fewest, best-connected tuples; union fragments facts; outer join
sits between, producing >= FD tuples with more nulls.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..align.schema_matching import align
from ..analyze.metrics import (
    collect_integrated,
    entity_metrics,
    er_pair_metrics,
    fact_coverage,
    gold_facts_for,
    iid_attr_map,
    tag_tids,
    tid_entities_for,
)
from ..integrate.fd import full_disjunction
from ..integrate.naive import union_integrate
from ..integrate.outer_join import outer_join_integrate
from ..lake.catalog import Catalog
from ..lake.generator import DOMAIN_ATTRS, Lake, generate_lake, spec_for_sf

METHODS = {
    "alite_fd": full_disjunction,
    "outer_join": outer_join_integrate,
    "union": union_integrate,
}


def integration_set_of(lake: Lake, k: int, domain: str = "city_stats") -> list[str]:
    names = [n for n in lake.table_names() if lake.truth[n].domain == domain]
    if len(names) < k:
        raise ValueError(f"lake has only {len(names)} {domain} tables")
    return names[:k]


def run(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    ks: tuple[int, ...] = (2, 4, 8),
    seed: int = 7,
    lake: Lake | None = None,
) -> pd.DataFrame:
    """One row per (k, method)."""
    lake = lake or generate_lake(spec_for_sf(sf, seed=seed))
    catalog = Catalog.from_lake(spark, lake)
    rows = []
    for k in ks:
        names = integration_set_of(lake, k)
        frames = tag_tids(lake, catalog, names)
        alignment = align(frames, exclude=("TID",))
        aligned = alignment.apply(frames, keep=("TID",))
        dfs = [aligned[n] for n in names]
        gold = gold_facts_for(lake, names)
        tid_entity = tid_entities_for(lake, names)
        renames = iid_attr_map(lake, names, alignment)
        key_attr = DOMAIN_ATTRS["city_stats"][0]
        for method, fn in METHODS.items():
            t0 = time.perf_counter()
            out = fn(dfs, tid_col="TID")
            pdf = collect_integrated(out)
            elapsed = time.perf_counter() - t0
            scored = pdf.rename(columns=renames)
            cov = fact_coverage(scored, key_attr, gold)
            ent = entity_metrics(pdf, tid_entity)
            er = er_pair_metrics(pdf, tid_entity)
            value_cols = [c for c in pdf.columns if c != "_tids"]
            cells = len(pdf) * len(value_cols)
            nulls = int(pdf[value_cols].isna().sum().sum()) if cells else 0
            rows.append(
                {
                    "k_tables": k,
                    "method": method,
                    "tuples": len(pdf),
                    "completeness": round(1 - nulls / cells, 3) if cells else 0.0,
                    "fact_coverage": round(cov.mean_coverage, 3),
                    "complete_entities": round(cov.complete_entities, 3),
                    "fragmentation": round(ent.fragmentation, 2),
                    "er_f1": round(er.f1, 3),
                    "seconds": round(elapsed, 2),
                }
            )
    return pd.DataFrame(rows)
