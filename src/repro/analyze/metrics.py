"""Quality metrics for comparing integration operators (tables E1/E5).

The demo argues FD's value qualitatively (Figs. 3, 8); these metrics
quantify the same claims on the synthetic lake where ground truth is
known:

- **fact coverage** — per key entity, how much of the information
  scattered across the integration set ends up co-located in a single
  integrated tuple (FD's maximal-connection guarantee);
- **entity purity / fragmentation** — provenance-based: whether output
  tuples mix entities (purity) and how many output tuples an entity is
  split across (fragmentation; outer join / union fragment more);
- **ER pairwise precision/recall** — tid pairs co-located in an output
  tuple vs gold same-entity pairs, scoring downstream ER over each
  integration result (the paper's Example 5 claim).

Metrics run on *collected* output (driver-side pandas): integrated demo
tables are orders of magnitude smaller than the lake, and scoring needs
random access to provenance sets.
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import combinations

import pandas as pd
from pyspark.sql import DataFrame

from ..integrate.outer_union import TIDS


def collect_integrated(df: DataFrame) -> pd.DataFrame:
    """Collect an integrated table, tids as python lists."""
    pdf = df.toPandas()
    if TIDS in pdf.columns:
        pdf[TIDS] = pdf[TIDS].map(list)
    return pdf


@dataclass(frozen=True)
class CoverageReport:
    mean_coverage: float  # avg over entities of best-tuple fact coverage
    complete_entities: float  # fraction of entities with coverage == 1
    n_entities: int
    n_tuples: int


def fact_coverage(
    pdf: pd.DataFrame, key_col: str, gold: dict[str, dict[str, object]]
) -> CoverageReport:
    """``gold``: entity -> {attr: value} of all facts the integration set
    holds about it (the unified view FD aims to produce). Coverage of an
    entity is the best single output tuple's share of those facts."""
    attrs = {a for facts in gold.values() for a in facts}
    cols = [c for c in pdf.columns if c in attrs or c == key_col]
    best: dict[str, float] = {e: 0.0 for e in gold}
    for _, row in pdf.iterrows():
        e = row.get(key_col)
        if e is None or pd.isna(e) or e not in gold:
            continue
        facts = gold[e]
        if not facts:
            continue
        hit = sum(
            1
            for a, v in facts.items()
            if a in pdf.columns
            and row[a] is not None
            and not pd.isna(row[a])
            and str(row[a]) == str(v)
        )
        best[e] = max(best[e], hit / len(facts))
    n = len(best)
    if n == 0:
        return CoverageReport(0.0, 0.0, 0, len(pdf))
    mean = sum(best.values()) / n
    complete = sum(1 for v in best.values() if v >= 0.999) / n
    return CoverageReport(mean, complete, n, len(pdf))


@dataclass(frozen=True)
class EntityReport:
    purity: float  # fraction of tuples whose tids are single-entity
    fragmentation: float  # avg number of output tuples touching an entity


def entity_metrics(
    pdf: pd.DataFrame, tid_entity: dict[str, str]
) -> EntityReport:
    """Provenance-based purity/fragmentation given tid -> gold entity."""
    if TIDS not in pdf.columns or len(pdf) == 0:
        return EntityReport(1.0, 0.0)
    pure = 0
    touch: dict[str, int] = {}
    for tids in pdf[TIDS]:
        ents = {tid_entity[t] for t in tids if t in tid_entity}
        if len(ents) <= 1:
            pure += 1
        for e in ents:
            touch[e] = touch.get(e, 0) + 1
    frag = sum(touch.values()) / len(touch) if touch else 0.0
    return EntityReport(pure / len(pdf), frag)


@dataclass(frozen=True)
class PairReport:
    precision: float
    recall: float
    f1: float
    n_pred: int
    n_gold: int


def er_pair_metrics(
    pdf: pd.DataFrame, tid_entity: dict[str, str]
) -> PairReport:
    """Pairwise ER quality: predicted-same = two tids co-located in an
    output tuple; gold-same = same entity (over tids known to gold)."""
    pred: set[tuple[str, str]] = set()
    seen_tids: set[str] = set()
    for tids in pdf.get(TIDS, []):
        known = sorted(t for t in tids if t in tid_entity)
        seen_tids.update(known)
        pred.update(combinations(known, 2))
    by_entity: dict[str, list[str]] = {}
    for t in seen_tids:
        by_entity.setdefault(tid_entity[t], []).append(t)
    gold: set[tuple[str, str]] = set()
    for ts in by_entity.values():
        gold.update(combinations(sorted(ts), 2))
    tp = len(pred & gold)
    p = tp / len(pred) if pred else 1.0
    r = tp / len(gold) if gold else 1.0
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return PairReport(p, r, f1, len(pred), len(gold))


def gold_facts_for(
    lake, table_names: list[str]
) -> dict[str, dict[str, object]]:
    """The unified view the integration set holds: entity -> {canonical
    attr: value} over every non-null cell of the chosen tables (from lake
    ground truth; evaluation only)."""
    gold: dict[str, dict[str, object]] = {}
    for name in table_names:
        t = lake.truth[name]
        pdf = lake.frames[name]
        from ..lake.generator import DOMAIN_ATTRS

        key_attr = DOMAIN_ATTRS[t.domain][0]
        key_header = [h for h, a in t.columns.items() if a == key_attr][0]
        for _, row in pdf.iterrows():
            e = row[key_header]
            if e is None or pd.isna(e):
                continue
            e = str(e)
            for header, attr in t.columns.items():
                v = row[header]
                if v is None or pd.isna(v):
                    continue
                gold.setdefault(e, {})[attr] = str(v)
    return gold


def tid_entities_for(lake, table_names: list[str]) -> dict[str, str]:
    """tid -> entity for inputs tagged ``<table>:<row>`` (see
    ``tag_tids``)."""
    out = {}
    for name in table_names:
        for i, e in enumerate(lake.truth[name].entities):
            out[f"{name}:{i}"] = e
    return out


def iid_attr_map(lake, table_names: list[str], alignment) -> dict[str, str]:
    """integration ID -> canonical attribute, by majority vote of cluster
    members' gold attributes (evaluation only: lets metrics name output
    columns canonically even when the matcher chose a garbled header as
    the cluster's display name)."""
    votes: dict[str, dict[str, int]] = {}
    for name in table_names:
        for header, attr in lake.truth[name].columns.items():
            iid = alignment.assignments.get((name, header))
            if iid is None:
                continue
            votes.setdefault(iid, {}).setdefault(attr, 0)
            votes[iid][attr] += 1
    winner = {
        iid: max(v.items(), key=lambda kv: (kv[1], kv[0]))[0]
        for iid, v in votes.items()
    }
    # If the matcher split one gold attribute across several iids, rename
    # only the best-supported iid: duplicate column labels would corrupt
    # pandas row access during scoring. Facts in the losing iid columns
    # simply stay uncounted — conservative and identical for all methods.
    best_for_attr: dict[str, tuple[int, str]] = {}
    for iid, attr in winner.items():
        support = votes[iid][attr]
        if attr not in best_for_attr or support > best_for_attr[attr][0]:
            best_for_attr[attr] = (support, iid)
    return {
        iid: attr
        for iid, attr in winner.items()
        if best_for_attr[attr][1] == iid
    }


def tag_tids(lake, catalog, table_names: list[str]) -> dict[str, DataFrame]:
    """Integration inputs with an explicit TID column ``<table>:<row>``
    aligned with lake ground-truth row order (pandas row order is
    preserved through createDataFrame at these sizes)."""
    import pyspark.sql.functions as F

    out = {}
    for name in table_names:
        pdf = lake.frames[name].copy()
        pdf.insert(0, "TID", [f"{name}:{i}" for i in range(len(pdf))])
        out[name] = catalog.table(name).sparkSession.createDataFrame(pdf)
        out[name] = out[name].select(
            "TID", *[F.col(c) for c in out[name].columns if c != "TID"]
        )
    return out
