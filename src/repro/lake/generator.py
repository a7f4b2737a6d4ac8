"""Synthetic open-data lake generator (the demo's data-lake substitute).

The DIALITE demo runs over a preprocessed lake of real open-data tables
about COVID-19. That corpus is not shippable, so this module generates a
lake with the same *shape*: every lake table is a projected, sampled,
header-perturbed, null-injected fragment of a hidden "universal" entity
table (cities with statistics; vaccines with approvals). This mirrors how
open-data portals publish many partial, inconsistently-headed views of the
same underlying facts — exactly the setting ALITE's align+FD targets.

Because we generate the lake, we also hold **ground truth** the real lake
lacks: the canonical attribute (= gold integration ID) behind every column,
each table's source domain and entity ids. Discovery/align quality tables
(E2–E5) are scored against this; discovery algorithms never read it.
"""
from __future__ import annotations

import json
import os
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from .kb import KnowledgeBase, build_kb
from .vocab import Vocab, build_vocab

# Canonical attributes per domain; the first entry is the key attribute.
DOMAIN_ATTRS = {
    "city_stats": [
        "city", "country", "vaccination_rate", "total_cases",
        "death_rate", "population", "hospitalized",
    ],
    "vaccine_info": ["vaccine", "country", "approver", "efficacy", "doses"],
}

# Plausible open-data header synonyms per canonical attribute (no spaces —
# Spark's parquet writer is strict about special characters).
SYNONYMS = {
    "city": ["city", "municipality", "urban_area", "place"],
    "country": ["country", "nation", "state_name"],
    "vaccination_rate": ["vaccination_rate", "vax_rate", "pct_vaccinated"],
    "total_cases": ["total_cases", "cases", "case_count", "confirmed"],
    "death_rate": ["death_rate", "deaths_per_100k", "mortality"],
    "population": ["population", "pop", "residents"],
    "hospitalized": ["hospitalized", "hosp_count", "admissions"],
    "vaccine": ["vaccine", "vaccine_name", "product"],
    "approver": ["approver", "agency", "regulator", "approved_by"],
    "efficacy": ["efficacy", "effectiveness", "eff_pct"],
    "doses": ["doses", "doses_administered", "shots"],
}

# Hand-curated name variants mirroring the paper's examples (JnJ vs J&J,
# USA vs United States); generated entities get typo/spacing/case variants.
SPECIAL_VARIANTS = {
    "USA": ["United States"],
    "JnJ": ["J&J"],
    "England": ["UK"],
}


@dataclass(frozen=True)
class LakeSpec:
    """Size/noise knobs for one lake instance. Deterministic in ``seed``."""

    n_tables: int
    n_cities: int
    n_countries: int
    n_vaccines: int
    null_rate: float = 0.12
    variant_noise: float = 0.0  # prob. an entity name is replaced by a variant
    seed: int = 0


def spec_for_sf(sf: float, *, seed: int = 0, variant_noise: float = 0.0) -> LakeSpec:
    """Lake sizing at a scale factor: SF=0.01 -> ~10 tables over ~200
    cities (unit tests); SF=0.1 -> ~40 tables over ~2000 cities (benches)."""
    n_cities = max(30, int(20_000 * sf))
    return LakeSpec(
        n_tables=max(8, int(400 * sf)),
        n_cities=n_cities,
        n_countries=max(10, min(120, n_cities // 40)),
        n_vaccines=max(8, int(200 * sf)),
        variant_noise=variant_noise,
        seed=seed,
    )


@dataclass(frozen=True)
class TableTruth:
    """Ground truth for one lake table."""

    domain: str
    columns: dict[str, str]  # actual header -> canonical attribute
    entities: list[str]  # key-entity ids of its rows (pre-noise names)
    n_rows: int


@dataclass
class Lake:
    """A generated lake: spec, vocab, KB, per-table frames and truth."""

    spec: LakeSpec
    vocab: Vocab
    kb: KnowledgeBase
    frames: dict[str, pd.DataFrame]
    truth: dict[str, TableTruth]
    universal: dict[str, pd.DataFrame] = field(default_factory=dict)

    def table_names(self) -> list[str]:
        return sorted(self.frames)

    def unionable(self, a: str, b: str, *, min_shared: int = 2) -> bool:
        """Gold unionability: same source domain and >=min_shared shared
        canonical attributes (the SANTOS-style notion of a unionable pair)."""
        ta, tb = self.truth[a], self.truth[b]
        if ta.domain != tb.domain:
            return False
        shared = set(ta.columns.values()) & set(tb.columns.values())
        return len(shared) >= min_shared

    def joinable(self, query: str, query_attr: str, b: str,
                 *, threshold: float = 0.5) -> bool:
        """Gold joinability: some column of ``b`` has the same canonical
        attribute and containment(query values, b values) >= threshold."""
        tq, tb = self.truth[query], self.truth[b]
        q_headers = [h for h, c in tq.columns.items() if c == query_attr]
        b_headers = [h for h, c in tb.columns.items() if c == query_attr]
        if not q_headers or not b_headers:
            return False
        qvals = set(self.frames[query][q_headers[0]].dropna().astype(str))
        if not qvals:
            return False
        bvals = set(self.frames[b][b_headers[0]].dropna().astype(str))
        return len(qvals & bvals) / len(qvals) >= threshold

    def write(self, out_dir: str) -> None:
        """Persist the lake as one Parquet directory per table plus a
        ``ground_truth.json`` sidecar (written with pandas/pyarrow so the
        lake can be built without a SparkSession; Spark reads it back)."""
        os.makedirs(out_dir, exist_ok=True)
        for name, pdf in self.frames.items():
            pdf.to_parquet(os.path.join(out_dir, f"{name}.parquet"), index=False)
        meta = {
            name: {
                "domain": t.domain,
                "columns": t.columns,
                "entities": t.entities,
                "n_rows": t.n_rows,
            }
            for name, t in self.truth.items()
        }
        with open(os.path.join(out_dir, "ground_truth.json"), "w") as f:
            json.dump({"spec": vars(self.spec), "tables": meta}, f)


def _universal_city_stats(vocab: Vocab, g: np.random.Generator) -> pd.DataFrame:
    n = len(vocab.cities)
    return pd.DataFrame(
        {
            "city": vocab.cities,
            "country": [vocab.city_country[c] for c in vocab.cities],
            "vaccination_rate": (g.uniform(30, 95, n)).round(1),
            "total_cases": g.integers(1_000, 5_000_000, n).astype("int64"),
            "death_rate": (g.uniform(50, 400, n)).round(0),
            "population": g.integers(100_000, 20_000_000, n).astype("int64"),
            "hospitalized": g.integers(100, 50_000, n).astype("int64"),
        }
    )


def _universal_vaccine_info(vocab: Vocab, g: np.random.Generator) -> pd.DataFrame:
    n = len(vocab.vaccines)
    return pd.DataFrame(
        {
            "vaccine": vocab.vaccines,
            "country": [vocab.vaccine_country[v] for v in vocab.vaccines],
            "approver": [vocab.vaccine_approver[v] for v in vocab.vaccines],
            # Two decimals (vs one for vaccination_rate): distinct reporting
            # precision, as in real sources — also keeps the two rate-valued
            # attributes' value spaces from colliding.
            "efficacy": (g.uniform(50, 95, n)).round(2),
            "doses": g.integers(100_000, 2_000_000_000, n).astype("int64"),
        }
    )


def _variant(name: str, g: np.random.Generator) -> str:
    """A plausible *recoverable* alternate surface form of a name.

    Special pairs reproduce the paper's cases (JnJ/J&J, USA/United
    States); everything else gets a single-character typo or spacing/
    punctuation change. Deliberately NOT a short prefix abbreviation:
    truncating distinct entities to 4 characters makes them collide
    exactly, which no entity resolver (ours or py_entitymatching) could
    ever undo — that would test the generator, not the ER engine.
    """
    if name in SPECIAL_VARIANTS:
        return str(g.choice(SPECIAL_VARIANTS[name]))
    if len(name) >= 6:
        style = int(g.integers(0, 3))
        mid = 2 + int(g.integers(0, len(name) - 4))
        if style == 0:  # single-character deletion
            return name[:mid] + name[mid + 1 :]
        if style == 1:  # hyphenation / spacing change
            return (name.replace(" ", "-") if " " in name
                    else name[:mid] + " " + name[mid:])
        return name.upper()  # case variant
    return name


def _headers(attrs: list[str], style: str, g: np.random.Generator) -> dict[str, str]:
    """canonical attr -> actual header under a per-table header style."""
    out: dict[str, str] = {}
    for i, a in enumerate(attrs):
        if style == "keep":
            out[a] = a
        elif style == "synonym":
            out[a] = str(g.choice(SYNONYMS[a]))
        else:  # garbled: the no-metadata regime ALITE is designed for
            out[a] = f"col_{i}"
    return out


def generate_lake(spec: LakeSpec) -> Lake:
    """Generate a lake instance. Pure pandas/numpy — Spark enters when the
    Parquet lake is read back through ``lake.catalog``."""
    g = np.random.default_rng(spec.seed)
    vocab = build_vocab(
        n_cities=spec.n_cities, n_countries=spec.n_countries,
        n_vaccines=spec.n_vaccines, seed=spec.seed,
    )
    universal = {
        "city_stats": _universal_city_stats(vocab, g),
        "vaccine_info": _universal_vaccine_info(vocab, g),
    }
    frames: dict[str, pd.DataFrame] = {}
    truth: dict[str, TableTruth] = {}
    for i in range(spec.n_tables):
        domain = "city_stats" if g.random() < 0.7 else "vaccine_info"
        base = universal[domain]
        attrs = DOMAIN_ATTRS[domain]
        key = attrs[0]
        # Column subset: always the key plus 1..all of the rest.
        others = list(attrs[1:])
        n_extra = int(g.integers(1, len(others) + 1))
        cols = [key] + list(g.choice(others, n_extra, replace=False))
        cols = [a for a in attrs if a in cols]  # canonical order
        # Row subset: 20%..80% of entities.
        frac = g.uniform(0.2, 0.8)
        idx = np.sort(g.choice(len(base), max(2, int(frac * len(base))), replace=False))
        sub = base.iloc[idx][cols].reset_index(drop=True)
        # Uniform numeric dtype across fragments: null injection would coerce
        # int64 -> float64 in some tables but not others, making the *string*
        # forms of the same fact diverge ("12" vs "12.0") and silently breaking
        # value-overlap matching and FD joins downstream.
        for col in sub.columns:
            if pd.api.types.is_numeric_dtype(sub[col]):
                sub[col] = sub[col].astype("float64")
        entities = sub[key].astype(str).tolist()
        # Entity-name variant noise (exercises downstream ER).
        if spec.variant_noise > 0:
            for col in sub.columns:
                if sub[col].dtype == object:
                    mask = g.random(len(sub)) < spec.variant_noise
                    sub.loc[mask, col] = [
                        _variant(v, g) for v in sub.loc[mask, col]
                    ]
        # Null injection on non-key columns ("missing nulls").
        for col in cols[1:]:
            mask = g.random(len(sub)) < spec.null_rate
            sub.loc[mask, col] = None
        # Header perturbation.
        style = str(g.choice(["keep", "synonym", "synonym", "garbled"]))
        hmap = _headers(cols, style, g)
        sub = sub.rename(columns=hmap)
        name = f"t{i:04d}_{domain}"
        frames[name] = sub
        truth[name] = TableTruth(
            domain=domain,
            columns={hmap[a]: a for a in cols},
            entities=entities,
            n_rows=len(sub),
        )
    return Lake(spec=spec, vocab=vocab, kb=build_kb(vocab),
                frames=frames, truth=truth, universal=universal)
