"""Query-table generation from a prompt (the demo's GPT-3 substitute).

DIALITE lets users without a query table generate one from a natural-
language prompt via GPT-3 (Fig. 5 shows a generated COVID-19 cases
table). No language model is available offline, so this module maps
prompt keywords onto deterministic templates over the same vocabularies
the lake is drawn from — exercising the identical pipeline entry point
(prompt in, plausible in-domain query table out), seeded by the prompt
text so equal prompts give equal tables.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..lake.vocab import Vocab, build_vocab
from ..util import stable_hash


def _cases_table(vocab: Vocab, g: np.random.Generator, rows: int) -> pd.DataFrame:
    """Fig. 5's shape: country-level COVID case statistics."""
    countries = list(
        g.choice(vocab.countries, min(rows, len(vocab.countries)), replace=False)
    )
    cases = g.integers(100_000, 6_000_000, len(countries))
    deaths = (cases * g.uniform(0.01, 0.05, len(countries))).astype("int64")
    recovered = (cases * g.uniform(0.4, 0.8, len(countries))).astype("int64")
    return pd.DataFrame(
        {
            "Country": countries,
            "Cases": cases.astype("int64"),
            "Deaths": deaths,
            "Recovered": recovered,
            "Active": (cases - deaths - recovered).astype("int64"),
        }
    )


def _city_table(vocab: Vocab, g: np.random.Generator, rows: int) -> pd.DataFrame:
    cities = list(
        g.choice(vocab.cities, min(rows, len(vocab.cities)), replace=False)
    )
    return pd.DataFrame(
        {
            "City": cities,
            "Country": [vocab.city_country[c] for c in cities],
            "Vaccination_Rate": [
                f"{int(v)}%" for v in g.uniform(30, 95, len(cities))
            ],
        }
    )


def _vaccine_table(vocab: Vocab, g: np.random.Generator, rows: int) -> pd.DataFrame:
    vaccines = list(
        g.choice(vocab.vaccines, min(rows, len(vocab.vaccines)), replace=False)
    )
    return pd.DataFrame(
        {
            "Vaccine": vaccines,
            "Country": [vocab.vaccine_country[v] for v in vaccines],
            "Approver": [vocab.vaccine_approver[v] for v in vaccines],
        }
    )


def randomly_generate_query_table(
    spark: SparkSession,
    prompt: str,
    *,
    rows: int = 5,
    vocab: Vocab | None = None,
) -> DataFrame:
    """Generate a query table from a prompt (``dialite.randomly_generate_
    query_table`` in the demo). Template choice keys off prompt keywords;
    content is seeded by the prompt text."""
    vocab = vocab or build_vocab()
    g = np.random.default_rng(stable_hash(prompt))
    # Whole-word keyword routing ("generate" must not trigger "rate").
    words = set(prompt.lower().split())
    if words & {"vaccine", "vaccines", "approval", "approvals", "approver"}:
        pdf = _vaccine_table(vocab, g, rows)
    elif words & {"city", "cities", "rate", "rates", "vaccination"}:
        pdf = _city_table(vocab, g, rows)
    else:
        pdf = _cases_table(vocab, g, rows)
    return spark.createDataFrame(pdf)
