"""Deterministic COVID-domain vocabularies for the synthetic open-data lake.

The demo paper's data lake is real open data about COVID-19 (cities,
countries, vaccination rates, vaccines, approval agencies). We rebuild the
same *domain* synthetically: a seed list of real-world names (so the paper's
own examples — Berlin, USA, J&J, FDA — are in-vocabulary) extended with
generated names so the lake scales with the scale factor.

Every function is pure in ``(n, seed)`` so generators, the knowledge base
and ground truth all agree on the entity universe.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

_SEED_COUNTRIES = [
    "Germany", "England", "Spain", "Canada", "Mexico", "USA", "India",
    "Brazil", "Russia", "France", "Italy", "Japan", "China", "Australia",
    "Norway", "Sweden", "Kenya", "Egypt", "Chile", "Peru",
]

_SEED_CITIES = [
    ("Berlin", "Germany"), ("Manchester", "England"), ("Barcelona", "Spain"),
    ("Toronto", "Canada"), ("Mexico City", "Mexico"), ("Boston", "USA"),
    ("New Delhi", "India"), ("Sao Paulo", "Brazil"), ("Moscow", "Russia"),
    ("Paris", "France"), ("Rome", "Italy"), ("Tokyo", "Japan"),
    ("Shanghai", "China"), ("Sydney", "Australia"), ("Oslo", "Norway"),
    ("Stockholm", "Sweden"), ("Nairobi", "Kenya"), ("Cairo", "Egypt"),
    ("Santiago", "Chile"), ("Lima", "Peru"),
]

_SEED_VACCINES = [
    ("Pfizer", "USA", "FDA"), ("JnJ", "USA", "FDA"),
    ("Moderna", "USA", "FDA"), ("AstraZeneca", "England", "MHRA"),
    ("Sputnik V", "Russia", "RDIF"), ("Sinovac", "China", "NMPA"),
    ("Covaxin", "India", "CDSCO"), ("Novavax", "USA", "FDA"),
]

_SEED_AGENCIES = ["FDA", "MHRA", "EMA", "RDIF", "NMPA", "CDSCO", "PMDA", "TGA"]


@dataclass(frozen=True)
class Vocab:
    """The entity universe of one lake instance."""

    countries: list[str]
    cities: list[str]
    city_country: dict[str, str]
    vaccines: list[str]
    vaccine_country: dict[str, str]
    vaccine_approver: dict[str, str]
    agencies: list[str] = field(default_factory=lambda: list(_SEED_AGENCIES))


def build_vocab(*, n_cities: int = 200, n_countries: int = 40,
                n_vaccines: int = 12, seed: int = 0) -> Vocab:
    """Build a vocabulary with ``n_*`` entities, seeded with the paper's
    real names and padded with generated names ('Fooburg', 'Bazland')."""
    g = np.random.default_rng(seed)
    syllables = ["ka", "lo", "ri", "ve", "no", "ta", "mi", "su", "pa", "del",
                 "gra", "zen", "bor", "fal", "qui", "ner", "os", "wi", "chu",
                 "bre", "han", "tol", "yev", "mar"]

    def _coin(suffix: str) -> str:
        # 3-4 syllables: long enough that two random names are rarely
        # edit-similar (entity resolution must not be defeated by the
        # vocabulary itself accidentally generating near-duplicates).
        k = int(g.integers(3, 5))
        stem = "".join(g.choice(syllables, k))
        return stem.capitalize() + suffix

    countries = list(_SEED_COUNTRIES)[:n_countries]
    while len(countries) < n_countries:
        c = _coin("land")
        if c not in countries:
            countries.append(c)

    cities: list[str] = []
    city_country: dict[str, str] = {}
    for city, country in _SEED_CITIES[: min(n_cities, len(_SEED_CITIES))]:
        if country in countries:
            cities.append(city)
            city_country[city] = country
    while len(cities) < n_cities:
        c = _coin(str(g.choice(["ville", "burg", " City", "ton"])))
        if c not in city_country:
            cities.append(c)
            city_country[c] = countries[int(g.integers(0, len(countries)))]

    vaccines: list[str] = []
    vaccine_country: dict[str, str] = {}
    vaccine_approver: dict[str, str] = {}
    for v, country, agency in _SEED_VACCINES[: min(n_vaccines, len(_SEED_VACCINES))]:
        if country in countries:
            vaccines.append(v)
            vaccine_country[v] = country
            vaccine_approver[v] = agency
    while len(vaccines) < n_vaccines:
        v = _coin(str(g.choice(["vax", "gen", "shield"])))
        if v not in vaccine_country:
            vaccines.append(v)
            vaccine_country[v] = countries[int(g.integers(0, len(countries)))]
            vaccine_approver[v] = _SEED_AGENCIES[int(g.integers(0, len(_SEED_AGENCIES)))]

    return Vocab(
        countries=countries,
        cities=cities,
        city_country=city_country,
        vaccines=vaccines,
        vaccine_country=vaccine_country,
        vaccine_approver=vaccine_approver,
    )
