"""Synthetic knowledge base (YAGO-lite) for SANTOS-style semantic search.

SANTOS annotates data-lake columns with semantic types and column *pairs*
with semantic relationships using an external KB (YAGO). We cannot ship
YAGO, so the KB here plays its role: it knows the same entity universe the
synthetic lake is drawn from (exactly as YAGO knows real-world entities the
real lake mentions), mapping normalized values to semantic types and typed
pairs to relationship names.

The KB is an artifact independent of any particular lake table — discovery
algorithms consult it, they never see generator ground truth.
"""
from __future__ import annotations

from dataclasses import dataclass

from ..util import normalize
from .vocab import Vocab


@dataclass(frozen=True)
class KnowledgeBase:
    """value -> semantic type, and (type, type) -> relationship name."""

    entity_types: dict[str, str]
    relationships: dict[tuple[str, str], str]

    def type_of(self, value: object) -> str | None:
        """Semantic type of a cell value, or None if unknown to the KB."""
        return self.entity_types.get(normalize(value))

    def relationship(self, type_a: str, type_b: str) -> str | None:
        """Relationship between two semantic types (order-insensitive)."""
        rel = self.relationships.get((type_a, type_b))
        if rel is None:
            rel = self.relationships.get((type_b, type_a))
        return rel


def build_kb(vocab: Vocab) -> KnowledgeBase:
    """Build the KB over a vocabulary's entity universe."""
    entity_types: dict[str, str] = {}
    for c in vocab.countries:
        entity_types[normalize(c)] = "country"
    for c in vocab.cities:
        # City names win ties with countries only if unseen; real KBs are
        # similarly ambiguous — majority voting at the column level absorbs it.
        entity_types.setdefault(normalize(c), "city")
    for v in vocab.vaccines:
        entity_types.setdefault(normalize(v), "vaccine")
    for a in vocab.agencies:
        entity_types.setdefault(normalize(a), "agency")

    relationships = {
        ("city", "country"): "locatedIn",
        ("vaccine", "country"): "originatesFrom",
        ("vaccine", "agency"): "approvedBy",
        ("country", "agency"): "regulatedBy",
    }
    return KnowledgeBase(entity_types=entity_types, relationships=relationships)
