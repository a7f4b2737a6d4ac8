"""The DIALITE pipeline: Discover -> Align & Integrate -> Analyze.

This is the paper's contribution: a flexible end-to-end system gluing
table discovery (SANTOS, LSH Ensemble, user plugins), ALITE integration
(holistic schema matching + FD; outer join and naive baselines as
alternatives) and downstream analysis (aggregates, correlation, ER) over
an open-data lake, with user-extensible registries at every stage
(Sec. 3.2).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..align.schema_matching import Alignment, align
from ..analyze import aggregates
from ..analyze.er import resolve
from ..discovery.base import DiscoveryAlgorithm, PairwiseDiscovery, ScoredTable
from ..integrate.fd import full_disjunction
from ..integrate.naive import inner_join_integrate, union_integrate
from ..integrate.outer_join import outer_join_integrate
from ..lake.catalog import Catalog
from .registry import Registry

Integrator = Callable[[list[DataFrame]], DataFrame]


@dataclass
class IntegrationResult:
    """Output of the Align & Integrate stage."""

    table: DataFrame  # integrated table (value columns + _tids)
    alignment: Alignment
    sources: list[str]  # table names, in integration order
    method: str

    @property
    def value_columns(self) -> list[str]:
        return [c for c in self.table.columns if c != "_tids"]


@dataclass
class DiscoveryOutcome:
    """Union of all discovery algorithms' results (Sec. 3.1: 'we persist
    the set of tables found by all techniques')."""

    per_algorithm: dict[str, list[ScoredTable]]
    integration_set: list[str] = field(default_factory=list)


class DIALITE:
    """The demo system. One instance per (session, lake)."""

    def __init__(self, spark: SparkSession, catalog: Catalog):
        self.spark = spark
        self.catalog = catalog
        self.discovery: Registry[DiscoveryAlgorithm] = Registry("discovery algorithm")
        self.integrators: Registry[Integrator] = Registry("integration operator")
        self.analyzers: Registry[Callable] = Registry("analysis")
        # Default integration operators (ALITE is the paper's default).
        self.integrators.register("alite", full_disjunction)
        self.integrators.register("outer_join", outer_join_integrate)
        self.integrators.register("inner_join", inner_join_integrate)
        self.integrators.register("union", union_integrate)
        # Default analyses (Sec. 2.3).
        self.analyzers.register("correlation", aggregates.correlation)
        self.analyzers.register("extremes", aggregates.extremes)
        self.analyzers.register("aggregate", aggregates.aggregate)
        self.analyzers.register("completeness", aggregates.completeness)
        self.analyzers.register("entity_resolution", resolve)

    # -- Discover ----------------------------------------------------------

    def register_discovery(
        self, algo: DiscoveryAlgorithm, *, build: bool = True
    ) -> DiscoveryAlgorithm:
        """Add a discovery algorithm (and build its offline index)."""
        self.discovery.register(algo.name, algo)
        if build:
            algo.build_index(self.catalog)
        return algo

    def register_pairwise_discovery(
        self, name: str, sim: Callable[[pd.DataFrame, pd.DataFrame], float]
    ) -> DiscoveryAlgorithm:
        """The Fig. 4 extensibility path: lift a user similarity function
        over pandas frames into a discovery algorithm."""
        return self.register_discovery(PairwiseDiscovery(name, sim))

    def discover(
        self,
        query: DataFrame,
        query_col: str,
        *,
        k: int = 5,
        algorithms: list[str] | None = None,
    ) -> DiscoveryOutcome:
        """Run the chosen (default: all) discovery algorithms and union
        their result sets into the integration set."""
        names = algorithms if algorithms is not None else self.discovery.names()
        per_algorithm = {
            name: self.discovery.get(name).search(query, query_col, k)
            for name in names
        }
        seen: dict[str, None] = {}
        for name in names:
            for hit in per_algorithm[name]:
                seen.setdefault(hit.table, None)
        return DiscoveryOutcome(
            per_algorithm=per_algorithm, integration_set=list(seen)
        )

    # -- Align & Integrate -------------------------------------------------

    def integrate(
        self,
        tables: list[str] | dict[str, DataFrame],
        *,
        query: DataFrame | None = None,
        method: str = "alite",
        threshold: float | None = None,
    ) -> IntegrationResult:
        """ALITE (or an alternative operator) over an integration set.

        ``tables`` is either lake-table names (the discovery output) or a
        user-provided dict of frames (the traditional given-integration-
        set scenario, Sec. 2.2). The query table joins the set if given.
        """
        if isinstance(tables, dict):
            frames = dict(tables)
        else:
            frames = {name: self.catalog.table(name) for name in tables}
        if query is not None:
            frames = {"_query": query, **frames}
        kwargs = {} if threshold is None else {"threshold": threshold}
        alignment = align(frames, **kwargs)
        aligned = alignment.apply(frames)
        names = list(aligned)
        integrated = self.integrators.get(method)(
            [aligned[n] for n in names]
        )
        return IntegrationResult(
            table=integrated,
            alignment=alignment,
            sources=names,
            method=method,
        )

    # -- Analyze -----------------------------------------------------------

    def analyze(self, task: str, table: DataFrame, *args, **kwargs):
        """Apply a registered downstream analysis to an integrated table
        (which the user may also have uploaded directly)."""
        return self.analyzers.get(task)(table, *args, **kwargs)

    # -- End to end --------------------------------------------------------

    def run(
        self,
        query: DataFrame,
        query_col: str,
        *,
        k: int = 5,
        method: str = "alite",
        algorithms: list[str] | None = None,
    ) -> tuple[DiscoveryOutcome, IntegrationResult]:
        """Full pipeline: discover, then align & integrate (the Analyze
        stage is interactive — call :meth:`analyze` on the result)."""
        outcome = self.discover(
            query, query_col, k=k, algorithms=algorithms
        )
        result = self.integrate(
            outcome.integration_set, query=query, method=method
        )
        return outcome, result
