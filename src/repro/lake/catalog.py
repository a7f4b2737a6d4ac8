"""Spark-facing catalog over a Parquet lake directory.

The generator writes ``<dir>/<table>.parquet`` plus ``ground_truth.json``;
the catalog is what the *pipeline* sees: it lists tables and serves them as
Spark DataFrames. It can also wrap an in-memory dict of pandas frames,
which keeps unit tests fast while exercising identical code paths.
"""
from __future__ import annotations

import json
import os

from pyspark.sql import DataFrame, SparkSession

from .generator import Lake, TableTruth


class Catalog:
    """Read-only view of a data lake as named Spark DataFrames."""

    def __init__(self, spark: SparkSession, frames: dict[str, DataFrame]):
        self._spark = spark
        self._frames = dict(frames)

    @classmethod
    def from_dir(cls, spark: SparkSession, lake_dir: str) -> "Catalog":
        """Open a Parquet lake directory written by ``Lake.write``."""
        frames: dict[str, DataFrame] = {}
        for entry in sorted(os.listdir(lake_dir)):
            if entry.endswith(".parquet"):
                name = entry[: -len(".parquet")]
                frames[name] = spark.read.parquet(os.path.join(lake_dir, entry))
        return cls(spark, frames)

    @classmethod
    def from_lake(cls, spark: SparkSession, lake: Lake) -> "Catalog":
        """Wrap an in-memory generated lake (tests / small runs)."""
        return cls(
            spark,
            {n: spark.createDataFrame(pdf) for n, pdf in lake.frames.items()},
        )

    def table_names(self) -> list[str]:
        return sorted(self._frames)

    def table(self, name: str) -> DataFrame:
        return self._frames[name]

    def __contains__(self, name: str) -> bool:
        return name in self._frames

    def __len__(self) -> int:
        return len(self._frames)


def load_ground_truth(lake_dir: str) -> dict[str, TableTruth]:
    """Load the ground-truth sidecar of a written lake (evaluation only —
    discovery/align algorithms must never call this)."""
    with open(os.path.join(lake_dir, "ground_truth.json")) as f:
        raw = json.load(f)
    return {
        name: TableTruth(
            domain=t["domain"],
            columns=t["columns"],
            entities=t["entities"],
            n_rows=t["n_rows"],
        )
        for name, t in raw["tables"].items()
    }
