"""Shared fixtures: path setup and a small session-scoped test lake."""
import os
import sys

import pytest

sys.path.insert(0, os.path.dirname(__file__))

from repro.lake.catalog import Catalog  # noqa: E402
from repro.lake.generator import generate_lake, spec_for_sf  # noqa: E402


@pytest.fixture(scope="session")
def small_lake():
    """SF=0.01 lake: 8 tables over 200 cities / 8 vaccines (seed 42)."""
    return generate_lake(spec_for_sf(0.01, seed=42))


@pytest.fixture(scope="session")
def small_catalog(spark, small_lake):
    return Catalog.from_lake(spark, small_lake)
