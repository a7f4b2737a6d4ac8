"""Benchmark fixtures: SF=0.1 lakes shared across benchmark modules.

Benchmarks exercise the same harnesses as jobs/, one per table in
EXPERIMENTS.md, at the benchmark scale factor (~100 MB-regime lake:
40 tables over 2000 cities). Each harness runs once per benchmark round
(these are multi-second Spark pipelines, not microseconds).
"""
import os
import sys

import pytest

sys.path.insert(0, os.path.dirname(os.path.dirname(__file__)))

from repro.lake.generator import generate_lake, spec_for_sf  # noqa: E402

BENCH_SF = float(os.environ.get("BENCH_SF", "0.1"))


@pytest.fixture(scope="session")
def bench_lake():
    return generate_lake(spec_for_sf(BENCH_SF, seed=7))


@pytest.fixture(scope="session")
def bench_lake_noisy():
    return generate_lake(spec_for_sf(BENCH_SF, seed=11, variant_noise=0.15))


def run_once(benchmark, fn, *args, **kwargs):
    """Run a harness once under pytest-benchmark timing."""
    return benchmark.pedantic(fn, args=args, kwargs=kwargs,
                              rounds=1, iterations=1, warmup_rounds=0)
