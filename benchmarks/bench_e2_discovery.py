"""Bench E2: SANTOS-lite + LSH Ensemble discovery at SF=0.1."""
from conftest import run_once

from repro.experiments.e2_discovery import run


def test_bench_e2(benchmark, spark, bench_lake):
    table = run_once(benchmark, run, spark, lake=bench_lake, ks=(3, 5))
    assert (table["precision_at_k"] >= 0.5).all(), table
    assert (table["recall_at_k"] >= 0.5).all(), table
