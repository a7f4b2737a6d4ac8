"""Bench E3: LSH Ensemble vs exact containment at SF=0.1."""
from conftest import run_once

from repro.experiments.e3_lshe import run


def test_bench_e3(benchmark, spark, bench_lake):
    table = run_once(benchmark, run, spark, lake=bench_lake,
                     thresholds=(0.5, 0.7))
    assert (table["candidate_recall"] >= 0.7).all(), table
