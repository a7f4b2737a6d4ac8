"""Bench E4: holistic schema matching over the SF=0.1 lake."""
from conftest import run_once

from repro.experiments.e4_align import run


def test_bench_e4(benchmark, spark, bench_lake):
    table = run_once(benchmark, run, spark, lake=bench_lake,
                     thresholds=(0.15, 0.25, 0.4))
    mid = table[table["threshold"] == 0.25].iloc[0]
    assert mid["precision"] >= 0.85, table
    assert mid["recall"] >= 0.6, table
