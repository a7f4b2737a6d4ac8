"""Bench E5: downstream ER over FD vs baselines (variant-noise lake)."""
from conftest import run_once

from repro.experiments.e5_er import run


def test_bench_e5(benchmark, spark, bench_lake_noisy):
    table = run_once(benchmark, run, spark, lake=bench_lake_noisy, k=4)
    by = table.set_index("method")
    assert by.loc["alite_fd", "er_f1"] >= by.loc["union", "er_f1"]
    assert by.loc["alite_fd", "er_f1"] >= by.loc["outer_join", "er_f1"] - 1e-9
