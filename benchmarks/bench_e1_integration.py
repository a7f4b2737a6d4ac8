"""Bench E1: FD vs outer join vs union over SF=0.1 integration sets."""
from conftest import run_once

from repro.experiments.e1_integration import run


def test_bench_e1(benchmark, spark, bench_lake):
    table = run_once(benchmark, run, spark, lake=bench_lake, ks=(2, 4, 8))
    fd = table[table["method"] == "alite_fd"].set_index("k_tables")
    oj = table[table["method"] == "outer_join"].set_index("k_tables")
    un = table[table["method"] == "union"].set_index("k_tables")
    for k in (2, 4, 8):
        assert fd.loc[k, "fact_coverage"] >= un.loc[k, "fact_coverage"]
        assert fd.loc[k, "er_f1"] >= un.loc[k, "er_f1"]
        assert oj.loc[k, "tuples"] >= fd.loc[k, "tuples"]
