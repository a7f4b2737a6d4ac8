"""Bench T-Ex3: analytics (extremes + correlations) over Fig. 3."""
from conftest import run_once

from repro.experiments.paper_figs import ex3


def test_bench_ex3(benchmark, spark):
    table = run_once(benchmark, ex3, spark)
    by_q = dict(zip(table["quantity"], table["measured"]))
    assert by_q["corr(vaccination, death rate)"] == 0.16
    assert by_q["corr(cases, vaccination)"] == 0.90
