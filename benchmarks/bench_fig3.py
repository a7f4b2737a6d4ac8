"""Bench T-Fig3: the full ALITE path (align + FD) on the paper tables."""
from conftest import run_once

from repro.experiments.paper_figs import fig3


def test_bench_fig3(benchmark, spark):
    ours, paper, _ = run_once(benchmark, fig3, spark)
    assert len(ours) == len(paper) == 7
