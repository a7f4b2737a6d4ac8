"""Bench T-Fig8: outer join vs FD vs ER-over-each on the paper tables."""
from conftest import run_once

from repro.experiments.paper_figs import fig8


def test_bench_fig8(benchmark, spark):
    panels = run_once(benchmark, fig8, spark)
    assert len(panels["fig8a_outer_join"]) == 5
    assert len(panels["fig8b_fd"]) == 3
    assert len(panels["fig8d_er_over_fd"]) == 2
