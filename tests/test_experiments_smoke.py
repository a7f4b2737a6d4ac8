"""Smoke tests for the experiment harnesses at a tiny scale factor —
the same code paths the E-table jobs and benchmarks run, so a harness
bug is caught here and not minutes into a benchmark. Shape assertions
mirror the claims recorded in EXPERIMENTS.md."""
import py_compile
import pathlib

import pytest

from repro.experiments.e1_integration import run as e1_run
from repro.experiments.e2_discovery import run as e2_run
from repro.experiments.e3_lshe import run as e3_run
from repro.experiments.e4_align import run as e4_run
from repro.experiments.e5_er import run as e5_run
from repro.lake.generator import generate_lake, spec_for_sf


@pytest.fixture(scope="module")
def tiny_lake():
    return generate_lake(spec_for_sf(0.005, seed=7))


class TestE1:
    def test_shape_and_claims(self, spark, tiny_lake):
        t = e1_run(spark, lake=tiny_lake, ks=(2, 3))
        assert set(t["method"]) == {"alite_fd", "outer_join", "union"}
        assert len(t) == 6
        fd = t[t.method == "alite_fd"].set_index("k_tables")
        un = t[t.method == "union"].set_index("k_tables")
        for k in (2, 3):
            assert fd.loc[k, "fact_coverage"] >= un.loc[k, "fact_coverage"]


class TestE2:
    def test_shape(self, spark, tiny_lake):
        t = e2_run(spark, lake=tiny_lake, ks=(2,), n_queries=2)
        assert set(t["algorithm"]) == {"santos", "lsh_ensemble"}
        assert ((t["precision_at_k"] >= 0) & (t["precision_at_k"] <= 1)).all()


class TestE3:
    def test_shape(self, spark, tiny_lake):
        t = e3_run(spark, lake=tiny_lake, thresholds=(0.5,), n_queries=2)
        assert list(t["containment_t"]) == [0.5]
        assert (t["candidate_recall"] >= 0.5).all()


class TestE4:
    def test_shape(self, spark, tiny_lake):
        t = e4_run(spark, lake=tiny_lake, thresholds=(0.25,))
        row = t.iloc[0]
        assert row["n_columns"] > 0
        assert 0 <= row["f1"] <= 1
        assert row["precision"] >= 0.8


class TestE5:
    def test_shape(self, spark):
        lake = generate_lake(
            spec_for_sf(0.005, seed=11, variant_noise=0.15)
        )
        t = e5_run(spark, lake=lake, k=3)
        by = t.set_index("method")
        assert by.loc["alite_fd", "er_f1"] >= by.loc["union", "er_f1"] - 1e-9


class TestJobsCompile:
    """Every spark-submit entrypoint must at least be valid Python."""

    @pytest.mark.parametrize(
        "job",
        sorted(
            p.name
            for p in (pathlib.Path(__file__).parent.parent / "jobs").glob("*.py")
        ),
    )
    def test_compiles(self, job):
        path = pathlib.Path(__file__).parent.parent / "jobs" / job
        py_compile.compile(str(path), doraise=True)
