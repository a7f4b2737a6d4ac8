"""Experiment harnesses — one module per table in EXPERIMENTS.md.

Each harness is a ``run(spark, ...) -> pandas.DataFrame`` returning
exactly the rows the table reports; ``jobs/`` wraps them for
spark-submit and ``benchmarks/`` wraps them for pytest-benchmark.
"""
