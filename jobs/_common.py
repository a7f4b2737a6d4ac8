"""Shared CLI plumbing for spark-submit job entrypoints."""
from __future__ import annotations

import argparse

import pandas as pd
from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    """The job's SparkSession (mirrors conftest.py's settings; under
    spark-submit, master/memory come from the submit command line)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def argparser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--sf", type=float, default=0.01,
                   help="lake scale factor (0.01 test, 0.1 bench)")
    p.add_argument("--seed", type=int, default=7)
    return p


def print_table(title: str, pdf: pd.DataFrame) -> None:
    print(f"\n== {title} ==")
    with pd.option_context(
        "display.width", 200, "display.max_columns", 50,
        "display.max_rows", 200,
    ):
        print(pdf.to_string(index=False))
