"""Shared test helpers."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from repro.integrate.outer_union import TIDS


def integrated_to_pandas(df: DataFrame) -> pd.DataFrame:
    """Collect an integrated table (with ``_tids``) into a canonical
    pandas frame: tids as sorted comma-joined string column named
    ``tids``, rows sorted by all columns."""
    pdf = df.toPandas()
    pdf["tids"] = pdf[TIDS].map(lambda a: ",".join(sorted(a)))
    pdf = pdf.drop(columns=[TIDS])
    cols = list(pdf.columns)
    return (
        pdf.sort_values(cols, na_position="last")
        .reset_index(drop=True)[cols]
    )


def canon(pdf: pd.DataFrame) -> pd.DataFrame:
    """Sort rows/reset index for order-insensitive comparison."""
    cols = list(pdf.columns)
    return pdf.sort_values(cols, na_position="last").reset_index(drop=True)


def assert_frames_equal(got: pd.DataFrame, expected: pd.DataFrame) -> None:
    got = canon(got[sorted(got.columns)])
    expected = canon(expected[sorted(expected.columns)])
    pd.testing.assert_frame_equal(got, expected, check_dtype=False)
