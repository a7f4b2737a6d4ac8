"""The paper's worked-example tables, verbatim from Figs. 2, 3, 7 and 8.

These are the demo paper's "evaluation tables": T1–T3 (COVID cases per
city) with the expected ALITE/FD result of Fig. 3, and T4–T6 (vaccine
approvals) with the expected outer-join (Fig. 8a) and FD (Fig. 8b)
results. ``TID`` columns are the paper's tuple identifiers — provenance,
not data; the integrators consume them via ``tid_col="TID"``.

Nulls: ``None`` here stands for the paper's ± (missing-in-input) cells;
expected outputs use ``None`` for both ± and ⊥ (they are both SQL nulls —
``fd.annotate_null_kinds`` reconstructs the distinction for display).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
import pyspark.sql.types as T


def _spark_df(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    schema = T.StructType(
        [T.StructField(c, T.StringType()) for c in pdf.columns]
    )
    return spark.createDataFrame(pdf, schema=schema)


# --- Fig. 2: COVID-19 cases -------------------------------------------------

def t1(spark: SparkSession) -> DataFrame:
    """Query table: vaccination rates of European cities."""
    return _spark_df(spark, pd.DataFrame(
        {
            "TID": ["t1", "t2", "t3"],
            "Country": ["Germany", "England", "Spain"],
            "City": ["Berlin", "Manchester", "Barcelona"],
            "Vaccination_Rate": ["63%", "78%", "82%"],
        }
    ))


def t2(spark: SparkSession) -> DataFrame:
    """Unionable table retrieved by SANTOS (Americas cities; t5 has a
    missing vaccination rate)."""
    return _spark_df(spark, pd.DataFrame(
        {
            "TID": ["t4", "t5", "t6"],
            "Country": ["Canada", "Mexico", "USA"],
            "City": ["Toronto", "Mexico City", "Boston"],
            "Vaccination_Rate": ["83%", None, "62%"],
        }
    ))


def t3(spark: SparkSession) -> DataFrame:
    """Joinable table retrieved by LSH Ensemble (cases/death rates)."""
    return _spark_df(spark, pd.DataFrame(
        {
            "TID": ["t7", "t8", "t9", "t10"],
            "City": ["Berlin", "Barcelona", "Boston", "New Delhi"],
            "Total_Cases": ["1.4M", "2.68M", "263k", "2M"],
            "Death_Rate": ["147", "275", "335", "158"],
        }
    ))


def fig3_expected() -> pd.DataFrame:
    """FD(T1, T2, T3) exactly as printed in Fig. 3 (tids as sorted
    comma-joined sets; None for both null kinds)."""
    return pd.DataFrame(
        [
            ("Germany", "Berlin", "63%", "1.4M", "147", "t1,t7"),
            ("England", "Manchester", "78%", None, None, "t2"),
            ("Spain", "Barcelona", "82%", "2.68M", "275", "t3,t8"),
            ("Canada", "Toronto", "83%", None, None, "t4"),
            ("Mexico", "Mexico City", None, None, None, "t5"),
            ("USA", "Boston", "62%", "263k", "335", "t6,t9"),
            (None, "New Delhi", None, "2M", "158", "t10"),
        ],
        columns=[
            "Country", "City", "Vaccination_Rate",
            "Total_Cases", "Death_Rate", "tids",
        ],
    )


# --- Fig. 7: COVID-19 vaccines ---------------------------------------------

def t4(spark: SparkSession) -> DataFrame:
    """Vaccines and their approvers (t12's approver missing)."""
    return _spark_df(spark, pd.DataFrame(
        {
            "TID": ["t11", "t12"],
            "Vaccine": ["Pfizer", "JnJ"],
            "Approver": ["FDA", None],
        }
    ))


def t5(spark: SparkSession) -> DataFrame:
    """Countries and their approval agencies (t14's agency missing)."""
    return _spark_df(spark, pd.DataFrame(
        {
            "TID": ["t13", "t14"],
            "Country": ["United States", "USA"],
            "Approver": ["FDA", None],
        }
    ))


def t6(spark: SparkSession) -> DataFrame:
    """Vaccines and their countries of origin."""
    return _spark_df(spark, pd.DataFrame(
        {
            "TID": ["t15", "t16"],
            "Vaccine": ["J&J", "JnJ"],
            "Country": ["United States", "USA"],
        }
    ))


def fig8a_expected() -> pd.DataFrame:
    """T4 ⟗ T5 ⟗ T6 (sequential SQL full outer joins, Fig. 8a):
    five tuples, none carrying the J&J approver."""
    return pd.DataFrame(
        [
            ("Pfizer", "FDA", "United States", "t11,t13"),
            ("JnJ", None, None, "t12"),
            (None, None, "USA", "t14"),
            ("J&J", None, "United States", "t15"),
            ("JnJ", None, "USA", "t16"),
        ],
        columns=["Vaccine", "Approver", "Country", "tids"],
    )


def fig8b_expected() -> pd.DataFrame:
    """FD(T4, T5, T6) (Fig. 8b): three tuples; f13 recovers the J&J
    approver by connecting t13 and t15 transitively."""
    return pd.DataFrame(
        [
            ("Pfizer", "FDA", "United States", "t11,t13"),
            ("JnJ", None, "USA", "t12,t14,t16"),
            ("J&J", "FDA", "United States", "t13,t15"),
        ],
        columns=["Vaccine", "Approver", "Country", "tids"],
    )


# Source schemas for null-kind display (paper's ± vs ⊥), keyed by tid.
TID_TABLE = {
    **{t: "T1" for t in ["t1", "t2", "t3"]},
    **{t: "T2" for t in ["t4", "t5", "t6"]},
    **{t: "T3" for t in ["t7", "t8", "t9", "t10"]},
    **{t: "T4" for t in ["t11", "t12"]},
    **{t: "T5" for t in ["t13", "t14"]},
    **{t: "T6" for t in ["t15", "t16"]},
}

TABLE_COLUMNS = {
    "T1": {"Country", "City", "Vaccination_Rate"},
    "T2": {"Country", "City", "Vaccination_Rate"},
    "T3": {"City", "Total_Cases", "Death_Rate"},
    "T4": {"Vaccine", "Approver"},
    "T5": {"Country", "Approver"},
    "T6": {"Vaccine", "Country"},
}
