"""Harnesses reproducing the paper's figure-tables (T-Fig3, T-Ex3,
T-Fig8a/b/cd) — the demo's worked COVID examples, end to end through
align + integrate + analyze."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..align.schema_matching import Alignment, align
from ..analyze.aggregates import correlation, extremes
from ..analyze.er import resolve
from ..core import paper_tables as pt
from ..integrate.fd import annotate_null_kinds, full_disjunction
from ..integrate.outer_join import outer_join_integrate
from ..integrate.outer_union import TIDS


def _to_pdf(df) -> pd.DataFrame:
    pdf = df.toPandas()
    pdf["tids"] = pdf[TIDS].map(lambda a: ",".join(sorted(a)))
    pdf = pdf.drop(columns=[TIDS])
    return pdf.sort_values(list(pdf.columns), na_position="last").reset_index(
        drop=True
    )


def fig3(spark: SparkSession) -> tuple[pd.DataFrame, pd.DataFrame, Alignment]:
    """(our FD(T1,T2,T3) with ± / ⊥ markers, the paper's Fig. 3, the
    alignment used)."""
    frames = {"T1": pt.t1(spark), "T2": pt.t2(spark), "T3": pt.t3(spark)}
    alignment = align(frames, exclude=("TID",))
    aligned = alignment.apply(frames, keep=("TID",))
    fd = full_disjunction(
        [aligned["T1"], aligned["T2"], aligned["T3"]], tid_col="TID"
    )
    iid_cols = {
        alignment.iid("T1", c): c
        for c in ["Country", "City", "Vaccination_Rate"]
    } | {
        alignment.iid("T3", c): c for c in ["Total_Cases", "Death_Rate"]
    }
    table_columns = {
        t: {iid for iid, orig in iid_cols.items()
            if orig in pt.TABLE_COLUMNS[t]}
        for t in ["T1", "T2", "T3"]
    }
    ours = annotate_null_kinds(fd, pt.TID_TABLE, table_columns).rename(
        columns={**iid_cols, TIDS: "tids"}
    )
    ours = ours.sort_values(list(ours.columns)).reset_index(drop=True)
    return ours, pt.fig3_expected(), alignment


def ex3(spark: SparkSession) -> pd.DataFrame:
    """Example 3's numbers, paper vs measured, over the Fig. 3 result."""
    ours, _, alignment = fig3(spark)
    df = spark.createDataFrame(
        ours.replace({"±": None, "⊥": None}).drop(columns=["tids"])
    )
    lo, hi = extremes(df, "City", "Vaccination_Rate")
    rows = [
        ("lowest vaccination city", "Boston", lo),
        ("highest vaccination city", "Toronto", hi),
        (
            "corr(vaccination, death rate)",
            0.16,
            round(correlation(df, "Vaccination_Rate", "Death_Rate"), 2),
        ),
        (
            "corr(cases, vaccination)",
            0.90,
            round(correlation(df, "Total_Cases", "Vaccination_Rate"), 2),
        ),
    ]
    return pd.DataFrame(rows, columns=["quantity", "paper", "measured"])


def fig8(spark: SparkSession) -> dict[str, pd.DataFrame]:
    """Fig. 8's four panels: outer join (a), FD (b), ER over each (c/d)."""
    frames = {"T4": pt.t4(spark), "T5": pt.t5(spark), "T6": pt.t6(spark)}
    alignment = align(frames, exclude=("TID",))
    aligned = alignment.apply(frames, keep=("TID",))
    dfs = [aligned["T4"], aligned["T5"], aligned["T6"]]
    renames = {
        alignment.iid("T4", "Vaccine"): "Vaccine",
        alignment.iid("T4", "Approver"): "Approver",
        alignment.iid("T5", "Country"): "Country",
    }
    oj = outer_join_integrate(dfs, tid_col="TID")
    fd = full_disjunction(dfs, tid_col="TID")
    return {
        "fig8a_outer_join": _to_pdf(oj).rename(columns=renames),
        "fig8b_fd": _to_pdf(fd).rename(columns=renames),
        "fig8c_er_over_outer_join": _to_pdf(resolve(oj)).rename(columns=renames),
        "fig8d_er_over_fd": _to_pdf(resolve(fd)).rename(columns=renames),
    }
