"""Tests for the aligned outer union (FD step 1), oracle-checked."""
import pandas as pd
import pytest

from helpers import integrated_to_pandas
from repro.integrate.outer_union import TIDS, outer_union, with_tids
from repro.oracle import assert_equivalent


@pytest.fixture()
def two_tables(spark):
    a = spark.createDataFrame(
        pd.DataFrame({"k": ["x", "y"], "u": ["1", None]})
    )
    b = spark.createDataFrame(
        pd.DataFrame({"k": ["y", "z"], "v": ["7", "8"]})
    )
    return a, b


class TestWithTids:
    def test_generated_tids_unique(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": list("abcd")}))
        out = with_tids(df, "T0")
        tids = [r[TIDS][0] for r in out.collect()]
        assert len(set(tids)) == 4
        assert all(t.startswith("T0r") for t in tids)

    def test_explicit_tid_col_consumed(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"TID": ["p", "q"], "a": ["1", "2"]})
        )
        out = with_tids(df, "T0", tid_col="TID")
        assert "TID" not in out.columns
        assert sorted(r[TIDS][0] for r in out.collect()) == ["p", "q"]


class TestOuterUnion:
    def test_schema_is_union(self, two_tables):
        u = outer_union(list(two_tables))
        assert set(u.columns) == {"k", "u", "v", TIDS}

    def test_missing_columns_padded_with_null(self, two_tables):
        u = integrated_to_pandas(outer_union(list(two_tables)))
        a_rows = u[u["v"].isna()]
        assert len(a_rows) == 2  # both rows of table a lack v

    def test_row_count(self, two_tables):
        assert outer_union(list(two_tables)).count() == 4

    def test_all_null_rows_dropped(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"a": ["x", None], "b": ["y", None]})
        )
        assert outer_union([df]).count() == 1

    def test_oracle(self, spark, two_tables):
        a, b = two_tables
        got = outer_union([a, b]).select("k", "u", "v")
        sql = """
            SELECT k, u, CAST(NULL AS VARCHAR) AS v FROM a
            UNION ALL
            SELECT k, CAST(NULL AS VARCHAR) AS u, v FROM b
        """
        assert_equivalent(got, sql, a=a.toPandas(), b=b.toPandas())

    def test_single_table_identity(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": ["1", "2"]}))
        u = outer_union([df])
        assert sorted(r["a"] for r in u.collect()) == ["1", "2"]

    def test_values_cast_to_string(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"n": [1.5, 2.0]}))
        u = outer_union([df])
        assert dict(u.dtypes)["n"] == "string"
