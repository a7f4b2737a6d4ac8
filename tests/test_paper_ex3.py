"""T-Ex3: reproduce Example 3's analytics over the Fig. 3 integrated
table — Boston lowest / Toronto highest vaccination rate, Pearson
correlation 0.16 (vaccination vs death rate) and 0.9 (cases vs
vaccination rate) — oracle-checked against DuckDB's corr()."""
import pandas as pd
import pytest

from repro.analyze.aggregates import (
    aggregate,
    completeness,
    correlation,
    extremes,
    numeric,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def fig3(spark):
    """The integrated table of Fig. 3 (as the Analyze stage receives it —
    a user can equally upload it directly, per Sec. 2.3)."""
    pdf = pd.DataFrame(
        [
            ("Germany", "Berlin", "63%", "1.4M", "147"),
            ("England", "Manchester", "78%", None, None),
            ("Spain", "Barcelona", "82%", "2.68M", "275"),
            ("Canada", "Toronto", "83%", None, None),
            ("Mexico", "Mexico City", None, None, None),
            ("USA", "Boston", "62%", "263k", "335"),
            (None, "New Delhi", None, "2M", "158"),
        ],
        columns=["Country", "City", "Vax", "Cases", "Deaths"],
    )
    return spark.createDataFrame(pdf)


class TestExample3:
    def test_extremes_boston_toronto(self, fig3):
        lo, hi = extremes(fig3, "City", "Vax")
        assert lo == "Boston"
        assert hi == "Toronto"

    def test_corr_vax_deaths_is_016(self, fig3):
        """Paper: 'positive (pearson) correlation of 0.16'."""
        r = correlation(fig3, "Vax", "Deaths")
        assert r == pytest.approx(0.16, abs=0.005)

    def test_corr_cases_vax_is_09(self, fig3):
        """Paper: 'correlation of 0.9 between case numbers and
        vaccination rates'."""
        r = correlation(fig3, "Cases", "Vax")
        assert r == pytest.approx(0.90, abs=0.005)

    def test_corr_oracle(self, fig3):
        """Our parsed-string corr matches DuckDB corr over pre-parsed
        numbers."""
        import pyspark.sql.functions as F

        parsed = fig3.select(
            numeric("Vax").alias("vax"), numeric("Deaths").alias("deaths")
        )
        spark_df = parsed.groupBy().agg(F.corr("vax", "deaths").alias("r"))
        assert_equivalent(
            spark_df, "SELECT corr(vax, deaths) AS r FROM t",
            t=parsed.toPandas(),
        )

    def test_correlation_none_when_insufficient(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"a": ["1", None], "b": [None, "2"]})
        )
        assert correlation(df, "a", "b") is None


class TestAggregate:
    def test_count_avg_per_country(self, fig3):
        out = {
            r["group"]: r
            for r in aggregate(fig3, "Country", "Vax").collect()
        }
        assert out["Germany"]["count"] == 1
        assert out["Germany"]["avg"] == pytest.approx(63.0)
        # Mexico's vax is null and New Delhi's country is null: excluded.
        assert "Mexico" not in out
        assert None not in out

    def test_aggregate_oracle(self, fig3):
        got = aggregate(fig3, "Country", "Deaths", aggs=("count", "avg"))
        pdf = fig3.toPandas()
        pdf["deaths_num"] = pdf["Deaths"].map(
            lambda v: None if v is None else float(v)
        )
        assert_equivalent(
            got.selectExpr("group", "count", "avg"),
            """
            SELECT Country AS "group", count(deaths_num) AS "count",
                   avg(deaths_num) AS avg
            FROM t WHERE Country IS NOT NULL AND deaths_num IS NOT NULL
            GROUP BY Country
            """,
            t=pdf,
        )

    def test_unknown_agg_raises(self, fig3):
        with pytest.raises(ValueError, match="unsupported"):
            aggregate(fig3, "Country", "Vax", aggs=("median",))


class TestCompleteness:
    def test_fig3_completeness(self, fig3):
        # 35 cells, 9 nulls (2+2+3+2 across the four incomplete rows)
        assert completeness(
            fig3, ["Country", "City", "Vax", "Cases", "Deaths"]
        ) == pytest.approx(26 / 35)

    def test_empty(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": ["x"]})).where("a is null")
        assert completeness(df, ["a"]) == 0.0
