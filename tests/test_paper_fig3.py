"""T-Fig3: reproduce Fig. 3 — ALITE (align + FD) over the paper's
T1, T2, T3, with provenance and null-kind display, oracle-checked
against DuckDB (Fig. 3's FD equals (T1 ∪ T2) FULL OUTER JOIN T3 ON City,
because the schema graph is an acyclic chain)."""
import pytest

from helpers import assert_frames_equal, integrated_to_pandas
from repro.align.schema_matching import align
from repro.core import paper_tables as pt
from repro.integrate.fd import annotate_null_kinds, full_disjunction
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def fig2_frames(spark):
    return {"T1": pt.t1(spark), "T2": pt.t2(spark), "T3": pt.t3(spark)}


@pytest.fixture(scope="module")
def alignment(fig2_frames):
    return align(fig2_frames, exclude=("TID",))


@pytest.fixture(scope="module")
def fd_result(spark, fig2_frames, alignment):
    aligned = alignment.apply(fig2_frames, keep=("TID",))
    df = full_disjunction(
        [aligned["T1"], aligned["T2"], aligned["T3"]], tid_col="TID"
    )
    df.cache()
    df.count()
    return df


class TestAlignment:
    def test_t1_t2_columns_aligned(self, alignment):
        for col in ["Country", "City", "Vaccination_Rate"]:
            assert alignment.iid("T1", col) == alignment.iid("T2", col)

    def test_city_aligned_across_all_three(self, alignment):
        assert alignment.iid("T1", "City") == alignment.iid("T3", "City")

    def test_t3_private_columns_unmatched(self, alignment):
        iids = set(alignment.assignments.values())
        assert alignment.iid("T3", "Total_Cases") in iids
        assert alignment.iid("T3", "Total_Cases") != alignment.iid(
            "T3", "Death_Rate"
        )

    def test_five_integration_ids(self, alignment):
        assert len(set(alignment.assignments.values())) == 5


class TestFig3:
    def test_exact_figure(self, fd_result, alignment):
        got = integrated_to_pandas(fd_result)
        expected = pt.fig3_expected().rename(
            columns={
                "Country": alignment.iid("T1", "Country"),
                "City": alignment.iid("T1", "City"),
                "Vaccination_Rate": alignment.iid("T1", "Vaccination_Rate"),
                "Total_Cases": alignment.iid("T3", "Total_Cases"),
                "Death_Rate": alignment.iid("T3", "Death_Rate"),
            }
        )
        assert_frames_equal(got, expected)

    def test_seven_tuples(self, fd_result):
        assert fd_result.count() == 7

    def test_oracle_chain_outer_join(self, spark, fig2_frames, alignment, fd_result):
        """Fig. 3's FD == (T1 ∪ T2) FULL OUTER JOIN T3 ON City in SQL."""
        ali = alignment
        c = {
            "country": ali.iid("T1", "Country"),
            "city": ali.iid("T1", "City"),
            "vax": ali.iid("T1", "Vaccination_Rate"),
            "cases": ali.iid("T3", "Total_Cases"),
            "death": ali.iid("T3", "Death_Rate"),
        }
        spark_side = fd_result.selectExpr(
            f"`{c['country']}` as country",
            f"`{c['city']}` as city",
            f"`{c['vax']}` as vax",
            f"`{c['cases']}` as cases",
            f"`{c['death']}` as death",
        )
        sql = """
            WITH u AS (
              SELECT Country, City, Vaccination_Rate FROM t1
              UNION ALL
              SELECT Country, City, Vaccination_Rate FROM t2
            )
            SELECT u.Country AS country,
                   COALESCE(u.City, t3.City) AS city,
                   u.Vaccination_Rate AS vax,
                   t3.Total_Cases AS cases,
                   t3.Death_Rate AS death
            FROM u FULL OUTER JOIN t3 ON u.City = t3.City
        """
        assert_equivalent(
            spark_side,
            sql,
            t1=pt.t1(spark).drop("TID").toPandas(),
            t2=pt.t2(spark).drop("TID").toPandas(),
            t3=pt.t3(spark).drop("TID").toPandas(),
        )

    def test_null_kind_display(self, fd_result, alignment):
        """± for t5's missing vaccination rate; ⊥ for New Delhi's
        produced nulls (Fig. 3's two null symbols)."""
        iid_of = {
            alignment.iid("T1", "Country"): "Country",
            alignment.iid("T1", "City"): "City",
            alignment.iid("T1", "Vaccination_Rate"): "Vaccination_Rate",
            alignment.iid("T3", "Total_Cases"): "Total_Cases",
            alignment.iid("T3", "Death_Rate"): "Death_Rate",
        }
        table_columns = {
            t: {iid for iid, orig in iid_of.items()
                if orig in pt.TABLE_COLUMNS[t]}
            for t in ["T1", "T2", "T3"]
        }
        ann = annotate_null_kinds(fd_result, pt.TID_TABLE, table_columns)
        ann = ann.rename(columns=iid_of)
        by_city = ann.set_index("City")
        assert by_city.loc["Mexico City", "Vaccination_Rate"] == "±"
        assert by_city.loc["Mexico City", "Total_Cases"] == "⊥"
        assert by_city.loc["New Delhi", "Country"] == "⊥"
        assert by_city.loc["Manchester", "Total_Cases"] == "⊥"
        assert by_city.loc["Berlin", "Vaccination_Rate"] == "63%"


class TestFig3Permutations:
    """FD is associative/order-insensitive — unlike outer join (paper's
    motivation). Every input permutation yields the same integrated set."""

    @pytest.mark.parametrize("order", [
        ("T1", "T3", "T2"), ("T2", "T1", "T3"), ("T3", "T2", "T1"),
    ])
    def test_permutation(self, fig2_frames, alignment, fd_result, order):
        aligned = alignment.apply(fig2_frames, keep=("TID",))
        df = full_disjunction([aligned[t] for t in order], tid_col="TID")
        base = integrated_to_pandas(fd_result)
        perm = integrated_to_pandas(df)
        assert_frames_equal(perm, base)
