"""T-Fig8a/b: reproduce Fig. 8 — outer join vs ALITE FD over the paper's
vaccine tables T4, T5, T6, including the paper's headline observations:
outer join yields five tuples but never the J&J approver; FD yields three
tuples including (J&J, FDA, United States)."""
import pytest

from helpers import assert_frames_equal, integrated_to_pandas
from repro.align.schema_matching import align
from repro.core import paper_tables as pt
from repro.integrate.fd import full_disjunction
from repro.integrate.naive import inner_join_integrate, union_integrate
from repro.integrate.outer_join import outer_join_integrate
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def fig7_frames(spark):
    return {"T4": pt.t4(spark), "T5": pt.t5(spark), "T6": pt.t6(spark)}


@pytest.fixture(scope="module")
def fig7_aligned(fig7_frames):
    ali = align(fig7_frames, exclude=("TID",))
    frames = ali.apply(fig7_frames, keep=("TID",))
    return ali, [frames["T4"], frames["T5"], frames["T6"]]


def _rename_expected(ali, pdf):
    return pdf.rename(
        columns={
            "Vaccine": ali.iid("T4", "Vaccine"),
            "Approver": ali.iid("T4", "Approver"),
            "Country": ali.iid("T5", "Country"),
        }
    )


class TestFig7Alignment:
    def test_three_integration_ids(self, fig7_aligned):
        ali, _ = fig7_aligned
        assert len(set(ali.assignments.values())) == 3

    def test_cross_table_matches(self, fig7_aligned):
        ali, _ = fig7_aligned
        assert ali.iid("T4", "Vaccine") == ali.iid("T6", "Vaccine")
        assert ali.iid("T4", "Approver") == ali.iid("T5", "Approver")
        assert ali.iid("T5", "Country") == ali.iid("T6", "Country")


class TestFig8aOuterJoin:
    def test_exact_figure(self, fig7_aligned):
        ali, dfs = fig7_aligned
        got = integrated_to_pandas(outer_join_integrate(dfs, tid_col="TID"))
        assert_frames_equal(got, _rename_expected(ali, pt.fig8a_expected()))

    def test_five_tuples_no_jj_approver(self, fig7_aligned):
        ali, dfs = fig7_aligned
        out = integrated_to_pandas(outer_join_integrate(dfs, tid_col="TID"))
        assert len(out) == 5
        vac, app = ali.iid("T4", "Vaccine"), ali.iid("T4", "Approver")
        jj = out[out[vac].isin(["J&J", "JnJ"])]
        # The paper's point: no outer-join tuple reveals J&J's approver.
        assert jj[app].isna().all()

    def test_oracle(self, spark, fig7_aligned):
        """Outer-join integration matches DuckDB's SQL full outer joins."""
        ali, dfs = fig7_aligned
        got = outer_join_integrate(dfs, tid_col="TID").selectExpr(
            f"`{ali.iid('T4', 'Vaccine')}` as vaccine",
            f"`{ali.iid('T4', 'Approver')}` as approver",
            f"`{ali.iid('T5', 'Country')}` as country",
        )
        sql = """
            WITH j1 AS (
              SELECT t4.Vaccine,
                     COALESCE(t4.Approver, t5.Approver) AS Approver,
                     t5.Country
              FROM t4 FULL OUTER JOIN t5 ON t4.Approver = t5.Approver
            )
            SELECT COALESCE(j1.Vaccine, t6.Vaccine) AS vaccine,
                   j1.Approver AS approver,
                   COALESCE(j1.Country, t6.Country) AS country
            FROM j1 FULL OUTER JOIN t6
              ON j1.Vaccine = t6.Vaccine AND j1.Country = t6.Country
        """
        assert_equivalent(
            got, sql,
            t4=pt.t4(spark).drop("TID").toPandas(),
            t5=pt.t5(spark).drop("TID").toPandas(),
            t6=pt.t6(spark).drop("TID").toPandas(),
        )


class TestFig8bFD:
    def test_exact_figure(self, fig7_aligned):
        ali, dfs = fig7_aligned
        got = integrated_to_pandas(full_disjunction(dfs, tid_col="TID"))
        assert_frames_equal(got, _rename_expected(ali, pt.fig8b_expected()))

    def test_fd_recovers_jj_approver(self, fig7_aligned):
        ali, dfs = fig7_aligned
        out = integrated_to_pandas(full_disjunction(dfs, tid_col="TID"))
        assert len(out) == 3
        vac, app = ali.iid("T4", "Vaccine"), ali.iid("T4", "Approver")
        cty = ali.iid("T5", "Country")
        jj = out[(out[vac] == "J&J")]
        assert len(jj) == 1
        assert jj.iloc[0][app] == "FDA"
        assert jj.iloc[0][cty] == "United States"
        assert jj.iloc[0]["tids"] == "t13,t15"


class TestFig8Order:
    def test_outer_join_is_order_sensitive(self, fig7_aligned):
        """The motivation for FD: outer join is not associative. With the
        order T5, T6, T4 the join tree connects different tuples than
        T4, T5, T6 (the FD result is invariant — see Fig3 permutations)."""
        _, dfs = fig7_aligned
        a = integrated_to_pandas(outer_join_integrate(dfs, tid_col="TID"))
        b_df = outer_join_integrate([dfs[1], dfs[2], dfs[0]], tid_col="TID")
        b = integrated_to_pandas(b_df)[list(a.columns)]
        assert not a.reset_index(drop=True).equals(b.reset_index(drop=True))

    def test_fd_order_insensitive(self, fig7_aligned):
        _, dfs = fig7_aligned
        a = integrated_to_pandas(full_disjunction(dfs, tid_col="TID"))
        b = integrated_to_pandas(
            full_disjunction([dfs[2], dfs[0], dfs[1]], tid_col="TID")
        )[list(a.columns)]
        assert a.reset_index(drop=True).equals(b.reset_index(drop=True))


class TestNaiveBaselines:
    def test_inner_join_loses_partial_facts(self, fig7_aligned):
        """Auctus-style inner join keeps only fully-matching chains."""
        _, dfs = fig7_aligned
        out = integrated_to_pandas(inner_join_integrate(dfs, tid_col="TID"))
        assert len(out) < 3  # at most the Pfizer chain survives

    def test_union_keeps_facts_split(self, fig7_aligned):
        _, dfs = fig7_aligned
        out = integrated_to_pandas(union_integrate(dfs, tid_col="TID"))
        assert len(out) == 6  # all six source tuples, unconnected

    def test_union_oracle(self, spark, fig7_aligned):
        ali, dfs = fig7_aligned
        got = union_integrate(dfs, tid_col="TID").selectExpr(
            f"`{ali.iid('T4', 'Vaccine')}` as vaccine",
            f"`{ali.iid('T4', 'Approver')}` as approver",
            f"`{ali.iid('T5', 'Country')}` as country",
        )
        sql = """
            SELECT Vaccine AS vaccine, Approver AS approver,
                   CAST(NULL AS VARCHAR) AS country FROM t4
            UNION ALL
            SELECT CAST(NULL AS VARCHAR), Approver, Country FROM t5
            UNION ALL
            SELECT Vaccine, CAST(NULL AS VARCHAR), Country FROM t6
        """
        assert_equivalent(
            got, sql,
            t4=pt.t4(spark).drop("TID").toPandas(),
            t5=pt.t5(spark).drop("TID").toPandas(),
            t6=pt.t6(spark).drop("TID").toPandas(),
        )
