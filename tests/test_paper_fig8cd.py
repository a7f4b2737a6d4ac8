"""T-Fig8cd: reproduce Fig. 8(c)/(d) — entity resolution as the
downstream application over both integration results.

Paper claims pinned here:
- over FD (8d): ER resolves f12 (JnJ, ±, USA) with f13 (J&J, FDA,
  United States) into one tuple carrying the J&J approver -> 2 tuples;
- over outer join (8c): f9 and f10 share no non-null attribute and can
  NOT be resolved; no output tuple ever carries the J&J approver.
"""
import pandas as pd
import pytest

from helpers import integrated_to_pandas
from repro.analyze.er import resolve
from repro.core import paper_tables as pt
from repro.align.schema_matching import align
from repro.integrate.fd import full_disjunction
from repro.integrate.outer_join import outer_join_integrate


@pytest.fixture(scope="module")
def fig8_results(spark):
    frames = {"T4": pt.t4(spark), "T5": pt.t5(spark), "T6": pt.t6(spark)}
    ali = align(frames, exclude=("TID",))
    a = ali.apply(frames, keep=("TID",))
    dfs = [a["T4"], a["T5"], a["T6"]]
    cols = {
        "vaccine": ali.iid("T4", "Vaccine"),
        "approver": ali.iid("T4", "Approver"),
        "country": ali.iid("T5", "Country"),
    }
    fd = full_disjunction(dfs, tid_col="TID").cache()
    oj = outer_join_integrate(dfs, tid_col="TID").cache()
    fd.count(), oj.count()
    return cols, fd, oj


class TestFig8dErOverFd:
    def test_two_tuples(self, fig8_results):
        _, fd, _ = fig8_results
        out = integrated_to_pandas(resolve(fd))
        assert len(out) == 2

    def test_jj_tuple_complete(self, fig8_results):
        cols, fd, _ = fig8_results
        out = integrated_to_pandas(resolve(fd))
        jj = out[out[cols["vaccine"]] == "J&J"]
        assert len(jj) == 1
        row = jj.iloc[0]
        assert row[cols["approver"]] == "FDA"
        assert row[cols["country"]] == "United States"
        # Provenance: the resolved tuple unions both clusters' tids.
        assert row["tids"] == "t12,t13,t14,t15,t16"

    def test_pfizer_untouched(self, fig8_results):
        cols, fd, _ = fig8_results
        out = integrated_to_pandas(resolve(fd))
        pf = out[out[cols["vaccine"]] == "Pfizer"]
        assert len(pf) == 1
        assert pf.iloc[0][cols["approver"]] == "FDA"


class TestFig8cErOverOuterJoin:
    def test_four_tuples(self, fig8_results):
        """ER merges only f11/f12 (two shared attrs); f9 and f10 stay."""
        _, _, oj = fig8_results
        out = integrated_to_pandas(resolve(oj))
        assert len(out) == 4

    def test_no_jj_approver(self, fig8_results):
        """The claim of Example 5: even after ER, the outer-join result
        never reveals the agency that approved the J&J vaccine."""
        cols, _, oj = fig8_results
        out = integrated_to_pandas(resolve(oj))
        jj = out[out[cols["vaccine"]].isin(["J&J", "JnJ"])]
        assert len(jj) >= 1
        assert jj[cols["approver"]].isna().all()

    def test_f9_f10_not_resolved(self, fig8_results):
        """f9 (JnJ, ±, ⊥) and f10 (⊥, ±, USA) share no non-null
        attribute: unresolvable, they survive as incomplete tuples."""
        cols, _, oj = fig8_results
        out = integrated_to_pandas(resolve(oj))
        f9 = out[(out["tids"] == "t12")]
        f10 = out[(out["tids"] == "t14")]
        assert len(f9) == 1 and len(f10) == 1
        assert pd.isna(f9.iloc[0][cols["country"]])
        assert pd.isna(f10.iloc[0][cols["vaccine"]])


class TestErVsFdInformation:
    def test_fd_er_strictly_more_complete(self, fig8_results):
        """The demo's punchline quantified: ER over FD yields a fully
        complete table; ER over outer join leaves nulls."""
        cols, fd, oj = fig8_results
        vcols = list(cols.values())
        fd_out = integrated_to_pandas(resolve(fd))
        oj_out = integrated_to_pandas(resolve(oj))
        assert fd_out[vcols].notna().all().all()
        assert oj_out[vcols].isna().any().any()
