"""Property-based tests of the FD kernel (Hypothesis over small random
relations). These pin first-principles FD invariants that the oracle
cannot express in SQL for general inputs:

- output is subsumption-free and duplicate-free;
- every input fact is preserved (each input tuple subsumed by an output);
- order-insensitivity (associativity, the paper's core motivation);
- idempotence (FD of the FD output is the FD output);
- outer-join dominance: every outer-join result tuple is subsumed by
  some FD tuple (FD connects at least as much information).
"""
import itertools

from hypothesis import given, settings, strategies as st

from repro.integrate.fd import _component_closure, _merge, _subsumes

N_COLS = 3
_vals = st.one_of(st.none(), st.sampled_from(["a", "b", "c"]))
_tuples = st.lists(
    st.tuples(*([_vals] * N_COLS)).filter(
        lambda t: any(v is not None for v in t)
    ),
    min_size=1,
    max_size=6,
)


def closure(rows):
    return _component_closure(
        [(t, {f"t{i}"}) for i, t in enumerate(rows)], max_tuples=100_000
    )


@settings(max_examples=200, deadline=None)
@given(_tuples)
def test_subsumption_free_and_unique(rows):
    out = [t for t, _ in closure(rows)]
    assert len(out) == len(set(out))
    for a, b in itertools.permutations(out, 2):
        assert not _subsumes(a, b)


@settings(max_examples=200, deadline=None)
@given(_tuples)
def test_every_input_fact_preserved(rows):
    out = [t for t, _ in closure(rows)]
    for r in rows:
        assert any(_subsumes(o, r) for o in out), (rows, out)


@settings(max_examples=100, deadline=None)
@given(_tuples)
def test_order_insensitive(rows):
    a = sorted(((t, tuple(ts)) for t, ts in closure(rows)), key=repr)
    b_raw = _component_closure(
        [(t, {f"t{i}"}) for i, t in enumerate(rows)][::-1], 100_000
    )
    b = sorted(((t, tuple(ts)) for t, ts in b_raw), key=repr)
    assert [t for t, _ in a] == [t for t, _ in b]


@settings(max_examples=100, deadline=None)
@given(_tuples)
def test_idempotent(rows):
    once = [t for t, _ in closure(rows)]
    twice = [t for t, _ in closure(once)]
    assert sorted(once, key=repr) == sorted(twice, key=repr)


@settings(max_examples=100, deadline=None)
@given(_tuples)
def test_closed_under_complementation(rows):
    out = [t for t, _ in closure(rows)]
    for a, b in itertools.combinations(out, 2):
        m = _merge(a, b)
        if m is not None:
            assert any(_subsumes(o, m) for o in out), (a, b, m, out)


@settings(max_examples=100, deadline=None)
@given(_tuples, _tuples)
def test_outer_join_dominance(left, right):
    """Pairwise SQL full-outer-join tuples (joining on all-shared-non-null
    agreement) are subsumed by the FD of the union."""
    fd_out = [t for t, _ in closure(left + right)]
    for l in left:
        for r in right:
            m = _merge(l, r)
            if m is not None:
                assert any(_subsumes(o, m) for o in fd_out)
    # Unmatched-side tuples (outer join padding) are input facts:
    for t in left + right:
        assert any(_subsumes(o, t) for o in fd_out)


@settings(max_examples=100, deadline=None)
@given(_tuples)
def test_provenance_is_subsumption_based(rows):
    out = closure(rows)
    inputs = {f"t{i}": t for i, t in enumerate(rows)}
    # Dedup: identical inputs share all their tids on every output.
    for t, tids in out:
        for tid in tids:
            assert _subsumes(t, inputs[tid])
        for tid, src in inputs.items():
            if _subsumes(t, src):
                assert tid in tids
