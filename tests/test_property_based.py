"""Hypothesis property tests: engines agree on random small graphs.

The pandas reference engine (DuckDB-verified elsewhere) is the baseline;
the Graspan-like worklist engine and the BDD closure engine must agree
with it on arbitrary graphs. (The Spark engines are covered by
deterministic tests — spinning Spark inside hypothesis is too slow.)
"""
import pandas as pd
from hypothesis import given, settings, strategies as st

from repro.baselines import souffle_like
from repro.baselines.bdd.engine import BddClosureEngine
from repro.baselines.graspan_like import Grammar, GraspanLikeEngine
from repro.datalog import programs

edges_strategy = st.lists(
    st.tuples(st.integers(0, 12), st.integers(0, 12)),
    min_size=0,
    max_size=25,
)


def arcs(pairs) -> pd.DataFrame:
    if not pairs:
        return pd.DataFrame({"src": pd.Series([], dtype="int64"),
                             "dst": pd.Series([], dtype="int64")})
    return pd.DataFrame(pairs, columns=["src", "dst"]).drop_duplicates()


def reference_tc(arc: pd.DataFrame) -> set:
    out = souffle_like.evaluate(programs.get_program("tc"), {"arc": arc})
    return set(map(tuple, out["tc"].values))


@settings(max_examples=40, deadline=None)
@given(edges_strategy)
def test_graspan_tc_matches_reference(pairs):
    arc = arcs(pairs)
    grammar = Grammar(unary=(("tc", "arc"),), binary=(("tc", "tc", "arc"),))
    got = GraspanLikeEngine().solve(grammar, {"arc": arc})["tc"]
    assert got == reference_tc(arc)


@settings(max_examples=25, deadline=None)
@given(edges_strategy)
def test_bdd_tc_matches_reference(pairs):
    arc = arcs(pairs)
    got = BddClosureEngine().transitive_closure(arc, max_value=12)
    assert set(map(tuple, got.values)) == reference_tc(arc)


@settings(max_examples=25, deadline=None)
@given(edges_strategy)
def test_reference_tc_is_transitive_and_contains_arc(pairs):
    arc = arcs(pairs)
    tc = reference_tc(arc)
    base = set(map(tuple, arc.values))
    assert base <= tc
    for (a, b) in list(tc)[:80]:
        for (c, d) in list(tc)[:80]:
            if b == c:
                assert (a, d) in tc


@settings(max_examples=25, deadline=None)
@given(edges_strategy)
def test_reference_sg_is_symmetric_when_base_is(pairs):
    # SG's base rule is symmetric and the recursive step preserves
    # symmetry, so the SG relation is always symmetric.
    arc = arcs(pairs)
    out = souffle_like.evaluate(programs.get_program("sg"), {"arc": arc})
    sg = set(map(tuple, out["sg"].values))
    assert {(b, a) for (a, b) in sg} == sg


@settings(max_examples=25, deadline=None)
@given(edges_strategy)
def test_cc_labels_are_minima_of_some_ancestor(pairs):
    arc = arcs(pairs)
    if arc.empty:
        return
    out = souffle_like.evaluate(programs.get_program("cc"), {"arc": arc})
    cc3 = {int(r.c0): int(r.c1) for r in out["cc3"].itertuples()}
    for v, label in cc3.items():
        assert label <= v or label in cc3  # label is a seed vertex id
        assert label >= 0
