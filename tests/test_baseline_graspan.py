"""Graspan-like worklist engine tests, cross-checked against the
reference Datalog engine on the same inputs."""
import pandas as pd
import pytest

from repro import synth_data
from repro.baselines import souffle_like
from repro.baselines.graspan_like import (
    Grammar,
    GraspanLikeEngine,
    csda_grammar,
    cspa_grammar,
    reverse_label,
    solve_csda,
    solve_cspa,
)
from repro.datalog import programs

from helpers import assert_pandas_equivalent, CSDA_SQL


def pairs(rows):
    return pd.DataFrame(rows, columns=["src", "dst"])


class TestWorklistCore:
    def test_unary_copy(self):
        g = Grammar(unary=(("p", "e"),))
        out = GraspanLikeEngine().solve(g, {"e": pairs([(1, 2)])})
        assert out["p"] == {(1, 2)}

    def test_binary_composition(self):
        g = Grammar(unary=(("p", "e"),), binary=(("p", "p", "e"),))
        out = GraspanLikeEngine().solve(g, {"e": pairs([(1, 2), (2, 3), (3, 4)])})
        assert out["p"] == {
            (1, 2), (2, 3), (3, 4), (1, 3), (2, 4), (1, 4),
        }

    def test_right_composition_triggers(self):
        # New left edges must also combine with *existing* right edges.
        g = Grammar(unary=(("a", "ea"), ("b", "eb")), binary=(("p", "a", "b"),))
        out = GraspanLikeEngine().solve(
            g, {"ea": pairs([(1, 2)]), "eb": pairs([(2, 3)])}
        )
        assert out["p"] == {(1, 3)}

    def test_reverse_tracking(self):
        g = Grammar(unary=(("p", "e"),), tracked_reverse=("p",))
        out = GraspanLikeEngine().solve(g, {"e": pairs([(1, 2)])})
        assert out[reverse_label("p")] == {(2, 1)}

    def test_reflexive_seeds(self):
        g = Grammar(reflexive_seeds=(("r", "e"),))
        out = GraspanLikeEngine().solve(g, {"e": pairs([(1, 2)])})
        assert out["r"] == {(1, 1), (2, 2)}

    def test_cycle_terminates(self):
        g = Grammar(unary=(("p", "e"),), binary=(("p", "p", "p"),))
        out = GraspanLikeEngine().solve(g, {"e": pairs([(0, 1), (1, 0)])})
        assert out["p"] == {(0, 1), (1, 0), (0, 0), (1, 1)}

    def test_edges_processed_counter(self):
        g = Grammar(unary=(("p", "e"),))
        eng = GraspanLikeEngine()
        eng.solve(g, {"e": pairs([(1, 2), (3, 4)])})
        assert eng.edges_processed == 4  # 2 e-edges + 2 p-edges


class TestCsda:
    def test_csda_matches_duckdb(self):
        edb = synth_data.csda_input(scale=1, seed=2, depth=15)
        out = solve_csda(edb)
        assert_pandas_equivalent(
            out, CSDA_SQL, nullEdge=edb["nullEdge"], arc=edb["arc"]
        )

    def test_csda_grammar_shape(self):
        g = csda_grammar()
        assert ("null", "nullEdge") in g.unary
        assert ("null", "null", "arc") in g.binary


class TestCspa:
    @pytest.mark.parametrize("seed", [0, 4])
    def test_cspa_matches_datalog_reference(self, seed):
        edb = {k: v.head(40) for k, v in synth_data.cspa_input(scale=1, seed=seed).items()}
        got = solve_cspa(edb)
        expected = souffle_like.evaluate(programs.get_program("cspa"), edb)
        for idb in ("valueFlow", "memoryAlias", "valueAlias"):
            g = set(map(tuple, got[idb].values))
            e = set(map(tuple, expected[idb].values))
            assert g == e, f"{idb}: extra={sorted(g - e)[:5]} missing={sorted(e - g)[:5]}"

    def test_cspa_grammar_tracks_reverses(self):
        g = cspa_grammar()
        assert set(g.tracked_reverse) == {"vf", "dereference"}

    def test_empty_input(self):
        out = solve_cspa({"assign": pairs([]), "dereference": pairs([])})
        assert out["valueFlow"].empty
