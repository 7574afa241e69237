"""Tests for the single-node reference engine (souffle_like).

This engine is the oracle for the Spark engines on nonlinear programs,
so it is itself verified here against DuckDB ``WITH RECURSIVE`` (linear
programs) and against independent pure-python reference algorithms
(SG, AA, CC, SSSP).
"""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.baselines.souffle_like import (
    SouffleLikeEngine,
    UnsupportedProgramError,
    evaluate,
)
from repro.datalog import analyze, programs
from repro.datalog.parser import parse_program

from helpers import (
    CSDA_SQL,
    REACH_SQL,
    TC_SQL,
    assert_pandas_equivalent,
    ref_andersen,
    ref_components_min,
    ref_same_generation,
    ref_sssp,
)


def arcs_df(pairs) -> pd.DataFrame:
    return pd.DataFrame(pairs, columns=["src", "dst"])


SMALL_GRAPHS = {
    "chain": arcs_df([(0, 1), (1, 2), (2, 3)]),
    "cycle": arcs_df([(0, 1), (1, 2), (2, 0)]),
    "diamond": arcs_df([(0, 1), (0, 2), (1, 3), (2, 3)]),
    "selfloop": arcs_df([(0, 0), (0, 1)]),
    "two_components": arcs_df([(0, 1), (2, 3)]),
    "dense": synth_data.gnp_arcs(n=25, p=0.15, seed=7),
    "rmat": synth_data.rmat_arcs(n=64, edge_factor=3, seed=3),
}


class TestTransitiveClosure:
    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    def test_tc_matches_duckdb(self, name):
        arc = SMALL_GRAPHS[name]
        out = evaluate(programs.get_program("tc"), {"arc": arc})
        assert_pandas_equivalent(out["tc"], TC_SQL, arc=arc)

    def test_tc_chain_exact(self):
        out = evaluate(programs.get_program("tc"), {"arc": SMALL_GRAPHS["chain"]})
        got = set(map(tuple, out["tc"].values))
        assert got == {(0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)}

    def test_tc_empty_graph(self):
        arc = arcs_df([]).astype("int64")
        out = evaluate(programs.get_program("tc"), {"arc": arc})
        assert out["tc"].empty

    def test_tc_result_is_deduped(self):
        out = evaluate(programs.get_program("tc"), {"arc": SMALL_GRAPHS["cycle"]})
        assert not out["tc"].duplicated().any()

    def test_duplicate_input_edges_are_deduped(self):
        arc = arcs_df([(0, 1), (0, 1), (1, 2)])
        out = evaluate(programs.get_program("tc"), {"arc": arc})
        got = set(map(tuple, out["tc"].values))
        assert got == {(0, 1), (1, 2), (0, 2)}


class TestReachability:
    def test_reach_matches_duckdb(self):
        arc = SMALL_GRAPHS["rmat"]
        src = pd.DataFrame({"v": [int(arc["src"].iloc[0])]})
        out = evaluate(programs.get_program("reach"), {"arc": arc, "id": src})
        assert_pandas_equivalent(out["reach"], REACH_SQL, arc=arc, id=src)

    def test_reach_unreachable(self):
        arc = arcs_df([(0, 1), (2, 3)])
        src = pd.DataFrame({"v": [0]})
        out = evaluate(programs.get_program("reach"), {"arc": arc, "id": src})
        assert set(out["reach"]["c0"]) == {0, 1}

    def test_reach_iteration_count_tracks_depth(self):
        arc = arcs_df([(i, i + 1) for i in range(10)])
        eng = SouffleLikeEngine(allow_recursive_aggregation=True)
        analyzed = analyze(programs.get_program("reach"))
        eng.evaluate(analyzed, {"arc": arc, "id": pd.DataFrame({"v": [0]})})
        assert eng.iterations["reach"] >= 10


class TestCSDA:
    def test_csda_matches_duckdb(self):
        edb = synth_data.csda_input(scale=1, seed=0, depth=12)
        out = evaluate(programs.get_program("csda"), edb)
        assert_pandas_equivalent(
            out["null"], CSDA_SQL, nullEdge=edb["nullEdge"], arc=edb["arc"]
        )


class TestSameGeneration:
    @pytest.mark.parametrize("name", ["chain", "diamond", "dense", "two_components"])
    def test_sg_matches_reference(self, name):
        arc = SMALL_GRAPHS[name]
        out = evaluate(programs.get_program("sg"), {"arc": arc})
        got = set(map(tuple, out["sg"].values))
        assert got == ref_same_generation(arc)

    def test_sg_diamond_exact(self):
        out = evaluate(programs.get_program("sg"), {"arc": SMALL_GRAPHS["diamond"]})
        got = set(map(tuple, out["sg"].values))
        # 1,2 share parent 0; (3,3) follows via arc(1,3), sg(1,2), arc(2,3)
        # because the x != y guard is only on the base rule (paper Sec 5.3).
        assert got == {(1, 2), (2, 1), (3, 3)}


class TestConnectedComponents:
    @pytest.mark.parametrize("name", ["chain", "cycle", "diamond", "dense", "rmat"])
    def test_cc3_matches_reference(self, name):
        arc = SMALL_GRAPHS[name]
        out = evaluate(programs.get_program("cc"), {"arc": arc})
        got = dict(zip(out["cc3"]["c0"].astype(int), out["cc3"]["c1"].astype(int)))
        assert got == ref_components_min(arc)

    def test_cc_output_is_distinct_labels(self):
        arc = SMALL_GRAPHS["two_components"]
        out = evaluate(programs.get_program("cc"), {"arc": arc})
        assert set(out["cc"]["c0"]) == {0, 2}

    def test_cc_rejected_without_recursive_agg(self):
        eng = SouffleLikeEngine(allow_recursive_aggregation=False)
        with pytest.raises(UnsupportedProgramError, match="recursive aggregation"):
            eng.evaluate(analyze(programs.get_program("cc")), {"arc": SMALL_GRAPHS["chain"]})


class TestSSSP:
    def make_weighted(self, seed=0, n=40):
        arc = synth_data.add_weights(
            synth_data.rmat_arcs(n=n, edge_factor=4, seed=seed), seed=seed
        )
        return arc

    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_sssp_matches_dijkstra(self, seed):
        arc = self.make_weighted(seed=seed)
        source = int(arc["src"].iloc[0])
        out = evaluate(
            programs.get_program("sssp"),
            {"arc": arc, "id": pd.DataFrame({"v": [source]})},
        )
        got = dict(zip(out["sssp"]["c0"].astype(int), out["sssp"]["c1"].astype(float)))
        assert got == pytest.approx(ref_sssp(arc, source))

    def test_sssp_source_distance_zero(self):
        arc = pd.DataFrame({"src": [0, 1], "dst": [1, 2], "w": [5, 7]})
        out = evaluate(
            programs.get_program("sssp"), {"arc": arc, "id": pd.DataFrame({"v": [0]})}
        )
        got = dict(zip(out["sssp"]["c0"], out["sssp"]["c1"]))
        assert got == {0: 0, 1: 5, 2: 12}


class TestAndersen:
    @pytest.mark.parametrize("scale", [1, 2])
    def test_andersen_matches_reference(self, scale):
        edb = {
            k: v.head(30 * scale)
            for k, v in synth_data.andersen_input(scale=1, seed=scale).items()
        }
        out = evaluate(programs.get_program("andersen"), edb)
        got = set(map(tuple, out["pointsTo"].values))
        assert got == ref_andersen(edb)

    def test_andersen_handcrafted(self):
        # y = &x; z = y; means pointsTo(y,x), pointsTo(z,x).
        edb = {
            "addressOf": arcs_df([(1, 0)]),   # y=1 points to x=0
            "assign": arcs_df([(2, 1)]),      # z=2 := y=1
            "load": arcs_df([]).astype("int64"),
            "store": arcs_df([]).astype("int64"),
        }
        out = evaluate(programs.get_program("andersen"), edb)
        assert set(map(tuple, out["pointsTo"].values)) == {(1, 0), (2, 0)}


class TestCSPA:
    def test_cspa_small_fixpoint(self):
        edb = synth_data.cspa_input(scale=1, seed=0)
        edb = {k: v.head(60) for k, v in edb.items()}
        out = evaluate(programs.get_program("cspa"), edb)
        vf = set(map(tuple, out["valueFlow"].values))
        # valueFlow contains assign edges and all reflexive endpoints.
        for s, d in edb["assign"].itertuples(index=False):
            assert (s, d) in vf and (s, s) in vf and (d, d) in vf
        # valueFlow is transitively closed.
        for (a, b) in list(vf)[:200]:
            for (c, d) in list(vf)[:200]:
                if b == c:
                    assert (a, d) in vf

    def test_cspa_mutual_recursion_converges(self):
        edb = {
            "assign": arcs_df([(0, 1), (1, 2)]),
            "dereference": arcs_df([(0, 3), (1, 4)]),
        }
        out = evaluate(programs.get_program("cspa"), edb)
        ma = set(map(tuple, out["memoryAlias"].values))
        # dereference(0,3), valueAlias(0,0) (reflexive via vf), deref(0,3)
        # -> memoryAlias(3,3) among others.
        assert (3, 3) in ma


class TestNegationAndNonRecursiveAgg:
    def test_negated_tc(self):
        arc = SMALL_GRAPHS["chain"]
        out = evaluate(programs.get_program("negated_tc"), {"arc": arc})
        ntc = set(map(tuple, out["ntc"].values))
        tc = set(map(tuple, out["tc"].values))
        nodes = {0, 1, 2, 3}
        assert ntc == {(x, y) for x in nodes for y in nodes} - tc

    def test_tc_count(self):
        arc = SMALL_GRAPHS["chain"]
        out = evaluate(programs.get_program("tc_count"), {"arc": arc})
        got = dict(zip(out["gtc"]["c0"], out["gtc"]["c1"]))
        assert got == {0: 3, 1: 2, 2: 1}

    def test_count_distinct_semantics(self):
        # COUNT over set semantics: duplicates in the body must not count.
        p = parse_program("g(x, COUNT(y)) :- t(x, y), u(y).")
        t = pd.DataFrame({"a": [1, 1, 1], "b": [10, 10, 20]})
        u = pd.DataFrame({"a": [10, 20]})
        out = evaluate(p, {"t": t, "u": u})
        assert dict(zip(out["g"]["c0"], out["g"]["c1"])) == {1: 2}

    def test_sum_avg_max(self):
        p = parse_program(
            "s(x, SUM(y)) :- t(x, y). a(x, AVG(y)) :- t(x, y). m(x, MAX(y)) :- t(x, y)."
        )
        t = pd.DataFrame({"a": [1, 1, 2], "b": [10, 20, 5]})
        out = evaluate(p, {"t": t})
        assert dict(zip(out["s"]["c0"], out["s"]["c1"])) == {1: 30, 2: 5}
        assert dict(zip(out["a"]["c0"], out["a"]["c1"])) == {1: 15.0, 2: 5.0}
        assert dict(zip(out["m"]["c0"], out["m"]["c1"])) == {1: 20, 2: 5}


class TestRuleFeatures:
    def test_constant_filter_in_body(self):
        p = parse_program("p(x) :- e(x, 7).")
        e = pd.DataFrame({"a": [1, 2, 3], "b": [7, 8, 7]})
        out = evaluate(p, {"e": e})
        assert set(out["p"]["c0"]) == {1, 3}

    def test_constant_in_head(self):
        p = parse_program("p(x, 99) :- e(x).")
        out = evaluate(p, {"e": pd.DataFrame({"a": [1, 2]})})
        assert set(map(tuple, out["p"].values)) == {(1, 99), (2, 99)}

    def test_repeated_variable_in_atom(self):
        p = parse_program("loop(x) :- e(x, x).")
        e = pd.DataFrame({"a": [1, 2, 3], "b": [1, 5, 3]})
        out = evaluate(p, {"e": e})
        assert set(out["loop"]["c0"]) == {1, 3}

    def test_cross_product_body(self):
        p = parse_program("pair(x, y) :- a(x), b(y).")
        out = evaluate(
            p, {"a": pd.DataFrame({"v": [1, 2]}), "b": pd.DataFrame({"v": [8, 9]})}
        )
        assert len(out["pair"]) == 4

    def test_comparison_with_constant(self):
        p = parse_program("big(x) :- e(x), x > 5.")
        out = evaluate(p, {"e": pd.DataFrame({"v": [3, 6, 9]})})
        assert set(out["big"]["c0"]) == {6, 9}

    def test_negated_atom_with_constant(self):
        p = parse_program("p(x) :- e(x), !f(x, 1).")
        e = pd.DataFrame({"v": [1, 2, 3]})
        f = pd.DataFrame({"a": [2], "b": [1]})
        out = evaluate(p, {"e": e, "f": f})
        assert set(out["p"]["c0"]) == {1, 3}

    def test_fact_rule(self):
        p = parse_program("p(1, 2). p(x, y) :- e(x, y).")
        out = evaluate(p, {"e": pd.DataFrame({"a": [5], "b": [6]})})
        assert set(map(tuple, out["p"].values)) == {(1, 2), (5, 6)}

    def test_wrong_arity_input_rejected(self):
        with pytest.raises(ValueError, match="columns"):
            evaluate(
                programs.get_program("tc"),
                {"arc": pd.DataFrame({"a": [1], "b": [2], "c": [3]})},
            )


class TestMultiStratumPipelines:
    def test_idb_feeding_idb(self):
        p = parse_program(
            """
            tc(x, y) :- arc(x, y).
            tc(x, y) :- tc(x, z), arc(z, y).
            sym(x, y) :- tc(x, y), tc(y, x).
            """
        )
        arc = SMALL_GRAPHS["cycle"]
        out = evaluate(p, {"arc": arc})
        sym = set(map(tuple, out["sym"].values))
        assert sym == {(x, y) for x in range(3) for y in range(3)}

    def test_gauss_seidel_vs_jacobi_same_fixpoint(self):
        # Order of IDB updates inside an iteration must not change the
        # fixpoint (only how fast it is reached).
        edb = {
            "assign": arcs_df([(0, 1), (1, 2), (2, 3)]),
            "dereference": arcs_df([(0, 2), (1, 3)]),
        }
        out1 = evaluate(programs.get_program("cspa"), edb)
        out2 = evaluate(programs.get_program("cspa"), edb)
        for k in out1:
            pd.testing.assert_frame_equal(
                out1[k].sort_values(list(out1[k].columns)).reset_index(drop=True),
                out2[k].sort_values(list(out2[k].columns)).reset_index(drop=True),
            )
