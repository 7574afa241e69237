"""ROBDD package tests + BDDBDDB-like closure engine tests."""
import pandas as pd
import pytest

from repro.baselines.bdd.bdd import BDD, ONE, ZERO
from repro.baselines.bdd.engine import BddClosureEngine
from repro import synth_data

from helpers import assert_pandas_equivalent, TC_SQL, CSDA_SQL


class TestBddCore:
    def test_terminals(self):
        b = BDD()
        assert b.apply_and(ONE, ZERO) == ZERO
        assert b.apply_or(ONE, ZERO) == ONE
        assert b.apply_diff(ONE, ZERO) == ONE
        assert b.apply_diff(ONE, ONE) == ZERO

    def test_mk_reduces_equal_children(self):
        b = BDD()
        assert b.mk(0, ONE, ONE) == ONE

    def test_hash_consing(self):
        b = BDD()
        assert b.var_node(3) == b.var_node(3)

    def test_and_or_laws(self):
        b = BDD()
        x, y = b.var_node(0), b.var_node(1)
        assert b.apply_and(x, x) == x
        assert b.apply_or(x, x) == x
        assert b.apply_and(x, b.apply_or(x, y)) == x  # absorption

    def test_canonical_forms_equal(self):
        b = BDD()
        x, y = b.var_node(0), b.var_node(1)
        a1 = b.apply_or(b.apply_and(x, y), b.apply_and(x, y))
        a2 = b.apply_and(y, x)
        assert a1 == a2  # same function -> same node id

    def test_diff(self):
        b = BDD()
        x, y = b.var_node(0), b.var_node(1)
        d = b.apply_diff(b.apply_or(x, y), y)
        # x AND NOT y
        assert d == b.apply_and(x, b.apply_diff(ONE, y))

    def test_exists(self):
        b = BDD()
        x, y = b.var_node(0), b.var_node(1)
        f = b.apply_and(x, y)
        assert b.exists(f, frozenset({0})) == y
        assert b.exists(f, frozenset({0, 1})) == ONE

    def test_exists_or_branches(self):
        b = BDD()
        x, y = b.var_node(0), b.var_node(1)
        f = b.apply_and(x, b.apply_diff(ONE, y))  # x AND NOT y
        assert b.exists(f, frozenset({1})) == x

    def test_rename_monotone(self):
        b = BDD()
        f = b.apply_and(b.var_node(0), b.var_node(2))
        g = b.rename(f, {0: 1})
        assert g == b.apply_and(b.var_node(1), b.var_node(2))

    def test_cube_and_enumeration(self):
        b = BDD()
        f = b.cube({0: True, 2: False})
        sols = b.satisfying_assignments(f, (0, 2))
        assert sols == [{0: True, 2: False}]

    def test_from_assignments_roundtrip(self):
        b = BDD()
        rows = [{0: True, 1: False}, {0: False, 1: True}]
        f = b.from_assignments(rows)
        got = b.satisfying_assignments(f, (0, 1))
        assert sorted(map(str, got)) == sorted(map(str, rows))

    def test_count_satisfying(self):
        b = BDD()
        x = b.var_node(0)
        assert b.count_satisfying(x, (0, 1)) == 2  # x=1, y free
        assert b.count_satisfying(ONE, (0, 1, 2)) == 8
        assert b.count_satisfying(ZERO, (0,)) == 0

    def test_sharing_compresses_dense_relations(self):
        # The BDDBDDB claim: a full relation collapses to tiny node count.
        b = BDD()
        eng = BddClosureEngine()
        full = pd.DataFrame(
            [(x, y) for x in range(16) for y in range(16)], columns=["a", "b"]
        )
        node = eng.encode_pairs(full, bits=4)
        assert node == ONE  # all 16x16 pairs = constant true over 8 vars


class TestClosureEngine:
    def test_tc_chain(self):
        eng = BddClosureEngine()
        arc = pd.DataFrame({"src": [0, 1, 2], "dst": [1, 2, 3]})
        out = eng.transitive_closure(arc, max_value=3)
        assert_pandas_equivalent(out, TC_SQL, arc=arc)
        assert eng.iterations >= 3

    @pytest.mark.parametrize("seed", [0, 1])
    def test_tc_random_graph(self, seed):
        arc = synth_data.gnp_arcs(n=24, p=0.08, seed=seed)
        eng = BddClosureEngine()
        out = eng.transitive_closure(arc, max_value=23)
        assert_pandas_equivalent(out, TC_SQL, arc=arc)

    def test_tc_empty(self):
        eng = BddClosureEngine()
        arc = pd.DataFrame({"src": pd.Series([], dtype=int), "dst": pd.Series([], dtype=int)})
        out = eng.transitive_closure(arc, max_value=1)
        assert out.empty

    def test_csda(self):
        edb = synth_data.csda_input(scale=1, seed=3, depth=8)
        mx = int(max(edb["arc"].max().max(), edb["nullEdge"].max().max()))
        eng = BddClosureEngine()
        out = eng.csda(edb["nullEdge"], edb["arc"], max_value=mx)
        assert_pandas_equivalent(
            out, CSDA_SQL, nullEdge=edb["nullEdge"], arc=edb["arc"]
        )

    def test_encode_decode_roundtrip(self):
        eng = BddClosureEngine()
        pdf = pd.DataFrame({"a": [0, 5, 7], "b": [7, 0, 3]})
        node = eng.encode_pairs(pdf, bits=3)
        out = eng.decode_pairs(node, bits=3)
        assert sorted(map(tuple, out.values)) == [(0, 7), (5, 0), (7, 3)]
