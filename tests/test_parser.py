"""Unit tests for the .datalog parser."""
import pytest

from repro.datalog.ast import (
    AggTerm,
    Atom,
    BinExpr,
    Condition,
    Const,
    Rule,
    Var,
    Wildcard,
)
from repro.datalog.parser import DatalogSyntaxError, parse_program, parse_rule
from repro.datalog import programs


class TestTokensAndBasics:
    def test_single_fact(self):
        r = parse_rule("arc(1, 2).")
        assert r.head == Atom("arc", (Const(1), Const(2)))
        assert r.is_fact

    def test_simple_rule(self):
        r = parse_rule("tc(x, y) :- arc(x, y).")
        assert r.head.pred == "tc"
        assert r.body == (Atom("arc", (Var("x"), Var("y"))),)
        assert not r.is_fact

    def test_two_body_atoms(self):
        r = parse_rule("tc(x, y) :- tc(x, z), arc(z, y).")
        assert [a.pred for a in r.body] == ["tc", "arc"]
        assert r.body[0].terms == (Var("x"), Var("z"))

    def test_ternary_atom(self):
        r = parse_rule("sssp2(y, d) :- arc(x, y, d).")
        assert r.body[0].arity == 3

    def test_constant_in_body(self):
        r = parse_rule("p(x) :- q(x, 42).")
        assert r.body[0].terms[1] == Const(42)

    def test_constant_in_head(self):
        r = parse_rule("p(x, 7) :- q(x).")
        assert r.head.terms[1] == Const(7)

    def test_whitespace_and_newlines(self):
        r = parse_rule("tc(x,y)\n  :-\n  arc(x,\n y).")
        assert r.body[0].pred == "arc"

    def test_program_with_comments(self):
        p = parse_program(
            """
            % transitive closure
            tc(x, y) :- arc(x, y).  // base
            # recursive
            tc(x, y) :- tc(x, z), arc(z, y).
            """
        )
        assert len(p.rules) == 2

    def test_empty_program(self):
        assert parse_program("") .rules == ()

    def test_underscores_in_identifiers(self):
        r = parse_rule("points_to(y, x) :- address_of(y, x).")
        assert r.head.pred == "points_to"


class TestNegation:
    def test_bang_negation(self):
        r = parse_rule("ntc(x, y) :- node(x), node(y), !tc(x, y).")
        assert r.negated_body == (Atom("tc", (Var("x"), Var("y")), negated=True),)
        assert len(r.positive_body) == 2

    def test_not_keyword_negation(self):
        r = parse_rule("ntc(x, y) :- node(x), node(y), not tc(x, y).")
        assert r.negated_body[0].pred == "tc"

    def test_variable_named_not_is_not_negation(self):
        # `not` followed by a comparison is a plain variable.
        r = parse_rule("p(x) :- q(x, not), not != 3.")
        assert r.conditions == (Condition("!=", Var("not"), Const(3)),)


class TestConditionsAndArithmetic:
    def test_inequality_condition(self):
        r = parse_rule("sg(x, y) :- arc(p, x), arc(p, y), x != y.")
        assert r.conditions == (Condition("!=", Var("x"), Var("y")),)

    @pytest.mark.parametrize("op", ["=", "!=", "<", "<=", ">", ">="])
    def test_all_comparison_ops(self, op):
        r = parse_rule(f"p(x) :- q(x, y), x {op} y.")
        assert r.conditions[0].op == op

    def test_condition_with_constant(self):
        r = parse_rule("p(x) :- q(x), x < 10.")
        assert r.conditions[0].right == Const(10)

    def test_arithmetic_in_agg(self):
        r = parse_rule("sssp2(y, MIN(d1 + d2)) :- sssp2(x, d1), arc(x, y, d2).")
        agg = r.head.terms[1]
        assert isinstance(agg, AggTerm)
        assert agg.expr == BinExpr("+", Var("d1"), Var("d2"))


class TestAggregates:
    @pytest.mark.parametrize("op", ["MIN", "MAX", "COUNT", "SUM", "AVG"])
    def test_agg_ops(self, op):
        r = parse_rule(f"g(x, {op}(y)) :- t(x, y).")
        assert r.head.terms[1] == AggTerm(op, Var("y"))
        assert r.has_aggregation()

    def test_agg_constant(self):
        r = parse_rule("sssp2(y, MIN(0)) :- id(y).")
        assert r.head.terms[1] == AggTerm("MIN", Const(0))

    def test_lowercase_agg(self):
        r = parse_rule("g(x, min(y)) :- t(x, y).")
        assert r.head.terms[1].op == "MIN"

    def test_agg_in_body_rejected(self):
        with pytest.raises(DatalogSyntaxError):
            parse_rule("p(x) :- q(x, MIN(y)).")


class TestWildcards:
    def test_wildcard_in_body(self):
        r = parse_rule("cc3(x, MIN(x)) :- arc(x, _).")
        assert isinstance(r.body[0].terms[1], Wildcard)

    def test_two_wildcards_are_distinct(self):
        r = parse_rule("p(x) :- q(_, x, _).")
        w1, w2 = r.body[0].terms[0], r.body[0].terms[2]
        assert w1 != w2

    def test_wildcard_not_a_variable(self):
        r = parse_rule("cc(x) :- cc2(_, x).")
        assert r.body[0].variables() == {"x"}


class TestErrors:
    @pytest.mark.parametrize(
        "text",
        [
            "tc(x, y) :- arc(x, y)",  # missing period
            "tc(x, y :- arc(x, y).",  # missing close paren
            "tc(x, y) := arc(x, y).",  # bad implies
            "(x, y) :- arc(x, y).",  # missing head predicate
            "tc(x, y) :- .",  # empty body
            "tc(x,, y) :- arc(x, y).",  # double comma
        ],
    )
    def test_syntax_errors(self, text):
        with pytest.raises(DatalogSyntaxError):
            parse_rule(text)

    def test_trailing_garbage_rejected(self):
        with pytest.raises(DatalogSyntaxError):
            parse_rule("p(x) :- q(x). extra")

    def test_unknown_character(self):
        with pytest.raises(DatalogSyntaxError):
            parse_program("p(x) :- q(x) & r(x).")


class TestBenchmarkProgramsParse:
    """All eight benchmark programs of Section 6.2 must parse."""

    @pytest.mark.parametrize("name", sorted(programs.PROGRAMS))
    def test_parses(self, name):
        p = programs.get_program(name)
        assert len(p.rules) >= 1

    def test_tc_shape(self):
        p = programs.get_program("tc")
        assert p.idb_predicates() == {"tc"}
        assert p.edb_predicates() == {"arc"}

    def test_cspa_shape(self):
        p = programs.get_program("cspa")
        assert p.idb_predicates() == {"valueFlow", "memoryAlias", "valueAlias"}
        assert p.edb_predicates() == {"assign", "dereference"}

    def test_andersen_shape(self):
        p = programs.get_program("andersen")
        assert p.edb_predicates() == {"addressOf", "assign", "load", "store"}

    def test_roundtrip_str(self):
        p = programs.get_program("tc")
        reparsed = parse_program(str(p))
        assert reparsed == p


class TestAstInvariants:
    def test_rule_is_hashable(self):
        r1 = parse_rule("tc(x, y) :- arc(x, y).")
        r2 = parse_rule("tc(x, y) :- arc(x, y).")
        assert hash(r1) == hash(r2) and r1 == r2

    def test_bad_agg_op_rejected(self):
        with pytest.raises(ValueError):
            AggTerm("MEDIAN", Var("x"))

    def test_bad_comparison_rejected(self):
        with pytest.raises(ValueError):
            Condition("<>", Var("x"), Var("y"))

    def test_bad_arith_rejected(self):
        with pytest.raises(ValueError):
            BinExpr("/", Var("x"), Var("y"))

    def test_atom_variables_includes_agg(self):
        r = parse_rule("g(x, SUM(y)) :- t(x, y).")
        assert r.head.variables() == {"x", "y"}

    def test_program_rules_for(self):
        p = programs.get_program("tc")
        assert len(p.rules_for("tc")) == 2
        assert p.rules_for("nope") == ()
