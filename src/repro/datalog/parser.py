"""Recursive-descent parser for the ``.datalog`` dialect.

Grammar (whitespace/comments between any tokens; ``%``, ``//`` and ``#``
start line comments)::

    program    := rule*
    rule       := atom ( ":-" body )? "."
    body       := bodyitem ("," bodyitem)*
    bodyitem   := ("!" | "not") atom | atom | condition
    atom       := IDENT "(" term ("," term)* ")"
    term       := AGG "(" expr ")" | expr | "_"
    expr       := operand (ARITHOP operand)?
    condition  := operand CMPOP operand
    operand    := IDENT | INT

An IDENT in term position is a variable; predicates are the IDENTs
directly followed by ``(``. Aggregates are the upper-case keywords
MIN/MAX/COUNT/SUM/AVG. The parser is deliberately small and produces the
frozen AST of :mod:`repro.datalog.ast`.
"""
from __future__ import annotations

import re
from typing import Union

from repro.datalog.ast import (
    AGG_OPS,
    AggTerm,
    Atom,
    BinExpr,
    Condition,
    Const,
    Program,
    Rule,
    Term,
    Var,
    Wildcard,
)


class DatalogSyntaxError(ValueError):
    """Raised on malformed ``.datalog`` input, with token position."""


_TOKEN_RE = re.compile(
    r"""
    (?P<ws>\s+)
  | (?P<comment>(%|//|\#)[^\n]*)
  | (?P<implies>:-)
  | (?P<cmp><=|>=|!=|<|>|=)
  | (?P<arith>[+\-*])
  | (?P<int>\d+)
  | (?P<ident>[A-Za-z][A-Za-z0-9_]*)
  | (?P<punct>[(),.!_])
    """,
    re.VERBOSE,
)


def _tokenize(text: str) -> list[tuple[str, str, int]]:
    tokens: list[tuple[str, str, int]] = []
    pos = 0
    while pos < len(text):
        m = _TOKEN_RE.match(text, pos)
        if m is None:
            raise DatalogSyntaxError(f"unexpected character {text[pos]!r} at offset {pos}")
        kind = m.lastgroup
        assert kind is not None
        if kind not in ("ws", "comment"):
            tokens.append((kind, m.group(), pos))
        pos = m.end()
    return tokens


class _Parser:
    def __init__(self, text: str) -> None:
        self.tokens = _tokenize(text)
        self.i = 0
        self._wildcards = 0

    # -- token helpers -------------------------------------------------
    def _peek(self, offset: int = 0) -> tuple[str, str, int] | None:
        j = self.i + offset
        return self.tokens[j] if j < len(self.tokens) else None

    def _next(self) -> tuple[str, str, int]:
        tok = self._peek()
        if tok is None:
            raise DatalogSyntaxError("unexpected end of input")
        self.i += 1
        return tok

    def _expect(self, value: str) -> None:
        tok = self._next()
        if tok[1] != value:
            raise DatalogSyntaxError(
                f"expected {value!r} but found {tok[1]!r} at offset {tok[2]}"
            )

    def _at(self, value: str) -> bool:
        tok = self._peek()
        return tok is not None and tok[1] == value

    # -- grammar -------------------------------------------------------
    def program(self) -> Program:
        rules = []
        while self._peek() is not None:
            rules.append(self.rule())
        return Program(tuple(rules))

    def rule(self) -> Rule:
        head = self.atom(allow_agg=True)
        body: list[Atom] = []
        conditions: list[Condition] = []
        if self._at(":-"):
            self._next()
            while True:
                item = self.body_item()
                if isinstance(item, Atom):
                    body.append(item)
                else:
                    conditions.append(item)
                if self._at(","):
                    self._next()
                    continue
                break
        self._expect(".")
        return Rule(head=head, body=tuple(body), conditions=tuple(conditions))

    def body_item(self) -> Union[Atom, Condition]:
        if self._at("!"):
            self._next()
            return self.atom(negated=True)
        tok = self._peek()
        if tok is not None and tok[0] == "ident" and tok[1] == "not":
            nxt = self._peek(1)
            if nxt is not None and nxt[0] == "ident":
                self._next()
                return self.atom(negated=True)
        # Atom iff IDENT followed by '(' and IDENT is not an aggregate
        # keyword (aggregates only appear in heads, which never reach here).
        if (
            tok is not None
            and tok[0] == "ident"
            and tok[1].upper() not in AGG_OPS
            and (nxt := self._peek(1)) is not None
            and nxt[1] == "("
        ):
            return self.atom()
        return self.condition()

    def atom(self, negated: bool = False, allow_agg: bool = False) -> Atom:
        tok = self._next()
        if tok[0] != "ident":
            raise DatalogSyntaxError(
                f"expected predicate name, found {tok[1]!r} at offset {tok[2]}"
            )
        pred = tok[1]
        self._expect("(")
        terms: list[Term] = [self.term(allow_agg)]
        while self._at(","):
            self._next()
            terms.append(self.term(allow_agg))
        self._expect(")")
        return Atom(pred=pred, terms=tuple(terms), negated=negated)

    def term(self, allow_agg: bool) -> Term:
        tok = self._peek()
        if tok is None:
            raise DatalogSyntaxError("unexpected end of input in term")
        if tok[1] == "_":
            self._next()
            self._wildcards += 1
            return Wildcard(self._wildcards)
        if (
            tok[0] == "ident"
            and tok[1].upper() in AGG_OPS
            and (nxt := self._peek(1)) is not None
            and nxt[1] == "("
        ):
            if not allow_agg:
                raise DatalogSyntaxError(
                    f"aggregate {tok[1]} only allowed in rule heads (offset {tok[2]})"
                )
            self._next()
            self._expect("(")
            expr = self.expr()
            self._expect(")")
            return AggTerm(op=tok[1].upper(), expr=expr)
        return self.expr()

    def expr(self) -> Union[Var, Const, BinExpr]:
        left = self.operand()
        tok = self._peek()
        if tok is not None and tok[0] == "arith":
            op = self._next()[1]
            right = self.operand()
            return BinExpr(op=op, left=left, right=right)
        return left

    def condition(self) -> Condition:
        left = self.operand()
        tok = self._next()
        if tok[0] != "cmp":
            raise DatalogSyntaxError(
                f"expected comparison operator, found {tok[1]!r} at offset {tok[2]}"
            )
        right = self.operand()
        return Condition(op=tok[1], left=left, right=right)

    def operand(self) -> Union[Var, Const]:
        tok = self._next()
        if tok[0] == "int":
            return Const(int(tok[1]))
        if tok[0] == "ident":
            return Var(tok[1])
        raise DatalogSyntaxError(
            f"expected variable or constant, found {tok[1]!r} at offset {tok[2]}"
        )


def parse_program(text: str) -> Program:
    """Parse a full ``.datalog`` program text into a :class:`Program`."""
    return _Parser(text).program()


def parse_rule(text: str) -> Rule:
    """Parse a single rule (convenience for tests)."""
    p = _Parser(text)
    rule = p.rule()
    if p._peek() is not None:
        raise DatalogSyntaxError("trailing input after rule")
    return rule
