"""AST for the Datalog dialect of the paper (Section 3).

The dialect is pure Datalog extended with:

- **stratified negation** — a body atom may be negated (``!tc(x, y)``);
- **aggregation** — a head term may be ``AGG(expr)`` with AGG one of
  MIN/MAX/COUNT/SUM/AVG and ``expr`` a variable, constant, or a simple
  binary arithmetic expression over variables (``MIN(d1 + d2)`` in SSSP);
- **builtin comparisons** — body entries like ``x != y`` or ``x < 10``;
- **wildcards** — ``_`` in a body atom position that is never used.

Terms, atoms, rules, and programs are frozen dataclasses so they can be
hashed, compared, and used as dict keys by the analyzer and compiler.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Union

AGG_OPS = ("MIN", "MAX", "COUNT", "SUM", "AVG")
COMPARISON_OPS = ("=", "!=", "<", "<=", ">", ">=")
ARITH_OPS = ("+", "-", "*")


@dataclass(frozen=True)
class Var:
    """A Datalog variable (lower case by convention, e.g. ``x``)."""

    name: str

    def __str__(self) -> str:
        return self.name


@dataclass(frozen=True)
class Const:
    """An integer constant term."""

    value: int

    def __str__(self) -> str:
        return str(self.value)


@dataclass(frozen=True)
class Wildcard:
    """An anonymous variable ``_`` — binds nothing, matches anything.

    Each occurrence is independent; the parser assigns a unique ordinal
    so two wildcards in one atom do not accidentally unify.
    """

    ordinal: int = 0

    def __str__(self) -> str:
        return "_"


@dataclass(frozen=True)
class BinExpr:
    """A binary arithmetic expression over variables/constants.

    Only what the benchmark programs need: e.g. ``d1 + d2`` inside
    SSSP's ``MIN(d1 + d2)`` head term.
    """

    op: str
    left: Union[Var, Const]
    right: Union[Var, Const]

    def __post_init__(self) -> None:
        if self.op not in ARITH_OPS:
            raise ValueError(f"unsupported arithmetic operator {self.op!r}")

    def variables(self) -> set[str]:
        return {t.name for t in (self.left, self.right) if isinstance(t, Var)}

    def __str__(self) -> str:
        return f"{self.left} {self.op} {self.right}"


@dataclass(frozen=True)
class AggTerm:
    """An aggregate head term ``AGG(expr)`` (Section 3.3)."""

    op: str
    expr: Union[Var, Const, BinExpr]

    def __post_init__(self) -> None:
        if self.op not in AGG_OPS:
            raise ValueError(f"unsupported aggregate {self.op!r}")

    def variables(self) -> set[str]:
        if isinstance(self.expr, Var):
            return {self.expr.name}
        if isinstance(self.expr, BinExpr):
            return self.expr.variables()
        return set()

    def __str__(self) -> str:
        return f"{self.op}({self.expr})"


Term = Union[Var, Const, Wildcard, AggTerm, BinExpr]


@dataclass(frozen=True)
class Atom:
    """A predicate applied to terms, e.g. ``tc(x, y)`` or ``!tc(x, y)``."""

    pred: str
    terms: tuple[Term, ...]
    negated: bool = False

    @property
    def arity(self) -> int:
        return len(self.terms)

    def variables(self) -> set[str]:
        """Names of all (named) variables occurring in this atom."""
        out: set[str] = set()
        for t in self.terms:
            if isinstance(t, Var):
                out.add(t.name)
            elif isinstance(t, (AggTerm, BinExpr)):
                out |= t.variables()
        return out

    def __str__(self) -> str:
        inner = ", ".join(str(t) for t in self.terms)
        return f"{'!' if self.negated else ''}{self.pred}({inner})"


@dataclass(frozen=True)
class Condition:
    """A builtin comparison in a rule body, e.g. ``x != y``."""

    op: str
    left: Union[Var, Const]
    right: Union[Var, Const]

    def __post_init__(self) -> None:
        if self.op not in COMPARISON_OPS:
            raise ValueError(f"unsupported comparison {self.op!r}")

    def variables(self) -> set[str]:
        return {t.name for t in (self.left, self.right) if isinstance(t, Var)}

    def __str__(self) -> str:
        return f"{self.left} {self.op} {self.right}"


@dataclass(frozen=True)
class Rule:
    """``head :- body_atoms, conditions.``

    ``body`` keeps the textual order of atoms (both positive and
    negated); ``conditions`` holds the builtin comparisons.
    """

    head: Atom
    body: tuple[Atom, ...] = ()
    conditions: tuple[Condition, ...] = ()

    @property
    def positive_body(self) -> tuple[Atom, ...]:
        return tuple(a for a in self.body if not a.negated)

    @property
    def negated_body(self) -> tuple[Atom, ...]:
        return tuple(a for a in self.body if a.negated)

    @property
    def is_fact(self) -> bool:
        return not self.body and not self.conditions

    def body_predicates(self) -> set[str]:
        return {a.pred for a in self.body}

    def has_aggregation(self) -> bool:
        return any(isinstance(t, AggTerm) for t in self.head.terms)

    def __str__(self) -> str:
        if self.is_fact:
            return f"{self.head}."
        parts = [str(a) for a in self.body] + [str(c) for c in self.conditions]
        return f"{self.head} :- {', '.join(parts)}."


@dataclass(frozen=True)
class Program:
    """A finite set of rules (kept in source order)."""

    rules: tuple[Rule, ...] = field(default_factory=tuple)

    def predicates(self) -> set[str]:
        out: set[str] = set()
        for r in self.rules:
            out.add(r.head.pred)
            out |= r.body_predicates()
        return out

    def idb_predicates(self) -> set[str]:
        """Predicates appearing in at least one rule head (Section 3.1)."""
        return {r.head.pred for r in self.rules}

    def edb_predicates(self) -> set[str]:
        """Predicates appearing only in rule bodies."""
        return self.predicates() - self.idb_predicates()

    def rules_for(self, pred: str) -> tuple[Rule, ...]:
        return tuple(r for r in self.rules if r.head.pred == pred)

    def __str__(self) -> str:
        return "\n".join(str(r) for r in self.rules)
