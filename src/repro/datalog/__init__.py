"""Datalog language substrate: AST, parser, analyzer, benchmark programs.

This package implements the front half of RecStep's pipeline (Figure 1
of the paper): ``.datalog`` text -> parsed :class:`~repro.datalog.ast.Program`
-> analyzed :class:`~repro.datalog.analyzer.AnalyzedProgram` (IDB/EDB
split, dependency graph, stratification). The back half (query
generation + interpretation) lives in :mod:`repro.core`.
"""
from repro.datalog.ast import (  # noqa: F401
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
from repro.datalog.parser import parse_program, parse_rule  # noqa: F401
from repro.datalog.analyzer import AnalyzedProgram, analyze  # noqa: F401
