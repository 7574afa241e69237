"""Single-node in-memory semi-naive Datalog engine (Souffle-like profile).

Souffle compiles Datalog to parallel C++ over in-memory tables with low
per-iteration overhead. This module reproduces that *profile* — a
single-process, vectorized (pandas/numpy) semi-naive evaluator with no
query-planning or scheduling overhead per iteration — and doubles as the
repo's independent reference implementation: the Spark engines are
checked against it, and it is itself checked against DuckDB
``WITH RECURSIVE`` on the linear programs.

Language support matches Souffle's as described in the paper (Table 1):
stratified negation and non-recursive aggregation are supported;
**recursive aggregation is rejected** unless ``allow_recursive_aggregation``
is passed (the full-featured mode used when this engine serves as the
oracle for CC/SSSP).

Relations are pandas DataFrames with positional columns ``c0..c{k-1}``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.datalog.analyzer import AnalyzedProgram, Stratum
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


class UnsupportedProgramError(ValueError):
    """Raised when a program uses a feature this engine variant rejects."""


def _cols(arity: int) -> list[str]:
    return [f"c{i}" for i in range(arity)]


def normalize_relation(df: pd.DataFrame, arity: int) -> pd.DataFrame:
    """Rename a user-supplied EDB frame to positional columns and dedup."""
    if len(df.columns) != arity:
        raise ValueError(f"expected {arity} columns, got {list(df.columns)}")
    out = df.copy()
    out.columns = _cols(arity)
    return out.drop_duplicates().reset_index(drop=True)


def _empty(arity: int, dtypes: tuple[str, ...] | None = None) -> pd.DataFrame:
    cols = _cols(arity)
    data = {}
    for i, c in enumerate(cols):
        dt = "float64" if dtypes and dtypes[i] == "double" else "int64"
        data[c] = pd.Series([], dtype=dt)
    return pd.DataFrame(data)


@dataclass
class _BodyResult:
    """Result of evaluating a rule body: a frame whose columns are the
    rule's variable names (one column per distinct variable)."""

    frame: pd.DataFrame


def _atom_frame(atom: Atom, rel: pd.DataFrame) -> pd.DataFrame:
    """Project one atom against its relation: constants filtered,
    repeated variables unified, columns renamed to variable names."""
    df = rel
    mask = None
    first_col_of: dict[str, str] = {}
    keep: dict[str, str] = {}  # source col -> var name
    for pos, term in enumerate(atom.terms):
        col = f"c{pos}"
        if isinstance(term, Const):
            m = df[col] == term.value
            mask = m if mask is None else (mask & m)
        elif isinstance(term, Var):
            if term.name in first_col_of:
                m = df[col] == df[first_col_of[term.name]]
                mask = m if mask is None else (mask & m)
            else:
                first_col_of[term.name] = col
                keep[col] = term.name
        elif isinstance(term, Wildcard):
            continue
        else:  # pragma: no cover - parser forbids agg/arith in body atoms
            raise UnsupportedProgramError(f"unsupported body term {term}")
    if mask is not None:
        df = df[mask]
    out = df[list(keep)].copy()
    out.columns = [keep[c] for c in keep]
    return out


def _apply_conditions(frame: pd.DataFrame, conditions: tuple[Condition, ...]) -> pd.DataFrame:
    for cond in conditions:
        left = frame[cond.left.name] if isinstance(cond.left, Var) else cond.left.value
        right = frame[cond.right.name] if isinstance(cond.right, Var) else cond.right.value
        op = cond.op
        if op == "=":
            frame = frame[left == right]
        elif op == "!=":
            frame = frame[left != right]
        elif op == "<":
            frame = frame[left < right]
        elif op == "<=":
            frame = frame[left <= right]
        elif op == ">":
            frame = frame[left > right]
        else:
            frame = frame[left >= right]
    return frame


def _anti_join(frame: pd.DataFrame, atom: Atom, rel: pd.DataFrame) -> pd.DataFrame:
    """Remove rows of ``frame`` matching the negated ``atom``."""
    probe = _atom_frame(atom, rel).drop_duplicates()
    on = list(probe.columns)
    if not on:
        # Negated atom of only constants/wildcards: if any relation row
        # matches the constant pattern the whole body fails, else no-op.
        return frame.iloc[0:0] if len(probe) > 0 else frame
    merged = frame.merge(probe, on=on, how="left", indicator=True)
    return merged[merged["_merge"] == "left_only"].drop(columns="_merge")


def _expr_series(expr, frame: pd.DataFrame):
    if isinstance(expr, Const):
        return expr.value
    if isinstance(expr, Var):
        return frame[expr.name]
    if isinstance(expr, BinExpr):
        left = _expr_series(expr.left, frame)
        right = _expr_series(expr.right, frame)
        if expr.op == "+":
            return left + right
        if expr.op == "-":
            return left - right
        return left * right
    raise UnsupportedProgramError(f"unsupported expression {expr}")


def evaluate_rule_body(
    rule: Rule,
    rels: dict[str, pd.DataFrame],
    delta_idx: int | None = None,
    delta: pd.DataFrame | None = None,
) -> pd.DataFrame:
    """Join the rule body left-to-right; returns a frame keyed by variable.

    When ``delta_idx`` is given, positive body atom #``delta_idx`` reads
    from ``delta`` instead of its full relation (the semi-naive rewrite).
    """
    acc: pd.DataFrame | None = None
    pos_idx = -1
    for atom in rule.body:
        if atom.negated:
            continue
        pos_idx += 1
        rel = delta if (delta_idx is not None and pos_idx == delta_idx) else rels[atom.pred]
        part = _atom_frame(atom, rel)
        if acc is None:
            acc = part
            continue
        shared = [c for c in part.columns if c in acc.columns]
        if shared:
            acc = acc.merge(part, on=shared, how="inner")
        else:
            acc = acc.merge(part, how="cross")
        if acc.empty:
            break
    if acc is None:  # body had no positive atoms: a fact rule
        acc = pd.DataFrame({"__dummy": [0]})
    if not acc.empty:
        acc = _apply_conditions(acc, rule.conditions)
        for atom in rule.negated_body:
            if acc.empty:
                break
            acc = _anti_join(acc, atom, rels[atom.pred])
    return acc


def project_head(rule: Rule, body: pd.DataFrame) -> pd.DataFrame:
    """Project the body frame onto the head terms (pre-aggregation:
    aggregate terms are materialized as plain value columns)."""
    arity = rule.head.arity
    out = pd.DataFrame(index=body.index)
    for pos, term in enumerate(rule.head.terms):
        col = f"c{pos}"
        if isinstance(term, Var):
            out[col] = body[term.name]
        elif isinstance(term, Const):
            out[col] = term.value
        elif isinstance(term, AggTerm):
            out[col] = _expr_series(term.expr, body)
        elif isinstance(term, BinExpr):
            out[col] = _expr_series(term, body)
        else:
            raise UnsupportedProgramError(f"unsupported head term {term}")
    return out[_cols(arity)]


_AGG_FN = {"MIN": "min", "MAX": "max", "SUM": "sum", "AVG": "mean", "COUNT": "count"}


def _aggregate(analyzed: AnalyzedProgram, pred: str, pre: pd.DataFrame) -> pd.DataFrame:
    """Apply the IDB's aggregation layout to the deduped pre-agg frame."""
    spec = analyzed.agg_specs[pred]
    group = [f"c{i}" for i in spec.group_positions]
    val = f"c{spec.agg_position}"
    pre = pre.drop_duplicates()
    if not group:
        agg = getattr(pre[val], _AGG_FN[spec.op])()
        return pd.DataFrame({val: [agg]})
    out = pre.groupby(group, as_index=False)[val].agg(_AGG_FN[spec.op])
    return out[_cols(len(spec.group_positions) + 1)]


def _set_difference(new: pd.DataFrame, full: pd.DataFrame) -> pd.DataFrame:
    if full.empty or new.empty:
        return new
    on = list(new.columns)
    merged = new.merge(full, on=on, how="left", indicator=True)
    return merged[merged["_merge"] == "left_only"].drop(columns="_merge")


def _meld_merge(
    analyzed: AnalyzedProgram,
    pred: str,
    current: pd.DataFrame,
    candidates: pd.DataFrame,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """MIN/MAX meld: merge candidate rows into the per-group best.

    Returns ``(new_relation, delta)`` where delta holds groups whose best
    value strictly improved (or appeared).
    """
    spec = analyzed.agg_specs[pred]
    group = [f"c{i}" for i in spec.group_positions]
    val = f"c{spec.agg_position}"
    cand = candidates.groupby(group, as_index=False)[val].agg(_AGG_FN[spec.op])
    cand = cand[list(current.columns)]
    if current.empty:
        cand = cand.reset_index(drop=True)
        return cand, cand.copy()
    both = pd.concat([current, cand], ignore_index=True)
    best = both.groupby(group, as_index=False)[val].agg(_AGG_FN[spec.op])
    joined = best.merge(current, on=group, how="left", suffixes=("", "_old"))
    old = joined[f"{val}_old"]
    improved = joined[old.isna() | (joined[val] != old)]
    delta = improved[list(best.columns)].reset_index(drop=True)
    return best[list(current.columns)].reset_index(drop=True), delta


def _dedup(df: pd.DataFrame) -> pd.DataFrame:
    return df.drop_duplicates().reset_index(drop=True)


class SouffleLikeEngine:
    """Semi-naive evaluation of an analyzed program over pandas frames.

    Parameters
    ----------
    allow_recursive_aggregation:
        Souffle does not support recursive aggregation (Table 1 of the
        paper); the baseline uses ``False`` and raises
        :class:`UnsupportedProgramError` on CC/SSSP. The oracle mode used
        by tests passes ``True``.
    """

    def __init__(self, *, allow_recursive_aggregation: bool = False) -> None:
        self.allow_recursive_aggregation = allow_recursive_aggregation
        self.iterations: dict[str, int] = {}

    # -- public API ----------------------------------------------------
    def evaluate(
        self, analyzed: AnalyzedProgram, edb: dict[str, pd.DataFrame]
    ) -> dict[str, pd.DataFrame]:
        """Evaluate the program; returns every IDB as a deduped frame."""
        if analyzed.meld_idbs and not self.allow_recursive_aggregation:
            raise UnsupportedProgramError(
                "recursive aggregation is not supported by the Souffle-like "
                f"engine (melded IDBs: {sorted(analyzed.meld_idbs)})"
            )
        types = analyzed.infer_types(
            {
                p: tuple(
                    "double" if pd.api.types.is_float_dtype(dt) else "long"
                    for dt in normalize_relation(edb[p], analyzed.arities[p]).dtypes
                )
                for p in analyzed.edbs
            }
        )
        rels: dict[str, pd.DataFrame] = {
            p: normalize_relation(edb[p], analyzed.arities[p]) for p in analyzed.edbs
        }
        for p in analyzed.idbs:
            rels[p] = _empty(analyzed.arities[p], types.get(p))
        self.iterations = {}
        for stratum in analyzed.strata:
            self._evaluate_stratum(analyzed, stratum, rels)
        return {p: rels[p] for p in analyzed.idbs}

    # -- stratum evaluation ---------------------------------------------
    def _eval_all_rules(
        self,
        analyzed: AnalyzedProgram,
        pred: str,
        rules: tuple[Rule, ...],
        rels: dict[str, pd.DataFrame],
    ) -> pd.DataFrame:
        parts = []
        for rule in rules:
            body = evaluate_rule_body(rule, rels)
            if body.empty:
                continue
            parts.append(project_head(rule, body))
        if not parts:
            return _empty(analyzed.arities[pred])
        return pd.concat(parts, ignore_index=True)

    def _eval_delta_rules(
        self,
        analyzed: AnalyzedProgram,
        stratum: Stratum,
        pred: str,
        rels: dict[str, pd.DataFrame],
        deltas: dict[str, pd.DataFrame],
    ) -> pd.DataFrame:
        """Union of all semi-naive delta subqueries for ``pred``."""
        parts = []
        for rule in stratum.rules:
            if rule.head.pred != pred:
                continue
            rec_positions = [
                i
                for i, a in enumerate(rule.positive_body)
                if a.pred in stratum.predicates
            ]
            if not rec_positions:
                continue  # exit rule: contributes only at iteration 0
            for i in rec_positions:
                atom_pred = rule.positive_body[i].pred
                delta = deltas[atom_pred]
                if delta.empty:
                    continue
                body = evaluate_rule_body(rule, rels, delta_idx=i, delta=delta)
                if body.empty:
                    continue
                parts.append(project_head(rule, body))
        if not parts:
            return _empty(analyzed.arities[pred])
        return pd.concat(parts, ignore_index=True)

    def _evaluate_stratum(
        self,
        analyzed: AnalyzedProgram,
        stratum: Stratum,
        rels: dict[str, pd.DataFrame],
    ) -> None:
        preds = sorted(stratum.predicates)
        if not stratum.recursive:
            for pred in preds:
                raw = self._eval_all_rules(analyzed, pred, analyzed.program.rules_for(pred), rels)
                if pred in analyzed.agg_specs:
                    rels[pred] = _aggregate(analyzed, pred, raw)
                else:
                    rels[pred] = _dedup(raw)
                self.iterations[pred] = 1
            return

        # Iteration 0: all rules with same-stratum IDBs still empty (only
        # exit rules can fire), establishing R = delta = base facts.
        deltas: dict[str, pd.DataFrame] = {}
        for pred in preds:
            raw = self._eval_all_rules(analyzed, pred, analyzed.program.rules_for(pred), rels)
            if pred in analyzed.meld_idbs:
                if raw.empty:
                    deltas[pred] = _empty(analyzed.arities[pred])
                else:
                    rels[pred], deltas[pred] = _meld_merge(
                        analyzed, pred, rels[pred], raw
                    )
            else:
                deduped = _dedup(raw)
                deltas[pred] = deduped
                rels[pred] = deduped
            self.iterations[pred] = 1

        while any(not d.empty for d in deltas.values()):
            new_deltas: dict[str, pd.DataFrame] = {}
            for pred in preds:
                raw = self._eval_delta_rules(analyzed, stratum, pred, rels, deltas)
                if pred in analyzed.meld_idbs:
                    if raw.empty:
                        new_deltas[pred] = _empty(analyzed.arities[pred])
                    else:
                        rels[pred], new_deltas[pred] = _meld_merge(
                            analyzed, pred, rels[pred], raw
                        )
                else:
                    r_delta = _dedup(raw)
                    delta_r = _set_difference(r_delta, rels[pred])
                    new_deltas[pred] = delta_r
                    if not delta_r.empty:
                        rels[pred] = pd.concat(
                            [rels[pred], delta_r], ignore_index=True
                        )
                self.iterations[pred] += 1
            deltas = new_deltas


def evaluate(
    program_or_analyzed,
    edb: dict[str, pd.DataFrame],
    *,
    allow_recursive_aggregation: bool = True,
) -> dict[str, pd.DataFrame]:
    """Convenience one-shot evaluation (oracle mode by default)."""
    from repro.datalog.analyzer import analyze
    from repro.datalog.ast import Program

    analyzed = (
        analyze(program_or_analyzed)
        if isinstance(program_or_analyzed, Program)
        else program_or_analyzed
    )
    eng = SouffleLikeEngine(allow_recursive_aggregation=allow_recursive_aggregation)
    return eng.evaluate(analyzed, edb)
