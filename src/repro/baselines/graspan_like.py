"""Graspan-like engine: single-threaded worklist over binary grammars.

Graspan [25] casts program analyses as context-free-language
reachability over an edge-labeled graph: a grammar of (at most binary)
productions over edge labels, solved with a worklist of newly derived
edges. It is restricted to binary relations and pays heavy per-edge
processing — the paper measures it at the lowest CPU efficiency of the
compared systems (Table 4 lists it only for CSDA/CSPA).

This module reproduces that algorithmic profile: a pure-Python worklist
fixpoint over adjacency sets. Productions:

- ``head := body``                  (unary copy)
- ``head := left . right``          (composition: head(u,w) from
                                     left(u,v), right(v,w))

Reversed relations are first-class: for any label ``L`` marked tracked,
the engine maintains ``L~`` (every (u,v) also appears as (v,u) under
``L~``), which is how rules like ``valueAlias(x,y) :- valueFlow(z,x),
valueFlow(z,y)`` binarize (``va := vf~ . vf``). Reflexive seeds add
``head(x,x)``/``head(y,y)`` for each edge of a source label (CSPA's
``valueFlow(x,x) :- assign(x,y)`` family).

``cspa_grammar``/``csda_grammar`` give the benchmark grammars; their
results are cross-checked against the Datalog engines in tests.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field

import pandas as pd


@dataclass(frozen=True)
class Grammar:
    """A binary chain grammar over edge labels."""

    unary: tuple[tuple[str, str], ...] = ()
    binary: tuple[tuple[str, str, str], ...] = ()
    #: labels L for which the reversed label "L~" is maintained
    tracked_reverse: tuple[str, ...] = ()
    #: (head, source): add head(x, x) and head(y, y) per source edge (x, y)
    reflexive_seeds: tuple[tuple[str, str], ...] = ()

    def labels(self) -> set[str]:
        out = set(self.tracked_reverse)
        for h, b in self.unary:
            out |= {h, b}
        for h, l, r in self.binary:
            out |= {h, l, r}
        for h, s in self.reflexive_seeds:
            out |= {h, s}
        return out


def reverse_label(label: str) -> str:
    return label + "~"


class GraspanLikeEngine:
    """Worklist CFL-reachability solver (single-threaded, set-based)."""

    def __init__(self) -> None:
        self.edges_processed = 0

    def solve(
        self, grammar: Grammar, edb: dict[str, pd.DataFrame]
    ) -> dict[str, set[tuple[int, int]]]:
        """Run the fixpoint; returns every label's edge set (including
        derived and reversed labels)."""
        labels = grammar.labels() | {
            reverse_label(l) for l in grammar.tracked_reverse
        }
        known: dict[str, set[tuple[int, int]]] = {l: set() for l in labels}
        fwd: dict[str, dict[int, set[int]]] = {l: {} for l in labels}
        bwd: dict[str, dict[int, set[int]]] = {l: {} for l in labels}
        # production indexes: what to try when an edge with label L pops
        by_unary: dict[str, list[str]] = {}
        for h, b in grammar.unary:
            by_unary.setdefault(b, []).append(h)
        left_of: dict[str, list[tuple[str, str]]] = {}
        right_of: dict[str, list[tuple[str, str]]] = {}
        for h, l, r in grammar.binary:
            left_of.setdefault(l, []).append((h, r))
            right_of.setdefault(r, []).append((h, l))

        work: deque[tuple[str, int, int]] = deque()

        def add(label: str, u: int, v: int) -> None:
            if (u, v) in known[label]:
                return
            known[label].add((u, v))
            fwd[label].setdefault(u, set()).add(v)
            bwd[label].setdefault(v, set()).add(u)
            work.append((label, u, v))
            if label in grammar.tracked_reverse:
                add(reverse_label(label), v, u)

        for label, df in edb.items():
            if label not in known:
                continue
            for u, v in df.itertuples(index=False):
                add(label, int(u), int(v))
        for head, source in grammar.reflexive_seeds:
            src = edb.get(source)
            if src is None:
                continue
            for u, v in src.itertuples(index=False):
                add(head, int(u), int(u))
                add(head, int(v), int(v))

        while work:
            label, u, v = work.popleft()
            self.edges_processed += 1
            for head in by_unary.get(label, ()):
                add(head, u, v)
            # edge is the left operand: head(u, w) from label(u, v), right(v, w)
            for head, right in left_of.get(label, ()):
                for w in fwd[right].get(v, ()):
                    add(head, u, w)
            # edge is the right operand: head(t, v) from left(t, u), label(u, v)
            for head, left in right_of.get(label, ()):
                for t in bwd[left].get(u, ()):
                    add(head, t, v)
        return known


def csda_grammar() -> Grammar:
    """null := nullEdge | null . arc  — the CSDA dataflow grammar."""
    return Grammar(
        unary=(("null", "nullEdge"),),
        binary=(("null", "null", "arc"),),
    )


def cspa_grammar() -> Grammar:
    """The CSPA grammar, binarized with reversed labels and temporaries.

    vf := assign | assign . ma | vf . vf
    ma := t1 . dereference          where t1 := dereference~ . va
    va := vf~ . vf | t2 . vf        where t2 := vf~ . ma
    plus the reflexive valueFlow/memoryAlias seeds over assign endpoints.
    """
    return Grammar(
        unary=(("vf", "assign"),),
        binary=(
            ("vf", "assign", "ma"),
            ("vf", "vf", "vf"),
            ("t1", "dereference~", "va"),
            ("ma", "t1", "dereference"),
            ("va", "vf~", "vf"),
            ("t2", "vf~", "ma"),
            ("va", "t2", "vf"),
        ),
        tracked_reverse=("vf", "dereference"),
        reflexive_seeds=(("vf", "assign"), ("ma", "assign")),
    )


def solve_csda(edb: dict[str, pd.DataFrame]) -> pd.DataFrame:
    """Convenience: run CSDA, return the null relation as (c0, c1)."""
    eng = GraspanLikeEngine()
    out = eng.solve(csda_grammar(), edb)
    return _to_pdf(out["null"])


def solve_cspa(edb: dict[str, pd.DataFrame]) -> dict[str, pd.DataFrame]:
    """Convenience: run CSPA, return valueFlow/memoryAlias/valueAlias."""
    eng = GraspanLikeEngine()
    out = eng.solve(cspa_grammar(), edb)
    return {
        "valueFlow": _to_pdf(out["vf"]),
        "memoryAlias": _to_pdf(out["ma"]),
        "valueAlias": _to_pdf(out["va"]),
    }


def _to_pdf(edges: set[tuple[int, int]]) -> pd.DataFrame:
    if not edges:
        return pd.DataFrame({"c0": pd.Series([], dtype="int64"),
                             "c1": pd.Series([], dtype="int64")})
    return pd.DataFrame(sorted(edges), columns=["c0", "c1"]).astype("int64")
