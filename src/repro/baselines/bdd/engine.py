"""BDDBDDB-like evaluation of linear binary-chain Datalog over BDDs.

Encoding: a binary relation R(x, y) over the domain [0, 2^k) is a BDD
over 2k boolean variables. Three "rails" (x, z, y) are interleaved so
bit i of every rail sits adjacently::

    var(rail, bit) = 3 * bit + rail        rail 0 = x, 1 = z, 2 = y

Interleaving keeps the rail-shift renames (x->z on the step relation's
left column, y->z on the closure's right column) order-preserving, so
:meth:`BDD.rename` stays linear — the same trick BDDBDDB's default
variable orders use.

The engine evaluates the closure family the paper benchmarks BDDBDDB on
(TC; CSDA is the same shape with different seeds)::

    closure(x, y) :- seed(x, y).
    closure(x, y) :- closure(x, z), step(z, y).

semi-naively: Δ' = exists_z(Δ[y->z] AND step[x->z]) minus closure. Like
BDDBDDB, cost depends on the domain's bit-width and variable order, not
on tuple counts — small dense domains are fine, big sparse ones are not.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.bdd.bdd import BDD, ZERO

RAIL_X, RAIL_Z, RAIL_Y = 0, 1, 2


def _bits_needed(max_value: int) -> int:
    return max(int(max_value).bit_length(), 1)


class BddClosureEngine:
    """Transitive-closure-shaped Datalog over an ROBDD backend."""

    def __init__(self) -> None:
        self.bdd = BDD()
        self.iterations = 0

    # -- encoding helpers ------------------------------------------------
    @staticmethod
    def _var(rail: int, bit: int) -> int:
        return 3 * bit + rail

    def _pair_assignment(self, x: int, y: int, bits: int) -> dict[int, bool]:
        a: dict[int, bool] = {}
        for b in range(bits):
            a[self._var(RAIL_X, b)] = bool((x >> b) & 1)
            a[self._var(RAIL_Y, b)] = bool((y >> b) & 1)
        return a

    def encode_pairs(self, pairs: pd.DataFrame, bits: int) -> int:
        """Encode a two-column frame as a BDD over rails (x, y)."""
        return self.bdd.from_assignments(
            self._pair_assignment(int(u), int(v), bits)
            for u, v in pairs.iloc[:, :2].itertuples(index=False)
        )

    def decode_pairs(self, node: int, bits: int) -> pd.DataFrame:
        support = tuple(
            sorted(
                [self._var(RAIL_X, b) for b in range(bits)]
                + [self._var(RAIL_Y, b) for b in range(bits)]
            )
        )
        rows = []
        for a in self.bdd.satisfying_assignments(node, support):
            x = sum(1 << b for b in range(bits) if a[self._var(RAIL_X, b)])
            y = sum(1 << b for b in range(bits) if a[self._var(RAIL_Y, b)])
            rows.append((x, y))
        if not rows:
            return pd.DataFrame({"c0": pd.Series([], dtype="int64"),
                                 "c1": pd.Series([], dtype="int64")})
        return pd.DataFrame(sorted(rows), columns=["c0", "c1"]).astype("int64")

    # -- closure evaluation -------------------------------------------------
    def closure(
        self, seed: pd.DataFrame, step: pd.DataFrame, *, max_value: int
    ) -> pd.DataFrame:
        """Fixpoint of ``closure := seed | closure . step`` as BDD ops."""
        bits = _bits_needed(max_value)
        bdd = self.bdd
        y_to_z = {self._var(RAIL_Y, b): self._var(RAIL_Z, b) for b in range(bits)}
        x_to_z = {self._var(RAIL_X, b): self._var(RAIL_Z, b) for b in range(bits)}
        z_vars = frozenset(self._var(RAIL_Z, b) for b in range(bits))

        seed_bdd = self.encode_pairs(seed, bits)
        # step(z, y): encode as (x, y) then shift the x rail onto z.
        step_bdd = bdd.rename(self.encode_pairs(step, bits), x_to_z)

        closure = seed_bdd
        delta = seed_bdd
        self.iterations = 0
        while delta != ZERO:
            self.iterations += 1
            # Δ(x, z) ∧ step(z, y), ∃z  — the relational product.
            delta_xz = bdd.rename(delta, y_to_z)
            joined = bdd.apply_and(delta_xz, step_bdd)
            new = bdd.exists(joined, z_vars)
            delta = bdd.apply_diff(new, closure)
            closure = bdd.apply_or(closure, delta)
        return self.decode_pairs(closure, bits)

    def transitive_closure(self, arc: pd.DataFrame, *, max_value: int) -> pd.DataFrame:
        """TC: seed and step are both the arc relation."""
        return self.closure(arc, arc, max_value=max_value)

    def csda(self, null_edge: pd.DataFrame, arc: pd.DataFrame, *, max_value: int) -> pd.DataFrame:
        """CSDA: null seeds closed under the control-flow arcs."""
        return self.closure(null_edge, arc, max_value=max_value)
