"""A reduced ordered BDD (ROBDD) package.

Classic Bryant-style implementation:

- nodes live in an arena of ``(var, lo, hi)`` triples, hash-consed
  through a unique table so equal functions share one node (canonical);
- terminals are the constants ``ZERO`` (0) and ``ONE`` (1);
- ``apply`` computes binary boolean combinations with memoization;
- ``exists`` quantifies a set of variables away;
- ``rename`` substitutes variables through an **order-preserving** map
  (the only kind relational rail-shifting needs), rebuilding bottom-up.

Variables are dense non-negative ints; smaller index = nearer the root.
Relations encode tuples bitwise: see :mod:`repro.baselines.bdd.engine`
for the rail/interleaving convention.
"""
from __future__ import annotations

from typing import Callable, Iterable

ZERO = 0
ONE = 1


class BDD:
    """A BDD manager: node arena + unique table + operation caches."""

    def __init__(self) -> None:
        # index 0/1 reserved for terminals; var of terminals = +inf marker
        self._var: list[int] = [1 << 30, 1 << 30]
        self._lo: list[int] = [0, 1]
        self._hi: list[int] = [0, 1]
        self._unique: dict[tuple[int, int, int], int] = {}
        self._apply_cache: dict[tuple, int] = {}

    # -- construction ----------------------------------------------------
    def mk(self, var: int, lo: int, hi: int) -> int:
        """Get-or-create the canonical node (var, lo, hi)."""
        if lo == hi:
            return lo
        key = (var, lo, hi)
        node = self._unique.get(key)
        if node is None:
            node = len(self._var)
            self._var.append(var)
            self._lo.append(lo)
            self._hi.append(hi)
            self._unique[key] = node
        return node

    def var_node(self, var: int) -> int:
        return self.mk(var, ZERO, ONE)

    @property
    def num_nodes(self) -> int:
        return len(self._var)

    def var_of(self, node: int) -> int:
        return self._var[node]

    # -- boolean combinators ----------------------------------------------
    def _apply(self, a: int, b: int, op: str, fn: Callable[[int, int], int]) -> int:
        key = (op, a, b)
        cached = self._apply_cache.get(key)
        if cached is not None:
            return cached
        if a <= ONE and b <= ONE:
            result = fn(a, b)
        else:
            va, vb = self._var[a], self._var[b]
            v = min(va, vb)
            a_lo, a_hi = (self._lo[a], self._hi[a]) if va == v else (a, a)
            b_lo, b_hi = (self._lo[b], self._hi[b]) if vb == v else (b, b)
            result = self.mk(
                v,
                self._apply(a_lo, b_lo, op, fn),
                self._apply(a_hi, b_hi, op, fn),
            )
        self._apply_cache[key] = result
        return result

    def apply_and(self, a: int, b: int) -> int:
        if a == ZERO or b == ZERO:
            return ZERO
        if a == ONE:
            return b
        if b == ONE:
            return a
        return self._apply(a, b, "and", lambda x, y: x & y)

    def apply_or(self, a: int, b: int) -> int:
        if a == ONE or b == ONE:
            return ONE
        if a == ZERO:
            return b
        if b == ZERO:
            return a
        return self._apply(a, b, "or", lambda x, y: x | y)

    def apply_diff(self, a: int, b: int) -> int:
        """a AND NOT b — the set-difference of relations."""
        if a == ZERO or b == ONE:
            return ZERO
        if b == ZERO:
            return a
        return self._apply(a, b, "diff", lambda x, y: x & (1 - y))

    # -- quantification / substitution -------------------------------------
    def exists(self, node: int, vars: frozenset[int]) -> int:
        """Existentially quantify away ``vars``."""
        key = ("exists", node, vars)
        cached = self._apply_cache.get(key)
        if cached is not None:
            return cached
        if node <= ONE:
            return node
        v = self._var[node]
        lo = self.exists(self._lo[node], vars)
        hi = self.exists(self._hi[node], vars)
        result = self.apply_or(lo, hi) if v in vars else self.mk(v, lo, hi)
        self._apply_cache[key] = result
        return result

    def rename(self, node: int, mapping: dict[int, int]) -> int:
        """Substitute variables via an order-preserving map.

        Requires: for all u < v in the node's support, map(u) < map(v)
        (identity outside the map). Rail shifts in the interleaved
        encoding satisfy this, keeping rename linear.
        """
        key = ("rename", node, tuple(sorted(mapping.items())))
        cached = self._apply_cache.get(key)
        if cached is not None:
            return cached
        if node <= ONE:
            return node
        v = self._var[node]
        result = self.mk(
            mapping.get(v, v),
            self.rename(self._lo[node], mapping),
            self.rename(self._hi[node], mapping),
        )
        self._apply_cache[key] = result
        return result

    # -- relation <-> tuples -----------------------------------------------
    def cube(self, assignment: dict[int, bool]) -> int:
        """The conjunction of literals (built bottom-up in var order)."""
        node = ONE
        for var in sorted(assignment, reverse=True):
            node = self.mk(var, ZERO, node) if assignment[var] else self.mk(var, node, ZERO)
        return node

    def from_assignments(self, assignments: Iterable[dict[int, bool]]) -> int:
        node = ZERO
        for a in assignments:
            node = self.apply_or(node, self.cube(a))
        return node

    def satisfying_assignments(
        self, node: int, support: tuple[int, ...]
    ) -> list[dict[int, bool]]:
        """All assignments over ``support`` (sorted var tuple) satisfying
        the function; variables absent from a path expand both ways."""
        out: list[dict[int, bool]] = []

        def walk(n: int, idx: int, partial: dict[int, bool]) -> None:
            if n == ZERO:
                return
            if idx == len(support):
                assert n == ONE, "support must cover the node's variables"
                out.append(dict(partial))
                return
            v = support[idx]
            nv = self._var[n] if n > ONE else (1 << 30)
            if nv == v:
                partial[v] = False
                walk(self._lo[n], idx + 1, partial)
                partial[v] = True
                walk(self._hi[n], idx + 1, partial)
                del partial[v]
            else:
                # v not tested on this path: both branches satisfy
                partial[v] = False
                walk(n, idx + 1, partial)
                partial[v] = True
                walk(n, idx + 1, partial)
                del partial[v]

        walk(node, 0, {})
        return out

    def count_satisfying(self, node: int, support: tuple[int, ...]) -> int:
        """Number of satisfying assignments over the sorted ``support``
        tuple (variables untested on a path double the count)."""
        memo: dict[tuple[int, int], int] = {}

        def count(n: int, idx: int) -> int:
            if n == ZERO:
                return 0
            if idx == len(support):
                return 1
            key = (n, idx)
            if key in memo:
                return memo[key]
            v = support[idx]
            nv = self._var[n] if n > ONE else (1 << 30)
            if nv == v:
                result = count(self._lo[n], idx + 1) + count(self._hi[n], idx + 1)
            else:
                result = 2 * count(n, idx + 1)
            memo[key] = result
            return result

        return count(node, 0)
