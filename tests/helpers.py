"""Shared test utilities: DuckDB helpers and tiny reference algorithms.

``assert_pandas_equivalent`` is the pandas-side sibling of
``repro.oracle.assert_equivalent`` (which requires a Spark DataFrame):
it runs the SQL in DuckDB over the registered tables and diffs sorted
rows against a pandas result. Spark-engine tests always go through the
real ``repro.oracle.assert_equivalent``.
"""
from __future__ import annotations

import heapq

import duckdb
import pandas as pd


def duckdb_eval(sql: str, **tables: pd.DataFrame) -> pd.DataFrame:
    con = duckdb.connect()
    try:
        for name, t in tables.items():
            con.register(name, t)
        return con.execute(sql).fetchdf()
    finally:
        con.close()


def canon(pdf: pd.DataFrame) -> pd.DataFrame:
    pdf = pdf[sorted(pdf.columns)].reset_index(drop=True).copy()
    for c in pdf.select_dtypes(include=["float", "float64"]).columns:
        pdf[c] = pdf[c].round(6)
    return pdf.sort_values(list(pdf.columns)).reset_index(drop=True)


def assert_pandas_equivalent(got: pd.DataFrame, sql: str, **tables: pd.DataFrame) -> None:
    expected = duckdb_eval(sql, **tables)
    assert set(expected.columns) == set(got.columns), (
        f"column mismatch: {sorted(got.columns)} vs {sorted(expected.columns)}"
    )
    pd.testing.assert_frame_equal(canon(got), canon(expected), check_dtype=False)


# SQL text of the linear recursive benchmark queries, used as the DuckDB
# oracle for both the pandas reference engine and the Spark engines.
TC_SQL = """
WITH RECURSIVE tc(x, y) AS (
    SELECT src, dst FROM arc
    UNION
    SELECT tc.x, arc.dst FROM tc JOIN arc ON tc.y = arc.src
)
SELECT x AS c0, y AS c1 FROM tc
"""

REACH_SQL = """
WITH RECURSIVE reach(y) AS (
    SELECT v FROM id
    UNION
    SELECT arc.dst FROM reach JOIN arc ON reach.y = arc.src
)
SELECT y AS c0 FROM reach
"""

CSDA_SQL = """
WITH RECURSIVE nul(x, y) AS (
    SELECT src, dst FROM nullEdge
    UNION
    SELECT nul.x, arc.dst FROM nul JOIN arc ON nul.y = arc.src
)
SELECT x AS c0, y AS c1 FROM nul
"""


# -- tiny independent reference algorithms (pure python) -------------------

def ref_sssp(arcs: pd.DataFrame, source: int) -> dict[int, float]:
    """Dijkstra over (src, dst, w) rows; returns node -> distance."""
    adj: dict[int, list[tuple[int, float]]] = {}
    for s, d, w in arcs.itertuples(index=False):
        adj.setdefault(int(s), []).append((int(d), float(w)))
    dist = {source: 0.0}
    heap = [(0.0, source)]
    while heap:
        du, u = heapq.heappop(heap)
        if du > dist.get(u, float("inf")):
            continue
        for v, w in adj.get(u, ()):
            nd = du + w
            if nd < dist.get(v, float("inf")):
                dist[v] = nd
                heapq.heappush(heap, (nd, v))
    return dist


def ref_components_min(arcs: pd.DataFrame) -> dict[int, int]:
    """The CC program's semantics: for every vertex x with out-degree>0
    seeded with itself, propagate labels along arcs and keep the minimum
    label reaching each vertex (NOT undirected components — exactly what
    the Datalog program computes)."""
    seeds = sorted(set(int(s) for s in arcs["src"]))
    adj: dict[int, list[int]] = {}
    for s, d in arcs[["src", "dst"]].itertuples(index=False):
        adj.setdefault(int(s), []).append(int(d))
    best: dict[int, int] = {v: v for v in seeds}
    # Label-correcting propagation to fixpoint.
    from collections import deque

    q = deque(seeds)
    while q:
        u = q.popleft()
        lu = best[u]
        for v in adj.get(u, ()):
            if lu < best.get(v, 1 << 62):
                best[v] = lu
                q.append(v)
    return best


def ref_same_generation(arcs: pd.DataFrame) -> set[tuple[int, int]]:
    """Naive fixpoint for SG on small graphs (independent of any engine)."""
    arc = set((int(s), int(d)) for s, d in arcs[["src", "dst"]].itertuples(index=False))
    parents: dict[int, set[int]] = {}
    children: dict[int, set[int]] = {}
    for p, c in arc:
        children.setdefault(p, set()).add(c)
        parents.setdefault(c, set()).add(p)
    sg = {(x, y) for p, cs in children.items() for x in cs for y in cs if x != y}
    changed = True
    while changed:
        changed = False
        new = set()
        for a, b in sg:
            for x in children.get(a, ()):
                for y in children.get(b, ()):
                    if (x, y) not in sg:
                        new.add((x, y))
        if new:
            sg |= new
            changed = True
    return sg


def ref_andersen(edb: dict[str, pd.DataFrame]) -> set[tuple[int, int]]:
    """Naive fixpoint for Andersen's analysis on small inputs."""
    def to_set(df):
        return set((int(a), int(b)) for a, b in df.itertuples(index=False))

    address_of = to_set(edb["addressOf"])
    assign = to_set(edb["assign"])
    load = to_set(edb["load"])
    store = to_set(edb["store"])
    pts = set(address_of)
    while True:
        new = set()
        for (y, z) in assign:
            for (z2, x) in pts:
                if z2 == z and (y, x) not in pts:
                    new.add((y, x))
        for (y, x) in load:
            for (x2, z) in pts:
                if x2 == x:
                    for (z2, w) in pts:
                        if z2 == z and (y, w) not in pts:
                            new.add((y, w))
        for (y, x) in store:
            for (y2, z) in pts:
                if y2 == y:
                    for (x2, w) in pts:
                        if x2 == x and (z, w) not in pts:
                            new.add((z, w))
        if not new:
            return pts
        pts |= new


def rel_to_pdf(rel: set[tuple], columns: list[str]) -> pd.DataFrame:
    return pd.DataFrame(sorted(rel), columns=columns)
