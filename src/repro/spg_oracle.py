"""Ground-truth oracles for shortest-path-graph (SPG) queries.

Two flavours:

* **DuckDB SQL builders** (:func:`spg_sql`, :func:`distance_sql`) — used with
  :func:`repro.oracle.assert_equivalent` so that every test checking a query
  result diffs the engine's DataFrame against an independent recursive-CTE
  BFS executed by DuckDB over the same edge table. This is the mandated
  correctness path.
* **Pure-python reference** (:func:`spg_reference`) — a double-BFS over the
  CSR substrate, for bulk/property tests (hypothesis) where hundreds of
  DuckDB round-trips would dominate the suite's runtime.

Both define the SPG as the set of canonical undirected edges (a,b), a<b,
such that some orientation satisfies ``depth_u[x] + 1 + depth_v[y] = d(u,v)``
— i.e. exactly the edges lying on at least one shortest u–v path (Def 2.2).
"""
from __future__ import annotations

import pandas as pd

from .localgraph import INF, CSRGraph, bfs_depths

#: Columns of every SPG edge result, in canonical order.
SPG_COLS = ["a", "b"]


def _bfs_cte(name: str, source: int, cap: int) -> str:
    """Recursive-CTE level expansion from ``source``; UNION dedups (v,d)."""
    return (
        f"{name}(v, d) AS ("
        f" SELECT CAST({source} AS BIGINT), 0"
        f" UNION"
        f" SELECT s.dst, {name}.d + 1 FROM {name} JOIN sym s ON s.src = {name}.v"
        f" WHERE {name}.d < {cap})"
    )


def _prelude(cap: int, u: int, v: int) -> str:
    return (
        "WITH RECURSIVE "
        "sym AS (SELECT src, dst FROM edges UNION SELECT dst AS src, src AS dst FROM edges), "
        f"{_bfs_cte('bu', u, cap)}, {_bfs_cte('bv', v, cap)}, "
        "du AS (SELECT v, MIN(d) AS d FROM bu GROUP BY v), "
        "dv AS (SELECT v, MIN(d) AS d FROM bv GROUP BY v), "
        f"dd AS (SELECT d FROM du WHERE v = {v}) "
    )


def distance_sql(u: int, v: int, *, cap: int = 64) -> str:
    """SQL returning one row ``(dist)`` = d_G(u,v), or zero rows if
    disconnected. Register the undirected edge table as ``edges(src, dst)``."""
    return _prelude(cap, u, v) + "SELECT d AS dist FROM dd"


def spg_sql(u: int, v: int, *, cap: int = 64) -> str:
    """SQL returning the SPG edge set for (u,v) as canonical ``(a, b)`` rows.

    Empty result when u,v are disconnected or u = v. ``cap`` bounds the BFS
    depth; it must be >= the graph diameter (test graphs are tiny).
    """
    return _prelude(cap, u, v) + (
        "SELECT DISTINCT LEAST(s.src, s.dst) AS a, GREATEST(s.src, s.dst) AS b "
        "FROM sym s JOIN du ON du.v = s.src JOIN dv ON dv.v = s.dst CROSS JOIN dd "
        "WHERE du.d + 1 + dv.d = dd.d"
    )


def spg_reference(g: CSRGraph, u: int, v: int) -> set[tuple[int, int]]:
    """Exact SPG edge set via two BFSs on the CSR graph (original ids)."""
    if u == v:
        return set()
    du = bfs_depths(g, u)
    d = du[g.index_of(v)]
    if d == INF:
        return set()
    dv = bfs_depths(g, v)
    out: set[tuple[int, int]] = set()
    for i in range(g.n):
        if du[i] == INF or dv[i] == INF:
            continue
        for j in g.neighbors(i):
            if dv[j] != INF and du[i] + 1 + dv[j] == d:
                a, b = int(g.vertices[i]), int(g.vertices[j])
                out.add((a, b) if a < b else (b, a))
    return out


def distance_reference(g: CSRGraph, u: int, v: int) -> int:
    """d_G(u,v) via BFS; INF (=-1) when disconnected."""
    if u == v:
        return 0
    return int(bfs_depths(g, u)[g.index_of(v)])


def edges_pdf(edge_iter) -> pd.DataFrame:
    """Canonical undirected pandas edge table for oracle registration."""
    rows = sorted({(min(a, b), max(a, b)) for a, b in edge_iter if a != b})
    return pd.DataFrame(rows or None, columns=["src", "dst"], dtype="int64")


def spg_edges_pdf(edge_iter) -> pd.DataFrame:
    """Canonical (a,b) pandas frame from an SPG edge iterable (for tests
    that compare a local engine's answer through the DuckDB oracle)."""
    rows = sorted({(min(a, b), max(a, b)) for a, b in edge_iter})
    return pd.DataFrame(rows or None, columns=SPG_COLS, dtype="int64")
