"""Bi-BFS baseline (Section 6.1): bidirectional BFS computing the full
shortest path graph online, with no precomputation.

Two substrates, mirroring the two Table-2 panels (DESIGN.md §2):

* :func:`bibfs_spg` — distributed: each level and each reverse-walk step is
  a DataFrame broadcast join against the cached symmetric edge table
  (``repro.graphs.bfs``), with the O(frontier) state on the driver;
* :func:`bibfs_local` — the same algorithm on the CSR substrate.

Both expand the smaller explored side each step ("conducts search from the
directions of two vertices alternatively" [15]), stop at the first
non-empty frontier intersection, and rebuild the SPG from the meeting set
``X = {x : depth_u[x] + depth_v[x] = d}`` by walking the depth maps down —
with full level-synchronous expansion, every shortest path has a vertex in
X, so the reconstruction is exact (oracle-checked in tests).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession

from ..graphs.bfs import neighbor_ids, walk_down
from ..localgraph import CSRGraph
from ..spg_oracle import SPG_COLS


@dataclass
class BiBfsStats:
    """Work counters (edges scanned) for the Remarks accounting."""

    edges_scanned: int = 0
    levels: int = 0
    distance: int | None = None


#: stats of the last bibfs_spg call (module-level; single-driver harness)
last_stats = BiBfsStats()


def bibfs_local(g: CSRGraph, u: int, v: int) -> tuple[set[tuple[int, int]], int | None]:
    """Local bidirectional BFS SPG. Returns (canonical edge set, distance);
    distance None when disconnected."""
    if u == v:
        return set(), 0
    iu, iv = g.index_of(u), g.index_of(v)
    du = {iu: 0}
    dv = {iv: 0}
    fu, fv = [iu], [iv]
    lu = lv = 0
    d = None
    while (fu or fv) and d is None:
        if fu and (not fv or len(du) <= len(dv)):
            t_front, t_depth, other, lvl, side = fu, du, dv, lu, "u"
        else:
            t_front, t_depth, other, lvl, side = fv, dv, du, lv, "v"
        nxt = []
        for x in t_front:
            for y in g.neighbors(x):
                if y not in t_depth:
                    t_depth[y] = lvl + 1
                    nxt.append(y)
        if side == "u":
            fu, lu = nxt, lu + 1
        else:
            fv, lv = nxt, lv + 1
        meets = [y for y in nxt if y in other]
        if meets:
            d = min(t_depth[y] + other[y] for y in meets)
    if d is None:
        return set(), None
    X = {x for x in du if x in dv and du[x] + dv[x] == d}
    out: set[tuple[int, int]] = set()
    for depths in (du, dv):
        cur = {x for x in X if depths[x] > 0}
        while cur:
            nxt_set: set[int] = set()
            for x in cur:
                k = depths[x]
                for y in g.neighbors(x):
                    if depths.get(y) == k - 1:
                        a, b = int(g.vertices[x]), int(g.vertices[y])
                        out.add((a, b) if a < b else (b, a))
                        if k - 1 > 0:
                            nxt_set.add(y)
            cur = nxt_set
    return out, d


def bibfs_spg(spark: SparkSession, edges: DataFrame, u: int, v: int) -> DataFrame:
    """Distributed bidirectional BFS SPG over a symmetric edge DataFrame.

    Returns a canonical (a,b) DataFrame (empty when disconnected/u=v).
    """
    global last_stats
    last_stats = st = BiBfsStats()

    def _empty() -> DataFrame:
        return spark.createDataFrame([], "a long, b long").select(*SPG_COLS)

    if u == v:
        st.distance = 0
        return _empty()
    du: dict[int, int] = {u: 0}
    dv: dict[int, int] = {v: 0}
    fu, fv = [u], [v]
    lu = lv = 0
    d = None
    while (fu or fv) and d is None:
        if fu and (not fv or len(du) <= len(dv)):
            frontier, depths, other, lvl, side = fu, du, dv, lu, "u"
        else:
            frontier, depths, other, lvl, side = fv, dv, du, lv, "v"
        nbrs = neighbor_ids(spark, edges, frontier)
        st.edges_scanned += len(nbrs)
        st.levels += 1
        nxt = []
        for y in nbrs:
            if y not in depths:
                depths[y] = lvl + 1
                nxt.append(y)
        if side == "u":
            fu, lu = nxt, lu + 1
        else:
            fv, lv = nxt, lv + 1
        meets = [y for y in nxt if y in other]
        if meets:
            d = min(depths[y] + other[y] for y in meets)
    st.distance = d
    if d is None:
        return _empty()
    X = {x for x in du if x in dv and du[x] + dv[x] == d}
    out: set[tuple[int, int]] = set()
    ctr: list[int] = []
    out |= walk_down(spark, edges, X, du.get, counter=ctr)
    out |= walk_down(spark, edges, X, dv.get, counter=ctr)
    st.edges_scanned += sum(ctr)
    if not out:
        return _empty()
    return spark.createDataFrame(sorted(out), "a long, b long")
