"""Algorithm 4 — guided searching, driver-local engine.

The same guided search that ``core.search`` runs as DataFrame joins, on the
CSR substrate. It exists because the paper's Table 2 compares QbS query
time against the label-based baselines (PPL/ParentPPL) which are inherently
in-memory pointer-chasing algorithms; comparing engines across substrates
would only measure Spark scheduler overhead (DESIGN.md §2). Tests assert
local ≡ distributed ≡ oracle.

Stages (all on the sparsified graph G⁻ = G[V∖R]):

1. **bi-directional search** bounded by the sketch's d⊤, steered per level
   by Eq 4's d*-bounds then by frontier sizes;
2. **reverse search** — walk the BFS depth maps down from the meeting set
   X = {x : depth_u[x] + depth_v[x] = d_G⁻(u,v)}, collecting the edges of
   every landmark-free shortest path;
3. **recover search** — for every sketch side edge (r,t), find the frontier
   vertices w with ``depth_t[w] = min(σ_S(r,t)−1, d_t)`` and
   ``δ_wr + depth_t[w] = σ_S(r,t)`` (the set Z), walk labels from w down to
   r, walk depths from w back to t, and splice the precomputed Δ edges of
   the sketch's meta-edges.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from ..localgraph import CSRGraph, build_csr
from .scheme import Edge, LabellingScheme
from .sketch import Sketch, build_sketch


@dataclass
class QueryStats:
    """Work counters for the Remarks-style efficiency accounting."""

    edges_scanned: int = 0  # adjacency entries touched by any stage
    levels: int = 0  # bi-BFS levels expanded
    distance: int | None = None  # d_G(u,v) (None = disconnected)
    used_reverse: bool = False
    used_recover: bool = False
    fallback: str | None = None  # set when not answered by guided search


@dataclass
class LocalQbSEngine:
    """Driver-local QbS query engine over a built labelling scheme."""

    g: CSRGraph
    scheme: LabellingScheme
    banned: np.ndarray  # dense mask of landmarks
    labmap: dict[int, dict[int, int]]  # v -> {r: δ_vr}
    last_stats: QueryStats = field(default_factory=QueryStats)

    @classmethod
    def build(cls, edges_pdf: pd.DataFrame, scheme: LabellingScheme) -> "LocalQbSEngine":
        g = build_csr(edges_pdf)
        banned = np.zeros(g.n, bool)
        for r in scheme.landmarks:
            banned[g.index_of(r)] = True
        labmap = {v: dict(ent) for v, ent in scheme.labels.items()}
        return cls(g=g, scheme=scheme, banned=banned, labmap=labmap)

    # ---- helpers -------------------------------------------------------

    def _id(self, i: int) -> int:
        return int(self.g.vertices[i])

    def _edge(self, a: int, b: int) -> Edge:
        return (a, b) if a < b else (b, a)

    def _walk_depths(self, starts: set[int], depths: dict[int, int]) -> set[Edge]:
        """Descend a BFS depth map from ``starts`` (dense ids), collecting
        the traversed edges — the reverse search / back-to-t walk."""
        out: set[Edge] = set()
        cur = {x for x in starts if depths[x] > 0}
        while cur:
            nxt: set[int] = set()
            for x in cur:
                k = depths[x]
                for y in self.g.neighbors(x):
                    self.last_stats.edges_scanned += 1
                    if depths.get(y) == k - 1:
                        out.add(self._edge(self._id(x), self._id(y)))
                        if k - 1 > 0:
                            nxt.add(y)
            cur = nxt
        return out

    def _walk_labels(self, start: int, r: int, delta: int) -> set[Edge]:
        """Descend labels of landmark ``r`` from dense vertex ``start`` at
        δ = ``delta`` down to the landmark itself (recover label-walk)."""
        out: set[Edge] = set()
        cur = {start}
        k = delta
        while k > 1 and cur:
            nxt: set[int] = set()
            for x in cur:
                for y in self.g.neighbors(x):
                    self.last_stats.edges_scanned += 1
                    if self.banned[y]:
                        continue
                    if self.labmap.get(self._id(y), {}).get(r) == k - 1:
                        out.add(self._edge(self._id(x), self._id(y)))
                        nxt.add(y)
            cur = nxt
            k -= 1
        for x in cur:
            out.add(self._edge(self._id(x), r))
        return out

    # ---- Algorithm 4 ---------------------------------------------------

    def query(self, u: int, v: int) -> set[Edge]:
        """Answer SPG(u,v): canonical undirected edge set."""
        self.last_stats = st = QueryStats()
        g = self.g
        if u == v:
            st.distance = 0
            return set()
        iu, iv = g.index_of(u), g.index_of(v)
        if iv in g.neighbors(iu):
            st.distance = 1
            return {self._edge(u, v)}
        R = self.scheme.landmark_set
        if u in R or v in R:
            # landmark endpoints have no label / are absent from G⁻; the
            # paper's random queries never hit them — fall back (DESIGN §7)
            from ..baselines.bibfs import bibfs_local

            st.fallback = "bibfs"
            edges, d = bibfs_local(g, u, v)
            st.distance = d
            return edges

        sk = build_sketch(self.scheme, u, v)
        d_top = sk.d_top if sk.feasible else None

        du: dict[int, int] = {iu: 0}
        dv: dict[int, int] = {iv: 0}
        fu, fv = [iu], [iv]
        lu = lv = 0
        met = False
        d_meet: int | None = None
        while True:
            if d_top is not None and lu + lv >= d_top:
                break
            if not fu and not fv:
                break
            # pick_search (Alg 4 line 7): prefer the side whose Eq-4 bound
            # is unmet, then the smaller explored side
            if not fv:
                t = "u"
            elif not fu:
                t = "v"
            else:
                su, sv = sk.d_star_u > lu, sk.d_star_v > lv
                if su != sv:
                    t = "u" if su else "v"
                else:
                    t = "u" if len(du) <= len(dv) else "v"
            frontier, depths, other, lvl = (
                (fu, du, dv, lu) if t == "u" else (fv, dv, du, lv)
            )
            nxt: list[int] = []
            for x in frontier:
                for y in g.neighbors(x):
                    st.edges_scanned += 1
                    if self.banned[y] or y in depths:
                        continue
                    depths[y] = lvl + 1
                    nxt.append(y)
            st.levels += 1
            if t == "u":
                fu, lu = nxt, lu + 1
            else:
                fv, lv = nxt, lv + 1
            meets = [y for y in nxt if y in other]
            if meets:
                met = True
                d_meet = min(depths[y] + other[y] for y in meets)
                break

        out: set[Edge] = set()
        if met:
            assert d_meet is not None
            if d_top is None or d_meet <= d_top:
                st.used_reverse = True
                X = {x for x in du if x in dv and du[x] + dv[x] == d_meet}
                out |= self._walk_depths(X, du)
                out |= self._walk_depths(X, dv)
        if d_top is not None and (not met or d_meet == d_top):
            st.used_recover = True
            out |= self._recover(sk, du, dv, lu, lv)
        st.distance = (
            min(d_meet, d_top)
            if (met and d_top is not None)
            else (d_meet if met else d_top)
        )
        return out

    def _recover(self, sk: Sketch, du, dv, lu: int, lv: int) -> set[Edge]:
        out: set[Edge] = set()
        for me in sk.meta_edges:
            out.update(self.scheme.delta.get(me, []))
        for depths, d_t, side in ((du, lu, sk.side_u), (dv, lv, sk.side_v)):
            for r, sigma in side.items():
                d_m = min(sigma - 1, d_t)
                for x, k in depths.items():
                    if k != d_m:
                        continue
                    dd = self.labmap.get(self._id(x), {}).get(r)
                    if dd is None or dd + k != sigma:
                        continue
                    out |= self._walk_labels(x, r, dd)
                    if k > 0:
                        out |= self._walk_depths({x}, depths)
        return out
