"""PPL — Pruned Path Labelling (Section 3.2, Algorithm 1).

PLL [Akiba et al.] adapted to shortest-path-*graph* queries: a pruned BFS
from every vertex in degree order, where the equality case
``d_L(v_k, u) = depth[u]`` still *labels* (only strictly-covered vertices
are pruned) — otherwise the 2-hop **path** cover (Def 3.2) would not hold
and some shortest paths would be unrecoverable.

The labelling is driver-local (NumPy CSR + Python BFS): the pruned BFS from
vertex k depends on the labels of vertices 1..k−1, i.e. the algorithm is
sequential by construction — the paper runs it single-threaded too, and its
Table-2 role is to show that O(|V||E|) construction does not scale. Budgets
(wall-clock seconds / estimated label bytes) reproduce the paper's DNF
(>24 h) and OOE (>512 GB) markers at laptop scale. See DESIGN.md §2.

Query answering (Section 3.2): find the min-sum common landmarks
``V_uv = {r : δ_ur + δ_vr = d(u,v)}`` interior to the pair, then recurse on
the (u,r) and (v,r) segments until distance 1. Sound because a min-sum
common landmark is necessarily on a shortest path with exact distances.
Results are memoized per query; the paper's observation that labels are
scanned repeatedly still shows in the work counters.

**Reproduction finding (documented deviation):** the paper claims the
equality case of Algorithm 1 makes L a 2-hop *path* cover (Def 3.2), and
the recursive query relies on it. This is false in general: a vertex
behind an equality-pruned frontier is never enqueued, so it misses the
root's label even when it lies on a tied shortest path, and a path whose
interior is entirely "equality-shadowed" has no split landmark — e.g. on a
4×4 grid, pair (14,8), the path 14-15-16-12-8 has no interior vertex
common to both labels, so edges (15,16),(12,16) are unrecoverable. An
exhaustive all-pairs audit (tests/test_ppl.py) measures 1.6–14 % of pairs
affected depending on tie density; the result is always a *sound subset*.
:meth:`PPLIndex.query_spg` therefore implements the paper's procedure
verbatim (it is what Table 2 times), while
:meth:`PPLIndex.query_spg_complete` is a provably exact label-only
fallback — every vertex is a landmark in PPL, so distances (hence
adjacency, d=1) are exact from labels alone: filter the vertex set to
``W = {w : d(u,w)+d(w,v)=d}`` and keep edges (a,b) of W with
``d(a,b)=1 ∧ d(u,a)+1+d(b,v)=d``. See EXPERIMENTS.md.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd

from ..localgraph import CSRGraph, build_csr

INF = float("inf")


class BudgetExceeded(RuntimeError):
    """Raised when construction blows its time (DNF) or memory (OOE) budget.

    ``kind`` is 'DNF' or 'OOE' — the marker Table 2 prints."""

    def __init__(self, kind: str, detail: str = ""):
        super().__init__(f"{kind} {detail}".strip())
        self.kind = kind


@dataclass
class PPLIndex:
    """Pruned path labelling over one graph."""

    g: CSRGraph
    order: list[int]  # vertex ids in landmark (degree-desc) order
    vertex_of_rank: list[int]
    #: v -> [(rank, dist)], rank-ascending
    labels: dict[int, list[tuple[int, int]]]
    n_entries: int = 0
    #: per-query work counter (label entries scanned), for the Remarks
    last_scans: int = 0

    def size_bytes(self) -> int:
        """Paper convention: 32-bit landmark + 8-bit distance per entry."""
        return self.n_entries * 5

    @property
    def rank_map(self) -> dict[int, int]:
        """vertex id -> its landmark rank (cached)."""
        rm = self.__dict__.get("_rank_map")
        if rm is None:
            rm = {v: i for i, v in enumerate(self.order)}
            self.__dict__["_rank_map"] = rm
        return rm

    # ---- distance -----------------------------------------------------

    def dist(self, u: int, v: int) -> float:
        """2-hop distance via labels (exact — 2-hop distance cover)."""
        if u == v:
            return 0
        lu = self.labels.get(u, [])
        lv = self.labels.get(v, [])
        self.last_scans += len(lu) + len(lv)
        best = INF
        i = j = 0
        while i < len(lu) and j < len(lv):
            ru, du = lu[i]
            rv, dv = lv[j]
            if ru == rv:
                if du + dv < best:
                    best = du + dv
                i += 1
                j += 1
            elif ru < rv:
                i += 1
            else:
                j += 1
        return best

    # ---- SPG query ----------------------------------------------------

    def query_spg(self, u: int, v: int) -> set[tuple[int, int]]:
        self.last_scans = 0
        memo: dict[tuple[int, int], frozenset] = {}
        return set(self._spg(u, v, memo))

    def _min_sum_landmarks(self, u: int, v: int, d: float) -> list[int]:
        lu = self.labels.get(u, [])
        lv = self.labels.get(v, [])
        self.last_scans += len(lu) + len(lv)
        out = []
        i = j = 0
        while i < len(lu) and j < len(lv):
            ru, du = lu[i]
            rv, dv = lv[j]
            if ru == rv:
                if du + dv == d:
                    m = self.vertex_of_rank[ru]
                    if m != u and m != v:
                        out.append(m)
                i += 1
                j += 1
            elif ru < rv:
                i += 1
            else:
                j += 1
        return out

    def query_spg_complete(self, u: int, v: int) -> set[tuple[int, int]]:
        """Exact SPG from labels alone (see module docstring): O(|V|) + |W|²
        distance queries. Not the paper's procedure — the completeness
        fallback used to audit :meth:`query_spg`."""
        d = self.dist(u, v)
        if d == 0 or d == INF:
            return set()
        if d == 1:
            return {(u, v) if u < v else (v, u)}
        W = [
            int(w)
            for w in self.g.vertices
            if self.dist(u, int(w)) + self.dist(int(w), v) == d
        ]
        out: set[tuple[int, int]] = set()
        for a in W:
            da = self.dist(u, a)
            for b in W:
                if self.dist(u, b) == da + 1 and self.dist(a, b) == 1:
                    out.add((a, b) if a < b else (b, a))
        return out

    def _spg(self, u: int, v: int, memo) -> frozenset:
        key = (u, v) if u < v else (v, u)
        if key in memo:
            return memo[key]
        memo[key] = frozenset()  # cycle guard (never hit: distances shrink)
        d = self.dist(u, v)
        if d == 0 or d == INF:
            out: frozenset = frozenset()
        elif d == 1:
            out = frozenset([key])
        else:
            acc: set[tuple[int, int]] = set()
            for m in self._min_sum_landmarks(u, v, d):
                acc |= self._spg(u, m, memo)
                acc |= self._spg(v, m, memo)
            out = frozenset(acc)
        memo[key] = out
        return out


def build_ppl(
    edges_pdf: pd.DataFrame,
    *,
    time_budget_s: float | None = None,
    mem_budget_bytes: int | None = None,
) -> PPLIndex:
    """Algorithm 1 over every vertex in degree order, with budgets."""
    g = build_csr(edges_pdf)
    deg = g.degrees()
    order_idx = sorted(range(g.n), key=lambda i: (-int(deg[i]), int(g.vertices[i])))
    order = [int(g.vertices[i]) for i in order_idx]
    labels: dict[int, list[tuple[int, int]]] = {int(x): [] for x in g.vertices}
    idx = PPLIndex(g=g, order=order, vertex_of_rank=order, labels=labels)
    t0 = time.perf_counter()
    depth = [-1] * g.n
    for k, root_i in enumerate(order_idx):
        if time_budget_s is not None and time.perf_counter() - t0 > time_budget_s:
            raise BudgetExceeded("DNF", f"after {k}/{g.n} pruned BFSs")
        root_id = order[k]
        T = dict(labels[root_id])  # ranks < k only (rank k added below)
        # level-synchronous pruned BFS (Algorithm 1)
        depth_touched = [root_i]
        depth[root_i] = 0
        queue = [root_i]
        head = 0
        while head < len(queue):
            ui = queue[head]
            head += 1
            du = depth[ui]
            uid = int(g.vertices[ui])
            lu = labels[uid]
            dq = INF
            for r, dd in lu:
                t = T.get(r)
                if t is not None and t + dd < dq:
                    dq = t + dd
            if dq < du:
                continue  # pruned: covered strictly by earlier landmarks
            lu.append((k, du))
            idx.n_entries += 1
            if mem_budget_bytes is not None and idx.n_entries * 5 > mem_budget_bytes:
                raise BudgetExceeded("OOE", f"label entries {idx.n_entries}")
            if dq == du:
                continue  # labelled (2-hop *path* cover) but not expanded
            for wi in g.neighbors(ui):
                if depth[wi] < 0:
                    depth[wi] = du + 1
                    depth_touched.append(int(wi))
                    queue.append(int(wi))
        for i in depth_touched:
            depth[i] = -1
    return idx
