"""ParentPPL — path labelling with parent information (Section 3.2).

Extends PPL's labels to triples ``(r, δ_vr, W_vr)`` where ``W_vr`` is the
set of parent vertices of v (neighbours one BFS level closer to r) recorded
during the pruned BFS from r. Same O(|V||E|) construction time but
O(|V||E|) space — the paper's point is that it runs out of time/memory even
sooner than PPL (Tables 2–3), which the budgets reproduce.

Query answering: as in PPL, split at the min-sum common landmarks; each
(t, r) segment first walks parent sets (emitting (t,w) edges and recursing
one level closer to r). Because the pruned BFS does not expand through
covered vertices, recorded parent sets can miss predecessors whose branch
was pruned (those paths are covered by an earlier landmark — that is what
pruning means), so the landmark-split recursion also runs; the union is
sound (both emit only shortest-path edges) and complete (the split alone
is, by the 2-hop path cover). Parent walks shorten the recursion depth on
the paths they do cover.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import pandas as pd

from ..localgraph import build_csr
from .ppl import INF, BudgetExceeded, PPLIndex


@dataclass
class ParentPPLIndex(PPLIndex):
    """PPL index whose label entries carry parent sets.

    ``parents[(v, rank)]`` lists the recorded parents of v in the pruned
    BFS from the rank-th landmark.
    """

    parents: dict[tuple[int, int], tuple[int, ...]] = None  # type: ignore[assignment]

    def size_bytes(self) -> int:
        """5 bytes per entry + 32-bit per stored parent (paper §6.1)."""
        n_parents = sum(len(p) for p in self.parents.values())
        return self.n_entries * 5 + 4 * n_parents

    def query_spg(self, u: int, v: int) -> set[tuple[int, int]]:
        self.last_scans = 0
        memo: dict[tuple[int, int], frozenset] = {}
        return set(self._spg_parent(u, v, memo))

    def _entry(self, t: int, rank: int) -> tuple[int, tuple[int, ...]] | None:
        for r, d in self.labels.get(t, []):
            if r == rank:
                return d, self.parents.get((t, rank), ())
            if r > rank:
                return None
        return None

    def _spg_parent(self, u: int, v: int, memo) -> frozenset:
        key = (u, v) if u < v else (v, u)
        if key in memo:
            return memo[key]
        memo[key] = frozenset()
        d = self.dist(u, v)
        if d == 0 or d == INF:
            out: frozenset = frozenset()
        elif d == 1:
            out = frozenset([key])
        else:
            acc: set[tuple[int, int]] = set()
            for m in self._min_sum_landmarks(u, v, d):
                acc |= self._segment(u, m, memo)
                acc |= self._segment(v, m, memo)
            out = frozenset(acc)
        memo[key] = out
        return out

    def _segment(self, t: int, m: int, memo) -> frozenset:
        """Shortest-path graph of the (t, landmark m) segment: parent walk
        when an exact entry exists, plus the covering split."""
        key = (t, m) if t < m else (m, t)
        if key in memo:
            return memo[key]
        memo[key] = frozenset()
        d = self.dist(t, m)
        if d == 0 or d == INF:
            out: frozenset = frozenset()
        elif d == 1:
            out = frozenset([key])
        else:
            acc: set[tuple[int, int]] = set()
            rank = self.rank_map.get(m)
            ent = self._entry(t, rank) if rank is not None else None
            if ent is not None and ent[0] == d:
                self.last_scans += len(ent[1])
                for w in ent[1]:
                    acc.add((t, w) if t < w else (w, t))
                    acc |= self._segment(w, m, memo)
            for x in self._min_sum_landmarks(t, m, d):
                acc |= self._segment(t, x, memo)
                acc |= self._segment(m, x, memo)
            out = frozenset(acc)
        memo[key] = out
        return out


def build_parent_ppl(
    edges_pdf: pd.DataFrame,
    *,
    time_budget_s: float | None = None,
    mem_budget_bytes: int | None = None,
) -> ParentPPLIndex:
    """Algorithm 1 with parent recording, budgeted (DNF/OOE)."""
    g = build_csr(edges_pdf)
    deg = g.degrees()
    order_idx = sorted(range(g.n), key=lambda i: (-int(deg[i]), int(g.vertices[i])))
    order = [int(g.vertices[i]) for i in order_idx]
    labels: dict[int, list[tuple[int, int]]] = {int(x): [] for x in g.vertices}
    idx = ParentPPLIndex(
        g=g, order=order, vertex_of_rank=order, labels=labels, parents={}
    )
    t0 = time.perf_counter()
    depth = [-1] * g.n
    n_parents = 0
    for k, root_i in enumerate(order_idx):
        if time_budget_s is not None and time.perf_counter() - t0 > time_budget_s:
            raise BudgetExceeded("DNF", f"after {k}/{g.n} pruned BFSs")
        root_id = order[k]
        T = dict(labels[root_id])
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
                continue
            lu.append((k, du))
            idx.n_entries += 1
            if du > 0:
                ws = tuple(
                    int(g.vertices[wi]) for wi in g.neighbors(ui) if depth[wi] == du - 1
                )
                idx.parents[(uid, k)] = ws
                n_parents += len(ws)
            if mem_budget_bytes is not None and idx.n_entries * 5 + 4 * n_parents > mem_budget_bytes:
                raise BudgetExceeded("OOE", f"label entries {idx.n_entries}")
            if dq == du:
                continue
            for wi in g.neighbors(ui):
                if depth[wi] < 0:
                    depth[wi] = du + 1
                    depth_touched.append(int(wi))
                    queue.append(int(wi))
        for i in depth_touched:
            depth[i] = -1
    return idx
