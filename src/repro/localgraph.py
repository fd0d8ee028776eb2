"""Driver-local graph substrate: CSR adjacency + BFS utilities.

The paper's algorithms are BFS-shaped. The distributed engines
(``repro.graphs.bfs``, ``repro.core.search``) run them as iterative
DataFrame joins; this module is the in-memory counterpart used by

* the local query engines (QbS-local, PPL, ParentPPL, Bi-BFS-local) that
  populate the "local panel" of Table 2,
* reference implementations that distributed results are tested against,
* Table-1 statistics that are cheaper to sample locally (avg distance).

Everything here is deterministic and NumPy-backed; graphs at reproduction
scale (|E| <= a few million) fit comfortably on the driver.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass

import numpy as np
import pandas as pd

INF = -1  # sentinel depth for "unreached" in int arrays


@dataclass(frozen=True)
class CSRGraph:
    """Compact undirected graph: sorted vertex ids + CSR adjacency.

    ``vertices`` maps dense index -> original id; ``index`` is the inverse.
    ``indptr``/``indices`` are the usual CSR arrays over dense indices, with
    each undirected edge appearing in both endpoint lists.
    """

    vertices: np.ndarray  # (n,) original ids, sorted
    indptr: np.ndarray  # (n+1,)
    indices: np.ndarray  # (2m,) dense neighbor indices

    @property
    def n(self) -> int:
        return len(self.vertices)

    @property
    def m(self) -> int:
        """Number of undirected edges."""
        return len(self.indices) // 2

    def index_of(self, v: int) -> int:
        """Dense index of original vertex id ``v`` (raises if absent)."""
        i = int(np.searchsorted(self.vertices, v))
        if i >= self.n or self.vertices[i] != v:
            raise KeyError(f"vertex {v} not in graph")
        return i

    def neighbors(self, i: int) -> np.ndarray:
        """Dense neighbor indices of dense vertex ``i``."""
        return self.indices[self.indptr[i] : self.indptr[i + 1]]

    def degrees(self) -> np.ndarray:
        return np.diff(self.indptr)

    def edge_set(self) -> set[tuple[int, int]]:
        """Canonical (min,max) original-id undirected edge set."""
        out = set()
        for i in range(self.n):
            a = int(self.vertices[i])
            for j in self.neighbors(i):
                b = int(self.vertices[j])
                if a < b:
                    out.add((a, b))
        return out


def build_csr(edges: "pd.DataFrame | np.ndarray | list[tuple[int, int]]") -> CSRGraph:
    """Build a :class:`CSRGraph` from an undirected edge list.

    Accepts a pandas frame with columns ``src``/``dst``, an (m,2) array, or a
    list of pairs. Self-loops are dropped; duplicate/bidirectional listings
    are deduped on the canonical orientation.
    """
    if isinstance(edges, pd.DataFrame):
        arr = edges[["src", "dst"]].to_numpy(dtype=np.int64)
    else:
        arr = np.asarray(list(edges) if not isinstance(edges, np.ndarray) else edges, dtype=np.int64)
        arr = arr.reshape(-1, 2)
    if len(arr) == 0:
        return CSRGraph(np.empty(0, np.int64), np.zeros(1, np.int64), np.empty(0, np.int64))
    arr = arr[arr[:, 0] != arr[:, 1]]
    lo = np.minimum(arr[:, 0], arr[:, 1])
    hi = np.maximum(arr[:, 0], arr[:, 1])
    canon = np.unique(np.stack([lo, hi], axis=1), axis=0)
    verts = np.unique(canon)
    a = np.searchsorted(verts, canon[:, 0])
    b = np.searchsorted(verts, canon[:, 1])
    src = np.concatenate([a, b])
    dst = np.concatenate([b, a])
    order = np.argsort(src, kind="stable")
    src, dst = src[order], dst[order]
    indptr = np.zeros(len(verts) + 1, np.int64)
    np.add.at(indptr, src + 1, 1)
    np.cumsum(indptr, out=indptr)
    return CSRGraph(verts, indptr, dst)


def bfs_depths(g: CSRGraph, source: int, *, banned: np.ndarray | None = None) -> np.ndarray:
    """BFS depths (dense-indexed) from original-id ``source``; INF unreached.

    ``banned`` is an optional boolean mask of dense vertices that may not be
    traversed (used to BFS on the sparsified graph G⁻ without materializing
    it). A banned source yields all-INF.
    """
    depth = np.full(g.n, INF, np.int64)
    s = g.index_of(source)
    if banned is not None and banned[s]:
        return depth
    depth[s] = 0
    q = deque([s])
    while q:
        u = q.popleft()
        du = depth[u]
        for w in g.neighbors(u):
            if depth[w] == INF and (banned is None or not banned[w]):
                depth[w] = du + 1
                q.append(w)
    return depth


def distance(g: CSRGraph, u: int, v: int) -> int:
    """d_G(u,v); INF (=-1) if disconnected."""
    if u == v:
        return 0
    return int(bfs_depths(g, u)[g.index_of(v)])


def sample_pairs(g: CSRGraph, n_pairs: int, seed: int) -> list[tuple[int, int]]:
    """Seeded random distinct-vertex pairs (original ids), as the paper's
    '10,000 randomly sampled pairs' scaled down."""
    rng = np.random.default_rng(seed)
    if g.n < 2:
        return []
    a = rng.integers(0, g.n, n_pairs)
    b = rng.integers(0, g.n, n_pairs)
    b = np.where(a == b, (b + 1) % g.n, b)
    return [(int(g.vertices[x]), int(g.vertices[y])) for x, y in zip(a, b)]


def average_distance(g: CSRGraph, *, n_pairs: int = 1000, seed: int = 7) -> float:
    """Mean distance over seeded sampled connected pairs (Table 1 'avg dist')."""
    tot = 0
    cnt = 0
    for u, v in sample_pairs(g, n_pairs, seed):
        d = distance(g, u, v)
        if d != INF:
            tot += d
            cnt += 1
    return tot / max(1, cnt)
