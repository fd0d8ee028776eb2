"""Definition-level reference for the labelling scheme (tests' ground truth).

Computes Definitions 4.1/4.2 *directly* on the CSR substrate — per landmark
r, a plain BFS gives exact depths, then a level-order sweep marks each
vertex "clean" iff some shortest r→v path avoids all other landmarks.
Independent of the distributed Algorithm-2 implementation, so tests can
assert the two agree on arbitrary graphs (and that sequential ≡ parallel ≡
reference, Lemma 5.2).

Also provides a brute-force Δ reference: the SPG of a landmark pair
restricted to paths avoiding other landmarks, via two masked BFSs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..localgraph import INF, CSRGraph, bfs_depths, build_csr
from .metagraph import meta_apsp, meta_pair_spgs
from .scheme import Edge, LabellingScheme


def reference_scheme(edges_pdf: pd.DataFrame, landmarks: list[int]) -> LabellingScheme:
    """Labels + meta-graph straight from the definitions (no Δ)."""
    g = build_csr(edges_pdf)
    lm_set = set(landmarks)
    labels: dict[int, list[tuple[int, int]]] = {}
    meta: dict[Edge, int] = {}
    for r in landmarks:
        depth = bfs_depths(g, r)
        order = np.argsort(depth)
        clean = np.zeros(g.n, bool)
        clean[g.index_of(r)] = True
        for i in order:
            if depth[i] == INF or depth[i] == 0:
                continue
            vid = int(g.vertices[i])
            has_clean_pred = any(
                depth[w] == depth[i] - 1
                and clean[w]
                and (int(g.vertices[w]) == r or int(g.vertices[w]) not in lm_set)
                for w in g.neighbors(i)
            )
            if not has_clean_pred:
                continue
            if vid in lm_set:
                meta[(min(r, vid), max(r, vid))] = int(depth[i])
            else:
                labels.setdefault(vid, []).append((r, int(depth[i])))
                clean[i] = True
    for ent in labels.values():
        ent.sort()
    scheme = LabellingScheme(
        landmarks=list(landmarks),
        labels=labels,
        meta_edges=sorted((a, b, w) for (a, b), w in meta.items()),
    )
    scheme.meta_dist = meta_apsp(scheme.landmarks, scheme.meta_edges)
    scheme.meta_spg = meta_pair_spgs(scheme.landmarks, scheme.meta_edges, scheme.meta_dist)
    return scheme


def reference_delta(
    edges_pdf: pd.DataFrame, landmarks: list[int], meta_edges: list[tuple[int, int, int]]
) -> dict[Edge, list[Edge]]:
    """Brute-force Δ: for each meta-edge (r,r'), the SPG of (r,r') in the
    graph with all *other* landmarks removed (clean shortest paths only)."""
    g = build_csr(edges_pdf)
    out: dict[Edge, list[Edge]] = {}
    for a, b, w in meta_edges:
        banned = np.zeros(g.n, bool)
        for x in landmarks:
            if x not in (a, b):
                banned[g.index_of(x)] = True
        da = bfs_depths(g, a, banned=banned)
        db = bfs_depths(g, b, banned=banned)
        edges: set[Edge] = set()
        for i in range(g.n):
            if da[i] == INF:
                continue
            for j in g.neighbors(i):
                if db[j] != INF and not banned[i] and not banned[j] and da[i] + 1 + db[j] == w:
                    x, y = int(g.vertices[i]), int(g.vertices[j])
                    edges.add((min(x, y), max(x, y)))
        out[(min(a, b), max(a, b))] = sorted(edges)
    return out
