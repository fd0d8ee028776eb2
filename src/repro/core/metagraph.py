"""Meta-graph precomputation (Section 5.2).

The sketch needs shortest path distances *and* shortest paths between
landmarks on the meta-graph; precomputing them reduces Algorithm 3 to
O(|R|²). This module computes, on the driver (the meta-graph has ≤ |R|²
edges — tiny):

* all-pairs shortest distances over the weighted meta-graph (Dijkstra),
* per landmark pair, the meta-edges lying on its shortest meta-paths
  (the "shortest path graph of (r,r') in M" of Algorithm 3 Line 10),

and, with DataFrame joins over the path labelling (this is data-scale
work — O(|R|·|V|) label rows against the edge table):

* Δ — for each meta-edge (r,r'), the ground-graph SPG of the landmark
  pair restricted to landmark-free shortest paths. A vertex w lies on such
  a path iff both ``(r, δ₁) ∈ L(w)`` and ``(r', δ₂) ∈ L(w)`` with
  ``δ₁ + δ₂ = σ(r,r')`` (clean-prefix/suffix concatenation); consecutive
  such vertices joined through the edge table give the interior edges.
"""
from __future__ import annotations

import heapq

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .scheme import Edge, LabellingScheme


def meta_apsp(
    landmarks: list[int], meta_edges: list[tuple[int, int, int]]
) -> dict[tuple[int, int], int]:
    """Weighted all-pairs shortest distances over the meta-graph, both
    orientations plus (r,r)=0. Unreachable pairs are absent."""
    adj: dict[int, list[tuple[int, int]]] = {r: [] for r in landmarks}
    for a, b, w in meta_edges:
        adj[a].append((b, w))
        adj[b].append((a, w))
    out: dict[tuple[int, int], int] = {}
    for src in landmarks:
        dist = {src: 0}
        heap = [(0, src)]
        while heap:
            d, x = heapq.heappop(heap)
            if d > dist.get(x, 1 << 60):
                continue
            for y, w in adj[x]:
                nd = d + w
                if nd < dist.get(y, 1 << 60):
                    dist[y] = nd
                    heapq.heappush(heap, (nd, y))
        for x, d in dist.items():
            out[(src, x)] = d
    return out


def meta_pair_spgs(
    landmarks: list[int],
    meta_edges: list[tuple[int, int, int]],
    dist: dict[tuple[int, int], int],
) -> dict[tuple[int, int], list[Edge]]:
    """For each canonical landmark pair, the canonical meta-edges on at
    least one shortest r–r' meta-path: (a,b,w) qualifies iff
    d(r,a) + w + d(b,r') = d(r,r') in either orientation."""
    out: dict[tuple[int, int], list[Edge]] = {}
    big = 1 << 60
    for i, r in enumerate(landmarks):
        for r2 in landmarks[i + 1 :]:
            key = (min(r, r2), max(r, r2))
            d = dist.get((r, r2))
            if d is None:
                out[key] = []
                continue
            sel = []
            for a, b, w in meta_edges:
                via_ab = dist.get((r, a), big) + w + dist.get((b, r2), big)
                via_ba = dist.get((r, b), big) + w + dist.get((a, r2), big)
                if min(via_ab, via_ba) == d:
                    sel.append((min(a, b), max(a, b)))
            out[key] = sorted(set(sel))
    return out


def compute_delta(
    spark: SparkSession, scheme: LabellingScheme, edges: DataFrame
) -> dict[Edge, list[Edge]]:
    """Ground SPG edges per meta-edge (landmark-free shortest paths only),
    via label⨝label⨝edge DataFrame joins. See module docstring."""
    delta: dict[Edge, list[Edge]] = {}
    interior_meta = []
    for a, b, w in scheme.meta_edges:
        delta[(a, b)] = []
        if w == 1:
            delta[(a, b)].append((min(a, b), max(a, b)))
        else:
            interior_meta.append((a, b, w))
    if not interior_meta or scheme.n_label_entries() == 0:
        return delta

    ldf = spark.createDataFrame(scheme.labels_pdf())
    mdf = spark.createDataFrame(interior_meta, "r1 long, r2 long, w long")
    l1 = ldf.alias("l1")
    l2 = ldf.alias("l2")
    # W: vertices on a clean shortest path of meta-edge (r1, r2), with their
    # distance d1 to r1
    W = (
        l1.join(l2, F.col("l1.v") == F.col("l2.v"))
        .join(
            F.broadcast(mdf),
            (F.col("l1.r") == F.col("r1"))
            & (F.col("l2.r") == F.col("r2"))
            & (F.col("l1.dist") + F.col("l2.dist") == F.col("w")),
        )
        .select(
            F.col("l1.v").alias("v"),
            "r1",
            "r2",
            "w",
            F.col("l1.dist").alias("d1"),
        )
    ).cache()
    a = W.alias("a")
    b = W.alias("b")
    interior = (
        a.join(edges, F.col("a.v") == edges["src"])
        .join(
            b,
            (edges["dst"] == F.col("b.v"))
            & (F.col("a.r1") == F.col("b.r1"))
            & (F.col("a.r2") == F.col("b.r2"))
            & (F.col("b.d1") == F.col("a.d1") + 1),
        )
        .select(
            F.col("a.r1").alias("r1"),
            F.col("a.r2").alias("r2"),
            F.col("a.v").alias("x"),
            F.col("b.v").alias("y"),
        )
    )
    end1 = W.where(F.col("d1") == 1).select("r1", "r2", F.col("r1").alias("x"), F.col("v").alias("y"))
    end2 = W.where(F.col("d1") == F.col("w") - 1).select(
        "r1", "r2", F.col("v").alias("x"), F.col("r2").alias("y")
    )
    rows = interior.unionByName(end1).unionByName(end2).distinct().collect()
    W.unpersist()
    for row in rows:
        key = (int(row["r1"]), int(row["r2"]))
        x, y = int(row["x"]), int(row["y"])
        delta[key].append((min(x, y), max(x, y)))
    for k in delta:
        delta[k] = sorted(set(delta[k]))
    return delta


def enrich_scheme(spark: SparkSession, scheme: LabellingScheme, edges: DataFrame) -> None:
    """Fill the Section-5.2 precomputations in place: meta APSP, per-pair
    meta-SPGs, and Δ."""
    scheme.meta_dist = meta_apsp(scheme.landmarks, scheme.meta_edges)
    scheme.meta_spg = meta_pair_spgs(scheme.landmarks, scheme.meta_edges, scheme.meta_dist)
    scheme.delta = compute_delta(spark, scheme, edges)
