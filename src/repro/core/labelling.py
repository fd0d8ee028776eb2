"""Algorithm 2 — constructing the labelling scheme, as distributed BFS.

Each landmark's BFS tracks, per (root, vertex), whether the vertex was
reached on a path avoiding all other landmarks (the paper's Q_L vs Q_N
queues). A non-landmark first reached at depth n from the *clean* frontier
gets label ``(root, n)`` (Def 4.2); a landmark so reached contributes the
meta-edge ``(root, v, n)`` (Def 4.1); everything keeps expanding either way
so depths stay exact BFS levels.

Because the scheme is deterministic w.r.t. the landmark set (Lemma 5.2),
all BFSs are independent:

* :func:`build_scheme` (QbS-P) — runs **all roots in one multi-source BFS**,
  the frontier keyed by root; this is the cluster-parallel analogue of the
  paper's thread-parallel construction.
* sequential ``mode="sequential"`` (QbS) — same joins, one root at a time,
  mirroring the paper's single-thread construction baseline.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from ..graphs.bfs import keyed_expand, temp_conf
from .metagraph import enrich_scheme
from .scheme import LabellingScheme


def _labelled_bfs(
    spark: SparkSession, edges: DataFrame, roots: list[int], landmarks: list[int]
) -> tuple[list[tuple[int, int, int]], list[tuple[int, int, int]]]:
    """Multi-source clean/dirty BFS from ``roots``.

    Each level is one DataFrame super-step (frontier ⨝ edges, cleanliness
    OR-aggregated per (root, v) in Spark); the visited bookkeeping is
    driver-side (see ``graphs.bfs`` module note). Returns
    ``(label_rows, meta_rows)`` with label_rows (v, root, dist) and
    meta_rows (root, landmark, dist) — the scheme is O(|R|·|V|), the part
    of the index the paper holds in RAM.
    """
    lm_set = set(landmarks)
    # frontier rows carry clean = "can extend landmark-free paths", i.e.
    # the vertex is the root itself or a labelled non-landmark (Q_L); dirty
    # rows are the paper's Q_N queue, which expands but never labels
    frontier: list[tuple[int, int, bool]] = [(r, r, True) for r in roots]
    visited: dict[int, set[int]] = {r: {r} for r in roots}
    depth = 0
    label_acc: list[tuple[int, int, int]] = []
    meta_acc: list[tuple[int, int, int]] = []
    while frontier:
        cand = keyed_expand(spark, edges, frontier)
        depth += 1
        nxt: list[tuple[int, int, bool]] = []
        for root, v, clean in cand.itertuples(index=False):
            root, v = int(root), int(v)
            if v in visited[root]:
                continue
            visited[root].add(v)
            is_lm = v in lm_set
            if clean:
                if is_lm:
                    meta_acc.append((root, v, depth))
                else:
                    label_acc.append((v, root, depth))
            nxt.append((root, v, bool(clean) and not is_lm))
        frontier = nxt
    return label_acc, meta_acc


def build_scheme(
    spark: SparkSession,
    edges: DataFrame,
    landmarks: list[int],
    *,
    mode: str = "parallel",
    enrich: bool = True,
) -> LabellingScheme:
    """Construct the labelling scheme L = (M, L) over a symmetric edge
    DataFrame. ``mode='parallel'`` (QbS-P) runs one multi-source BFS;
    ``mode='sequential'`` (QbS) loops landmarks one at a time. Both yield
    the identical scheme (Lemma 5.2 — asserted by tests).

    ``enrich=False`` skips the meta APSP / Δ precomputation (Section 5.2),
    letting benchmarks time Algorithm 2 alone as the paper does.
    """
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "8"}):
        if mode == "parallel":
            label_rows, meta_rows = _labelled_bfs(spark, edges, landmarks, landmarks)
        elif mode == "sequential":
            label_rows, meta_rows = [], []
            for r in landmarks:
                lr, mr = _labelled_bfs(spark, edges, [r], landmarks)
                label_rows += lr
                meta_rows += mr
        else:
            raise ValueError(f"unknown mode {mode!r}")

    labels: dict[int, list[tuple[int, int]]] = {}
    for v, r, d in label_rows:
        labels.setdefault(v, []).append((r, d))
    for ent in labels.values():
        ent.sort()
    meta: dict[tuple[int, int], int] = {}
    for r, r2, d in meta_rows:
        key = (min(r, r2), max(r, r2))
        assert meta.get(key, d) == d, f"asymmetric meta edge {key}"
        meta[key] = d
    scheme = LabellingScheme(
        landmarks=list(landmarks),
        labels=labels,
        meta_edges=sorted((a, b, w) for (a, b), w in meta.items()),
    )
    if enrich:
        enrich_scheme(spark, scheme, edges)
    return scheme
