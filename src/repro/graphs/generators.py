"""Seeded synthetic graph generators.

The paper evaluates on 12 real complex networks (social / web / computer /
communication). Those are not downloadable here and are far beyond a
laptop-scale Spark session, so — per the substitution rule documented in
DESIGN.md §2/§4 — each is replaced by a scaled-down synthetic analogue that
preserves the properties the paper's results hinge on:

* heavy-tailed degrees (preferential attachment backbone),
* a tunable **hub boost** (fraction of endpoints redirected to the top of
  the degree order) reproducing the extreme-hub graphs (WikiTalk, Twitter,
  ClueWeb09) vs flat graphs (Friendster, Orkut),
* small average distance (complex-network small-world regime, paper Fig 7),
* connectivity (a spanning backbone is laid first).

All generators are deterministic in ``seed`` and return canonical undirected
pandas edge tables (``src < dst``, deduped, 1-based vertex ids).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

EDGE_SCHEMA = T.StructType(
    [T.StructField("src", T.LongType(), False), T.StructField("dst", T.LongType(), False)]
)


def _canon(src: np.ndarray, dst: np.ndarray) -> pd.DataFrame:
    """Canonicalize to a deduped undirected edge table (src < dst)."""
    keep = src != dst
    src, dst = src[keep], dst[keep]
    lo = np.minimum(src, dst)
    hi = np.maximum(src, dst)
    pairs = np.unique(np.stack([lo, hi], axis=1), axis=0)
    return pd.DataFrame({"src": pairs[:, 0], "dst": pairs[:, 1]}).astype("int64")


def ba_graph(n: int, m: int, *, seed: int = 0) -> pd.DataFrame:
    """Barabási–Albert preferential attachment: ``n`` vertices, each new
    vertex attaching ``m`` edges to endpoints sampled from the running edge
    list (degree-proportional). Connected by construction."""
    if n < 2:
        return pd.DataFrame({"src": [], "dst": []}, dtype="int64")
    m = max(1, min(m, n - 1))
    rng = np.random.default_rng(seed)
    targets = np.zeros(2 * ((n - m) * m + m), np.int64)  # flat endpoint pool
    # seed clique-ish star over the first m+1 vertices
    pos = 0
    src_list = []
    dst_list = []
    for v in range(1, m + 1):
        src_list.append(v)
        dst_list.append(0)
        targets[pos : pos + 2] = (v, 0)
        pos += 2
    for v in range(m + 1, n):
        # sample m endpoints degree-proportionally = uniform over endpoint pool
        choice = rng.integers(0, pos, m)
        picked = np.unique(targets[choice])
        for t in picked:
            src_list.append(v)
            dst_list.append(int(t))
            targets[pos : pos + 2] = (v, t)
            pos += 2
    src = np.asarray(src_list, np.int64) + 1  # 1-based ids
    dst = np.asarray(dst_list, np.int64) + 1
    return _canon(src, dst)


def hub_graph(
    n: int,
    avg_deg: float,
    *,
    hub_boost: float = 0.0,
    n_hubs: int = 20,
    seed: int = 0,
) -> pd.DataFrame:
    """Power-law graph with controllable hub skew — the workhorse generator.

    A BA backbone with ``m = max(1, round(avg_deg/2))`` gives the heavy tail
    and connectivity; then ``hub_boost`` fraction of one endpoint of every
    backbone edge is redirected onto the ``n_hubs`` highest-degree vertices
    (Zipf-weighted), inflating max degree the way WikiTalk/Twitter-style
    graphs have celebrity hubs. ``hub_boost=0`` leaves the flat BA tail
    (Friendster/Orkut-style). Extra random edges top the average degree up to
    the fractional target.
    """
    m = max(1, int(avg_deg / 2))
    pdf = ba_graph(n, m, seed=seed)
    rng = np.random.default_rng(seed + 1)
    src = pdf["src"].to_numpy()
    dst = pdf["dst"].to_numpy()
    # top up fractional average degree with uniform random extra edges
    want = int(n * avg_deg / 2)
    if want > len(src):
        extra = want - len(src)
        es = rng.integers(1, n + 1, extra)
        ed = rng.integers(1, n + 1, extra)
        src = np.concatenate([src, es])
        dst = np.concatenate([dst, ed])
    if hub_boost > 0:
        deg = np.bincount(src, minlength=n + 2) + np.bincount(dst, minlength=n + 2)
        order = np.argsort(deg)[::-1]
        hubs = np.asarray([i for i in order if 1 <= i <= n][: max(1, n_hubs)])
        w = 1.0 / np.arange(1, len(hubs) + 1) ** 1.0
        w /= w.sum()
        redirect = rng.random(len(dst)) < hub_boost
        dst = dst.copy()
        dst[redirect] = rng.choice(hubs, int(redirect.sum()), p=w)
    return _ensure_connected(_canon(src, dst), n)


def _ensure_connected(pdf: pd.DataFrame, n: int) -> pd.DataFrame:
    """Deterministically link every component (and isolated vertex) of the
    1..n vertex set to the highest-degree vertex — hub redirection and
    self-loop dropping may otherwise orphan vertices. Mirrors the paper's
    setting, which assumes connected graphs (Section 2)."""
    from collections import deque

    adj: dict[int, list[int]] = {v: [] for v in range(1, n + 1)}
    for a, b in pdf.itertuples(index=False):
        adj[int(a)].append(int(b))
        adj[int(b)].append(int(a))
    anchor = max(adj, key=lambda v: (len(adj[v]), -v))
    seen = {anchor}
    q = deque([anchor])
    while q:
        u = q.popleft()
        for w in adj[u]:
            if w not in seen:
                seen.add(w)
                q.append(w)
    repairs = []
    for v in range(1, n + 1):
        if v not in seen:
            repairs.append((v, anchor))
            seen.add(v)
            q.append(v)
            while q:
                u = q.popleft()
                for w in adj[u]:
                    if w not in seen:
                        seen.add(w)
                        q.append(w)
    if not repairs:
        return pdf
    rep = pd.DataFrame(repairs, columns=["src", "dst"]).astype("int64")
    both = pd.concat([pdf, rep], ignore_index=True)
    return _canon(both["src"].to_numpy(), both["dst"].to_numpy())


def er_graph(n: int, p: float, *, seed: int = 0) -> pd.DataFrame:
    """Erdős–Rényi G(n,p) (possibly disconnected — used in tests)."""
    rng = np.random.default_rng(seed)
    mask = np.triu(rng.random((n, n)) < p, k=1)
    a, b = np.nonzero(mask)
    return _canon(a + 1, b + 1)


def path_graph(n: int) -> pd.DataFrame:
    """1–2–…–n path (toy fixture)."""
    v = np.arange(1, n, dtype=np.int64)
    return pd.DataFrame({"src": v, "dst": v + 1})


def cycle_graph(n: int) -> pd.DataFrame:
    """n-cycle (two shortest paths between antipodal-ish pairs)."""
    v = np.arange(1, n + 1, dtype=np.int64)
    nxt = np.roll(v, -1)
    return _canon(v, nxt)


def star_graph(n: int) -> pd.DataFrame:
    """Hub 1 connected to 2..n (extreme-hub toy)."""
    leaves = np.arange(2, n + 1, dtype=np.int64)
    return pd.DataFrame({"src": np.ones(len(leaves), np.int64), "dst": leaves})


def grid_graph(rows: int, cols: int) -> pd.DataFrame:
    """rows×cols lattice: exponentially many shortest paths (stress SPG)."""
    def vid(r: int, c: int) -> int:
        return r * cols + c + 1

    src, dst = [], []
    for r in range(rows):
        for c in range(cols):
            if c + 1 < cols:
                src.append(vid(r, c)), dst.append(vid(r, c + 1))
            if r + 1 < rows:
                src.append(vid(r, c)), dst.append(vid(r + 1, c))
    return pd.DataFrame({"src": src, "dst": dst}).astype("int64")


def figure3_graph() -> pd.DataFrame:
    """The paper's Figure 3(a) example graph (reconstructed from its label
    table): vertices 1..7, answer of SPG(3,7) = {3-1,1-2,3-4,4-2,2-5,5-7}."""
    return pd.DataFrame(
        {"src": [1, 1, 2, 2, 2, 3, 5, 5], "dst": [2, 3, 4, 5, 6, 4, 6, 7]}
    ).astype("int64")


def to_spark_edges(spark: SparkSession, pdf: pd.DataFrame, *, partitions: int = 8) -> DataFrame:
    """Canonical pandas edge table -> cached symmetric Spark edge DataFrame.

    Returns both orientations (src→dst and dst→src) so frontier expansion is
    a single equi-join; callers own ``unpersist``.
    """
    if len(pdf) == 0:
        return spark.createDataFrame([], EDGE_SCHEMA)
    one = spark.createDataFrame(pdf[["src", "dst"]], EDGE_SCHEMA)
    sym = one.unionByName(one.select(F.col("dst").alias("src"), F.col("src").alias("dst")))
    return sym.repartition(partitions, "src").cache()
