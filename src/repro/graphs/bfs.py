"""Distributed BFS engine: level-synchronous frontier expansion as
DataFrame joins.

This is the substrate the paper's phases run on in this reproduction (the
repro target prescribes "iterative GraphX/DataFrame joins"; PySpark
exposes the DataFrame/Catalyst layer, so each BFS super-step is a
broadcast join of the frontier against the cached symmetric edge table).

Engineering note (DESIGN.md §7): the *adjacency work* — the data-scale
part — runs in Spark; the O(frontier) bookkeeping (visited sets, depth
maps, meeting tests) lives on the driver. Keeping that state distributed
too costs 4–6 extra Spark jobs per BFS level (anti-joins, checkpoints,
counts) and multiplies every query's latency by scheduler overhead, which
is not what the paper measures. One job per super-step is the shape
GraphFrames-style iterative algorithms use.
"""
from __future__ import annotations

from contextlib import contextmanager
from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

LEVEL_SCHEMA = T.StructType(
    [T.StructField("v", T.LongType(), False), T.StructField("depth", T.LongType(), False)]
)


@contextmanager
def temp_conf(spark: SparkSession, **confs: str):
    """Temporarily override session confs (e.g. few shuffle partitions for
    tiny iterative joins); restores previous values on exit."""
    old = {}
    for k, val in confs.items():
        key = k.replace("__", ".")
        old[key] = spark.conf.get(key, None)
        spark.conf.set(key, val)
    try:
        yield
    finally:
        for key, val in old.items():
            if val is None:
                spark.conf.unset(key)
            else:
                spark.conf.set(key, val)


def materialize(df: DataFrame) -> DataFrame:
    """Eagerly compute ``df`` and cut its lineage (localCheckpoint)."""
    return df.localCheckpoint(eager=True)


def _ids_df(spark: SparkSession, ids: Iterable[int]) -> DataFrame:
    return spark.createDataFrame([(int(x),) for x in ids], "v long")


def neighbor_ids(spark: SparkSession, edges: DataFrame, ids: Iterable[int]) -> list[int]:
    """One BFS super-step: the distinct neighbours of ``ids`` via a
    broadcast join against the symmetric edge table."""
    ids = list(ids)
    if not ids:
        return []
    fdf = _ids_df(spark, ids)
    out = (
        F.broadcast(fdf)
        .join(edges, fdf["v"] == edges["src"])
        .select(edges["dst"])
        .distinct()
        .toPandas()
    )
    return [int(x) for x in out["dst"]]


def neighbor_pairs(spark: SparkSession, edges: DataFrame, ids: Iterable[int]) -> pd.DataFrame:
    """All directed edges leaving ``ids``: (src, dst) pandas frame — the
    walk primitive (reverse/recover searches filter these against their
    membership maps)."""
    ids = list(ids)
    if not ids:
        return pd.DataFrame({"src": [], "dst": []}, dtype="int64")
    fdf = _ids_df(spark, ids)
    return (
        F.broadcast(fdf)
        .join(edges, fdf["v"] == edges["src"])
        .select(edges["src"], edges["dst"])
        .toPandas()
        .astype("int64")
    )


def keyed_expand(
    spark: SparkSession, edges: DataFrame, rows: list[tuple[int, int, bool]]
) -> pd.DataFrame:
    """Multi-source super-step for the labelling BFS: rows are
    (root, v, clean); returns (root, dst, clean=OR over predecessors),
    aggregated in Spark before collection."""
    fdf = spark.createDataFrame(rows, "root long, v long, clean boolean")
    return (
        F.broadcast(fdf)
        .join(edges, fdf["v"] == edges["src"])
        .groupBy(fdf["root"].alias("root"), edges["dst"].alias("v"))
        .agg(F.max("clean").alias("clean"))
        .toPandas()
    )


def bfs_levels(
    spark: SparkSession,
    edges: DataFrame,
    source: int,
    *,
    max_depth: int | None = None,
) -> DataFrame:
    """Single-source BFS: DataFrame of (v, depth) for every vertex reachable
    from ``source`` (within ``max_depth`` if given)."""
    depth = {source: 0}
    frontier = [source]
    d = 0
    while frontier and (max_depth is None or d < max_depth):
        nxt = [y for y in neighbor_ids(spark, edges, frontier) if y not in depth]
        d += 1
        for y in nxt:
            depth[y] = d
        frontier = nxt
    return spark.createDataFrame(sorted(depth.items()), LEVEL_SCHEMA)


def walk_down(
    spark: SparkSession,
    edges: DataFrame,
    starts: Iterable[int],
    level_of,
    counter: list[int] | None = None,
) -> set[tuple[int, int]]:
    """Collect the edges of all level-descending walks from ``starts``.

    ``level_of(v)`` returns the vertex's level or None. Each step is one
    DataFrame super-step (``neighbor_pairs``); an edge (x,y) is taken iff
    ``level_of(y) == level_of(x) - 1``. Implements the paper's *reverse
    search* (level = BFS depth) and the recover search's label-walks
    (level = δ to one landmark, with the landmark itself at level 0).
    Returns canonical undirected edges.
    """
    out: set[tuple[int, int]] = set()
    cur = {int(x) for x in starts if (level_of(int(x)) or 0) > 0}
    while cur:
        pairs = neighbor_pairs(spark, edges, cur)
        if counter is not None:
            counter.append(len(pairs))
        nxt: set[int] = set()
        for x, y in pairs.itertuples(index=False):
            x, y = int(x), int(y)
            ky = level_of(y)
            if ky is not None and ky == level_of(x) - 1:
                out.add((x, y) if x < y else (y, x))
                if ky > 0:
                    nxt.add(y)
        cur = nxt
    return out


def remove_vertices(edges: DataFrame, banned: list[int]) -> DataFrame:
    """Sparsified edge table G[V∖banned]: drop every edge incident to a
    banned vertex (how QbS builds G⁻ from the landmark set)."""
    if not banned:
        return edges
    col = F.array([F.lit(int(b)) for b in banned])
    return edges.where(
        ~F.array_contains(col, F.col("src")) & ~F.array_contains(col, F.col("dst"))
    )


def canonical_spg(df: DataFrame) -> DataFrame:
    """Normalize an edge DataFrame with columns (a, b) to distinct canonical
    undirected rows (a < b) — the output format of every SPG engine."""
    return (
        df.select(
            F.least("a", "b").cast("long").alias("a"),
            F.greatest("a", "b").cast("long").alias("b"),
        )
        .where(F.col("a") != F.col("b"))
        .distinct()
    )
