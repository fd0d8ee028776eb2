"""Table-1 dataset statistics, computed with the DataFrame API.

Mirrors the paper's Table 1 columns: |V|, |E^un|, max degree, average degree,
average distance (sampled pairs, as the paper samples 10k pairs), and |G| at
8 bytes per undirected adjacency-list edge (the paper's stated convention —
Douban: 0.327M edges × 8 B ≈ 2.5 MB matches).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..localgraph import average_distance, build_csr


@dataclass(frozen=True)
class GraphStats:
    """One Table-1 row."""

    n_vertices: int
    n_edges_un: int
    max_deg: int
    avg_deg: float
    avg_dist: float
    size_mb: float


def degrees_df(sym_edges: DataFrame) -> DataFrame:
    """Per-vertex degree from a symmetric edge DataFrame: (v, deg)."""
    return sym_edges.groupBy(F.col("src").alias("v")).agg(F.count("*").alias("deg"))


def graph_stats(sym_edges: DataFrame, edges_pdf: pd.DataFrame, *, dist_pairs: int = 500) -> GraphStats:
    """Compute a Table-1 row.

    Degree/count statistics run on the symmetric Spark edge DataFrame;
    average distance is sampled on the driver-local CSR substrate (BFS per
    sampled source — the paper also samples rather than computing APSP).
    """
    deg = degrees_df(sym_edges)
    row = deg.agg(
        F.count("*").alias("n"),
        F.max("deg").alias("maxd"),
        F.avg("deg").alias("avgd"),
        (F.sum("deg") / 2).alias("m"),
    ).collect()[0]
    g = build_csr(edges_pdf)
    return GraphStats(
        n_vertices=int(row["n"]),
        n_edges_un=int(row["m"]),
        max_deg=int(row["maxd"]),
        avg_deg=float(row["avgd"]),
        avg_dist=average_distance(g, n_pairs=dist_pairs),
        size_mb=int(row["m"]) * 8 / 1e6,
    )
