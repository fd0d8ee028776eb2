"""Table 1 — dataset statistics (paper §6.1).

Columns mirror the paper: |V|, |E^un|, max degree, average degree, average
distance (sampled pairs) and |G| at 8 B per adjacency-list edge, for the 12
synthetic analogues, with the paper's values alongside for diffing.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..graphs.generators import to_spark_edges
from ..graphs.registry import DATASETS, PAPER_TABLE1
from ..graphs.stats import graph_stats
from .harness import BenchConfig


def table1_row(spark: SparkSession, name: str, cfg: BenchConfig) -> dict:
    pdf = DATASETS[name].edges(cfg.scale)
    edges = to_spark_edges(spark, pdf)
    st = graph_stats(edges, pdf)
    edges.unpersist()
    p_v, p_e, p_maxd, p_avgd, p_dist, p_size = PAPER_TABLE1[name]
    return {
        "dataset": name,
        "V": st.n_vertices,
        "E_un": st.n_edges_un,
        "max_deg": st.max_deg,
        "avg_deg": round(st.avg_deg, 2),
        "avg_dist": round(st.avg_dist, 2),
        "size_MB": round(st.size_mb, 2),
        "paper_V": p_v,
        "paper_E_un": p_e,
        "paper_max_deg": p_maxd,
        "paper_avg_deg": p_avgd,
        "paper_avg_dist": p_dist,
        "paper_size": p_size,
    }


def run_table1(spark: SparkSession, cfg: BenchConfig | None = None) -> list[dict]:
    cfg = cfg or BenchConfig()
    return [table1_row(spark, name, cfg) for name in cfg.datasets]
