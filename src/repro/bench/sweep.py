"""Landmark sweep (paper Figs 9–11, tabulated): construction time,
labelling size and mean local query time for |R| ∈ {5, 10, 20, 40} on a
subset of datasets. Figures are out of scope; this reproduces their trends
as a table (EXPERIMENTS.md)."""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from ..core.qbs import build_index
from ..graphs.registry import DATASETS
from .harness import BenchConfig, fmt_mb, sample_query_pairs

SWEEP_DATASETS = ["douban", "wikitalk", "orkut"]
SWEEP_LANDMARKS = [5, 10, 20, 40]


def run_sweep(
    spark: SparkSession,
    cfg: BenchConfig | None = None,
    datasets: list[str] | None = None,
    landmark_counts: list[int] | None = None,
) -> list[dict]:
    cfg = cfg or BenchConfig()
    rows = []
    for name in datasets or SWEEP_DATASETS:
        pdf = DATASETS[name].edges(cfg.scale)
        for k in landmark_counts or SWEEP_LANDMARKS:
            t0 = time.perf_counter()
            qbs = build_index(spark, pdf, n_landmarks=k)
            constr = time.perf_counter() - t0
            pairs = sample_query_pairs(
                qbs.local.g, 50, seed=99, exclude=qbs.scheme.landmark_set
            )
            t0 = time.perf_counter()
            for u, v in pairs:
                qbs.query_local(u, v)
            q_ms = (time.perf_counter() - t0) / max(1, len(pairs)) * 1e3
            rows.append(
                {
                    "dataset": name,
                    "landmarks": k,
                    "constr_s": round(constr, 3),
                    "L_MB": fmt_mb(qbs.scheme.size_labels_bytes(qbs.index.n_vertices)),
                    "delta_MB": fmt_mb(qbs.scheme.size_delta_bytes()),
                    "q_local_ms": round(q_ms, 3),
                }
            )
            qbs.unpersist()
    return rows
