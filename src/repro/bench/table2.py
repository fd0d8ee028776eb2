"""Table 2 — construction time and average query time (paper §6.2).

Construction: QbS-P (one multi-source DataFrame BFS), QbS (landmark-at-a-
time), PPL and ParentPPL (budgeted; DNF/OOE markers as in the paper).

Query: two substrate panels (DESIGN.md §2) —
* distributed: QbS guided search vs Bi-BFS, both iterative DataFrame joins;
* local in-memory: QbS-local vs PPL vs ParentPPL vs Bi-BFS-local, matching
  the paper's single-machine in-memory setting.
"""
from __future__ import annotations

import time
from pyspark.sql import SparkSession

from ..baselines.bibfs import bibfs_local, bibfs_spg
from ..baselines.parent_ppl import build_parent_ppl
from ..baselines.ppl import BudgetExceeded, build_ppl
from ..core.labelling import build_scheme
from ..core.qbs import build_index
from ..graphs.registry import DATASETS
from .harness import BenchConfig, sample_query_pairs

#: Paper Table 2 values for EXPERIMENTS.md diffing:
#: (constr QbS-P, constr QbS, constr PPL, constr ParentPPL,
#:  query QbS ms, query PPL ms, query ParentPPL ms, query Bi-BFS ms)
PAPER_TABLE2 = {
    "douban": (0.05, 0.3, 154, 2736, 0.037, 1.414, 0.038, 0.585),
    "dblp": (0.12, 1.1, 2610, 11049, 0.097, 1.782, 0.052, 2.995),
    "youtube": (0.47, 4.4, 22601, "DNF", 0.218, 5.314, "-", 23.809),
    "wikitalk": (0.61, 4.9, 8662, "DNF", 0.693, 3.536, "-", 6.984),
    "skitter": (1.51, 12.7, 86326, "DNF", 0.951, 16.978, "-", 44.685),
    "baidu": (2.04, 18.9, "DNF", "OOE", 0.845, "-", "-", 174.412),
    "livejournal": (6.48, 52.2, "DNF", "OOE", 1.095, "-", "-", 84.967),
    "orkut": (10.85, 73.2, "DNF", "OOE", 4.237, "-", "-", 207.541),
    "twitter": (199.8, 1345, "DNF", "OOE", 164.333, "-", "-", 4817.774),
    "friendster": (416.5, 2354, "DNF", "OOE", 11.972, "-", "-", 3600.362),
    "uk2007": (178.5, 1485, "OOE", "OOE", 77.830, "-", "-", 5264.101),
    "clueweb09": (1819, 17060, "OOE", "OOE", 480.443, "-", "-", "DNF"),
}


def _mean_ms(fn, pairs) -> float:
    t0 = time.perf_counter()
    for u, v in pairs:
        fn(u, v)
    return (time.perf_counter() - t0) / max(1, len(pairs)) * 1e3


def bench_dataset(spark: SparkSession, name: str, cfg: BenchConfig) -> dict:
    """Run the full Table-2 measurement for one dataset: all construction
    timings and both query panels. Returns one flat row dict."""
    pdf = DATASETS[name].edges(cfg.scale)
    row: dict = {"dataset": name}

    # --- construction: QbS-P (parallel multi-source BFS), timed alone ----
    t0 = time.perf_counter()
    qbs = build_index(spark, pdf, n_landmarks=cfg.n_landmarks, mode="parallel")
    row["constr_qbs_p_s"] = round(time.perf_counter() - t0, 3)

    # --- construction: QbS (sequential landmark loop, Lemma 5.2) ---------
    t0 = time.perf_counter()
    build_scheme(
        spark, qbs.index.edges, qbs.scheme.landmarks, mode="sequential", enrich=False
    )
    row["constr_qbs_s"] = round(time.perf_counter() - t0, 3)

    # --- construction: PPL / ParentPPL under budgets ---------------------
    ppl = parent = None
    t0 = time.perf_counter()
    try:
        ppl = build_ppl(
            pdf,
            time_budget_s=cfg.ppl_time_budget_s,
            mem_budget_bytes=cfg.ppl_mem_budget_bytes,
        )
        row["constr_ppl_s"] = round(time.perf_counter() - t0, 3)
    except BudgetExceeded as e:
        row["constr_ppl_s"] = e.kind
    t0 = time.perf_counter()
    try:
        parent = build_parent_ppl(
            pdf,
            time_budget_s=cfg.ppl_time_budget_s,
            mem_budget_bytes=cfg.ppl_mem_budget_bytes,
        )
        row["constr_parentppl_s"] = round(time.perf_counter() - t0, 3)
    except BudgetExceeded as e:
        row["constr_parentppl_s"] = e.kind

    # --- queries ---------------------------------------------------------
    g = qbs.local.g
    exclude = qbs.scheme.landmark_set
    dist_pairs = sample_query_pairs(g, cfg.n_queries_dist, seed=1234, exclude=exclude)
    local_pairs = sample_query_pairs(g, cfg.n_queries_local, seed=5678, exclude=exclude)

    from ..baselines import bibfs as bibfs_mod

    qbs_scans: list[int] = []

    def _qbs_dist(u, v):
        qbs.query_df(u, v).collect()
        qbs_scans.append(qbs.index.last_stats.edges_scanned)

    bibfs_scans: list[int] = []

    def _bibfs_dist(u, v):
        bibfs_spg(spark, qbs.index.edges, u, v).collect()
        bibfs_scans.append(bibfs_mod.last_stats.edges_scanned)

    row["q_qbs_dist_ms"] = round(_mean_ms(_qbs_dist, dist_pairs), 3)
    row["q_bibfs_dist_ms"] = round(_mean_ms(_bibfs_dist, dist_pairs), 3)
    # §6.5 Remarks accounting: edges touched per query — the data-scale
    # work that the paper's speedups come from (wall clock at laptop scale
    # is Spark-scheduler dominated; see EXPERIMENTS.md)
    row["work_qbs_edges"] = int(sum(qbs_scans) / max(1, len(qbs_scans)))
    row["work_bibfs_edges"] = int(sum(bibfs_scans) / max(1, len(bibfs_scans)))
    row["q_qbs_local_ms"] = round(_mean_ms(qbs.query_local, local_pairs), 3)
    row["q_bibfs_local_ms"] = round(
        _mean_ms(lambda u, v: bibfs_local(g, u, v), local_pairs), 3
    )
    row["q_ppl_local_ms"] = (
        round(_mean_ms(ppl.query_spg, local_pairs), 3) if ppl else "-"
    )
    row["q_parentppl_local_ms"] = (
        round(_mean_ms(parent.query_spg, local_pairs), 3) if parent else "-"
    )
    qbs.unpersist()
    return row


def run_table2(spark: SparkSession, cfg: BenchConfig | None = None) -> list[dict]:
    cfg = cfg or BenchConfig()
    rows = []
    for name in cfg.datasets:
        row = bench_dataset(spark, name, cfg)
        p = PAPER_TABLE2[name]
        row.update(
            paper_constr_qbs_p_s=p[0],
            paper_constr_qbs_s=p[1],
            paper_constr_ppl_s=p[2],
            paper_constr_parentppl_s=p[3],
            paper_q_qbs_ms=p[4],
            paper_q_ppl_ms=p[5],
            paper_q_parentppl_ms=p[6],
            paper_q_bibfs_ms=p[7],
        )
        rows.append(row)
    return rows
