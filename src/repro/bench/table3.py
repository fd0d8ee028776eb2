"""Table 3 — labelling sizes (paper §6.2.2).

size(L): |R| bytes per non-landmark vertex (the paper stores each vertex's
label in |R|·8 bits); size(Δ): 8 B per edge of the precomputed shortest
path graphs between all landmark pairs; PPL: 5 B per label entry;
ParentPPL: 5 B per entry + 4 B per stored parent. DNF/OOE markers carry
over from construction, as in the paper.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..baselines.parent_ppl import build_parent_ppl
from ..baselines.ppl import BudgetExceeded, build_ppl
from ..core.qbs import build_index
from ..graphs.registry import DATASETS
from .harness import BenchConfig, fmt_mb

#: Paper Table 3 (sizes as printed): (size(L), size(Δ), PPL, ParentPPL)
PAPER_TABLE3 = {
    "douban": ("2.95MB", "0.03MB", "0.4GB", "0.8GB"),
    "dblp": ("6.05MB", "0.03MB", "1.2GB", "2.4GB"),
    "youtube": ("21.6MB", "0.6MB", "1.7GB", "-"),
    "wikitalk": ("45.7MB", "0.7MB", "2.1GB", "-"),
    "skitter": ("32.4MB", "20.3MB", "9.2GB", "-"),
    "baidu": ("40.8MB", "4.8MB", "-", "-"),
    "livejournal": ("92.5MB", "1.1MB", "-", "-"),
    "orkut": ("58.6MB", "3.5MB", "-", "-"),
    "twitter": ("0.78GB", "0.76GB", "-", "-"),
    "friendster": ("1.22GB", "0.01GB", "-", "-"),
    "uk2007": ("1.98GB", "0.08GB", "-", "-"),
    "clueweb09": ("31.4GB", "0.48GB", "-", "-"),
}


def table3_row(spark: SparkSession, name: str, cfg: BenchConfig) -> dict:
    pdf = DATASETS[name].edges(cfg.scale)
    qbs = build_index(spark, pdf, n_landmarks=cfg.n_landmarks)
    scheme = qbs.scheme
    row = {
        "dataset": name,
        "qbs_L_MB": fmt_mb(scheme.size_labels_bytes(qbs.index.n_vertices)),
        "qbs_delta_MB": fmt_mb(scheme.size_delta_bytes()),
        "qbs_meta_MB": fmt_mb(scheme.size_meta_bytes()),
        "label_entries": scheme.n_label_entries(),
    }
    try:
        ppl = build_ppl(
            pdf,
            time_budget_s=cfg.ppl_time_budget_s,
            mem_budget_bytes=cfg.ppl_mem_budget_bytes,
        )
        row["ppl_MB"] = fmt_mb(ppl.size_bytes())
    except BudgetExceeded as e:
        row["ppl_MB"] = e.kind
    try:
        parent = build_parent_ppl(
            pdf,
            time_budget_s=cfg.ppl_time_budget_s,
            mem_budget_bytes=cfg.ppl_mem_budget_bytes,
        )
        row["parentppl_MB"] = fmt_mb(parent.size_bytes())
    except BudgetExceeded as e:
        row["parentppl_MB"] = e.kind
    qbs.unpersist()
    p = PAPER_TABLE3[name]
    row.update(
        paper_L=p[0], paper_delta=p[1], paper_ppl=p[2], paper_parentppl=p[3]
    )
    return row


def run_table3(spark: SparkSession, cfg: BenchConfig | None = None) -> list[dict]:
    cfg = cfg or BenchConfig()
    return [table3_row(spark, name, cfg) for name in cfg.datasets]
