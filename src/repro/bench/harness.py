"""Shared benchmark plumbing: configuration, query sampling, timing and
result output (results/*.csv + markdown tables for EXPERIMENTS.md)."""
from __future__ import annotations

import csv
import os
import time
from contextlib import contextmanager
from dataclasses import dataclass, field
from pathlib import Path

from ..graphs.registry import DATASETS
from ..localgraph import CSRGraph

RESULTS_DIR = Path(os.environ.get("REPRO_RESULTS_DIR", "results"))


@dataclass
class BenchConfig:
    """Knobs for the table harnesses (env-overridable, DESIGN.md §2)."""

    scale: float = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))
    n_landmarks: int = int(os.environ.get("REPRO_LANDMARKS", "20"))
    #: distributed-panel queries per dataset (Spark pays per-level latency)
    n_queries_dist: int = int(os.environ.get("REPRO_QUERIES_DIST", "5"))
    #: local-panel queries per dataset
    n_queries_local: int = int(os.environ.get("REPRO_QUERIES_LOCAL", "100"))
    #: PPL/ParentPPL budgets standing in for the paper's 24 h / 512 GB
    ppl_time_budget_s: float = float(os.environ.get("REPRO_PPL_BUDGET_S", "60"))
    ppl_mem_budget_bytes: int = int(os.environ.get("REPRO_PPL_BUDGET_B", str(2 << 30)))
    datasets: list[str] = field(default_factory=lambda: list(DATASETS))


@contextmanager
def timed():
    """``with timed() as t: ...; t() -> seconds``."""
    t0 = time.perf_counter()
    out = {"s": None}
    yield lambda: out["s"] if out["s"] is not None else time.perf_counter() - t0
    out["s"] = time.perf_counter() - t0


def sample_query_pairs(
    g: CSRGraph, n: int, seed: int, exclude: set[int] = frozenset()
) -> list[tuple[int, int]]:
    """Seeded random distinct pairs avoiding ``exclude`` (landmark endpoints
    — the paper samples from millions of vertices so never hits its 20
    landmarks; at our scale we exclude them explicitly)."""
    import numpy as np

    rng = np.random.default_rng(seed)
    ids = [int(x) for x in g.vertices if int(x) not in exclude]
    out = []
    while len(out) < n and len(ids) >= 2:
        u, v = rng.choice(len(ids), 2, replace=False)
        out.append((ids[int(u)], ids[int(v)]))
    return out


def write_csv(name: str, rows: list[dict]) -> Path:
    RESULTS_DIR.mkdir(parents=True, exist_ok=True)
    path = RESULTS_DIR / f"{name}.csv"
    if rows:
        with open(path, "w", newline="") as f:
            w = csv.DictWriter(f, fieldnames=list(rows[0]))
            w.writeheader()
            w.writerows(rows)
    return path


def markdown_table(rows: list[dict]) -> str:
    """Render rows as a GitHub markdown table (the job harness output)."""
    if not rows:
        return "(no rows)"
    cols = list(rows[0])
    out = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for r in rows:
        out.append("| " + " | ".join(str(r.get(c, "")) for c in cols) + " |")
    return "\n".join(out)


def fmt_ms(seconds: float) -> str:
    return f"{seconds * 1e3:.3f}"


def fmt_mb(nbytes: float) -> str:
    return f"{nbytes / 1e6:.3f}"
