"""Registry of the 12 dataset analogues (Table 1 rows).

Each entry is a scaled-down synthetic stand-in for one of the paper's
real-world graphs (DESIGN.md §4 documents the substitution). ``scale``
multiplies vertex counts uniformly: tests run at ``scale≈0.02``, the bench
profile defaults to ``scale=1.0`` (override with env ``REPRO_BENCH_SCALE``).
"""
from __future__ import annotations

import os
from dataclasses import dataclass

import pandas as pd

from .generators import hub_graph

#: Paper's Table 1 values for side-by-side reporting in EXPERIMENTS.md.
PAPER_TABLE1 = {
    # name: (|V|, |E^un|, max_deg, avg_deg, avg_dist, size)
    "douban": ("0.2M", "0.3M", 287, 4.2, 5.2, "2.5MB"),
    "dblp": ("0.3M", "1.1M", 343, 6.6, 6.8, "8.0MB"),
    "youtube": ("1.1M", "3.0M", 28_754, 5.27, 5.3, "23MB"),
    "wikitalk": ("2.4M", "4.7M", 100_029, 3.89, 3.9, "36MB"),
    "skitter": ("1.7M", "11.1M", 35_455, 13.08, 5.1, "85MB"),
    "baidu": ("2.1M", "17.0M", 97_848, 15.89, 4.1, "130MB"),
    "livejournal": ("4.8M", "43.1M", 20_334, 17.79, 5.5, "329MB"),
    "orkut": ("3.1M", "117M", 33_313, 76.28, 4.2, "894MB"),
    "twitter": ("41.7M", "1.2B", 2_997_487, 57.74, 3.6, "9.0GB"),
    "friendster": ("65.6M", "1.8B", 5_214, 55.06, 4.8, "13.0GB"),
    "uk2007": ("106M", "3.3B", 979_738, 62.77, 5.6, "24.8GB"),
    "clueweb09": ("1.7B", "7.8B", 6_444_720, 9.27, 7.5, "58.2GB"),
}


@dataclass(frozen=True)
class DatasetSpec:
    """Generator parameters for one analogue (see generators.hub_graph)."""

    name: str  # paper dataset key
    n: int  # vertex count at scale=1.0
    avg_deg: float
    hub_boost: float  # 0 = flat tail, ~0.3 = extreme celebrity hubs
    seed: int

    def edges(self, scale: float = 1.0) -> pd.DataFrame:
        n = max(20, int(self.n * scale))
        return hub_graph(
            n, self.avg_deg, hub_boost=self.hub_boost, n_hubs=max(5, n // 400), seed=self.seed
        )


#: Ordered as in the paper's Table 1. Degrees for the three densest graphs
#: are halved vs the paper (DESIGN.md §4) to fit the session wall clock.
DATASETS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("douban", 8_000, 4.2, 0.05, 101),
        DatasetSpec("dblp", 10_000, 6.6, 0.02, 102),
        DatasetSpec("youtube", 12_000, 5.3, 0.20, 103),
        DatasetSpec("wikitalk", 14_000, 3.9, 0.35, 104),
        DatasetSpec("skitter", 10_000, 13.0, 0.20, 105),
        DatasetSpec("baidu", 12_000, 16.0, 0.25, 106),
        DatasetSpec("livejournal", 16_000, 17.8, 0.10, 107),
        DatasetSpec("orkut", 12_000, 38.0, 0.0, 108),
        DatasetSpec("twitter", 20_000, 50.0, 0.35, 109),
        DatasetSpec("friendster", 24_000, 28.0, 0.0, 110),
        DatasetSpec("uk2007", 22_000, 30.0, 0.20, 111),
        DatasetSpec("clueweb09", 30_000, 9.3, 0.35, 112),
    ]
}


def bench_scale() -> float:
    """Benchmark scale factor (env ``REPRO_BENCH_SCALE``, default 1.0)."""
    return float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))


def dataset_edges(name: str, *, scale: float | None = None) -> pd.DataFrame:
    """Canonical undirected edge table for a registry dataset."""
    if name not in DATASETS:
        raise KeyError(f"unknown dataset {name!r}; options: {list(DATASETS)}")
    return DATASETS[name].edges(bench_scale() if scale is None else scale)
