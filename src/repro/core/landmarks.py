"""Landmark selection (Section 6.1, "Landmarks").

The paper chooses the ``|R|`` highest-degree vertices (default 20): removing
them sparsifies hub-heavy graphs the most, and distances to high-degree
landmarks estimate pairwise distances well. Ties break on vertex id so the
selection — and hence the whole labelling scheme (Lemma 5.2) — is
deterministic.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..graphs.stats import degrees_df


def select_landmarks(sym_edges: DataFrame, k: int) -> list[int]:
    """Top-``k`` degree vertices from a symmetric edge DataFrame."""
    rows = (
        degrees_df(sym_edges)
        .orderBy(F.desc("deg"), F.asc("v"))
        .limit(k)
        .collect()
    )
    return [int(r["v"]) for r in rows]


def select_landmarks_local(degrees: dict[int, int], k: int) -> list[int]:
    """Same selection over a driver-local degree map (used by tests and the
    PPL baselines' vertex ordering)."""
    return [v for v, _ in sorted(degrees.items(), key=lambda kv: (-kv[1], kv[0]))[:k]]
