"""Benchmark — landmark sweep (Figs 9–11 trends as a table): offline build
+ local query sampling for |R| ∈ {5, 20} on one dataset. Full sweep via
``python jobs/landmark_sweep.py`` (EXPERIMENTS.md)."""
import pytest

from repro.bench.harness import BenchConfig
from repro.bench.sweep import run_sweep

CFG = BenchConfig()


@pytest.mark.parametrize("k", [5, 20])
def test_sweep_douban(benchmark, spark, k):
    rows = benchmark.pedantic(
        lambda: run_sweep(spark, CFG, datasets=["douban"], landmark_counts=[k]),
        rounds=1,
        iterations=1,
    )
    assert rows[0]["landmarks"] == k
