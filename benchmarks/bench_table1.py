"""Benchmark — Table 1 (dataset statistics) row computation, per dataset.

The full 12-row table with paper-vs-measured columns is produced by
``python jobs/table1_datasets.py`` (EXPERIMENTS.md); this benchmark times
the per-dataset statistics pipeline (generation + DataFrame degree stats +
sampled average distance).
"""
import pytest

from repro.bench.harness import BenchConfig
from repro.graphs.generators import to_spark_edges
from repro.graphs.registry import DATASETS
from repro.graphs.stats import graph_stats

CFG = BenchConfig()


@pytest.mark.parametrize("name", list(DATASETS))
def test_table1_stats(benchmark, spark, name):
    pdf = DATASETS[name].edges(CFG.scale)

    def run():
        edges = to_spark_edges(spark, pdf)
        st = graph_stats(edges, pdf, dist_pairs=100)
        edges.unpersist()
        return st

    st = benchmark.pedantic(run, rounds=1, iterations=1)
    assert st.n_vertices > 0 and st.avg_dist > 0
