"""Bi-BFS baseline tests: local and distributed variants vs the oracles."""
import pytest

from repro.baselines.bibfs import bibfs_local, bibfs_spg
from repro.graphs.bfs import temp_conf
from repro.graphs.generators import (
    cycle_graph,
    er_graph,
    figure3_graph,
    grid_graph,
    hub_graph,
    path_graph,
    to_spark_edges,
)
from repro.localgraph import build_csr, sample_pairs
from repro.spg_oracle import distance_reference, spg_reference

from tests.helpers import assert_spg_oracle

GRAPHS = {
    "path": (path_graph(8), 11),
    "cycle": (cycle_graph(9), 12),
    "grid": (grid_graph(4, 4), 13),
    "fig3": (figure3_graph(), 14),
    "hub": (hub_graph(60, 4, hub_boost=0.2, seed=1), 15),
    "er": (er_graph(30, 0.1, seed=2), 16),
}


@pytest.mark.parametrize("name", list(GRAPHS))
def test_bibfs_local_matches_reference(name):
    pdf, seed = GRAPHS[name]
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 30, seed=seed):
        edges, d = bibfs_local(g, u, v)
        assert edges == spg_reference(g, u, v), (name, u, v)
        ref_d = distance_reference(g, u, v)
        assert d == (None if ref_d == -1 else ref_d), (name, u, v)


def test_bibfs_local_trivial_cases():
    g = build_csr(path_graph(4))
    assert bibfs_local(g, 2, 2) == (set(), 0)
    assert bibfs_local(g, 1, 2) == ({(1, 2)}, 1)
    g2 = build_csr([(1, 2), (3, 4)])
    assert bibfs_local(g2, 1, 3) == (set(), None)


@pytest.mark.parametrize("name", ["grid", "fig3", "hub"])
def test_bibfs_distributed_matches_oracle(spark, name):
    pdf, seed = GRAPHS[name]
    g = build_csr(pdf)
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        edges = to_spark_edges(spark, pdf, partitions=2)
        for u, v in sample_pairs(g, 4, seed=seed):
            assert_spg_oracle(spark, pdf, bibfs_spg(spark, edges, u, v), u, v)
        edges.unpersist()


def test_bibfs_distributed_trivial_cases(spark):
    pdf = path_graph(4)
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        edges = to_spark_edges(spark, pdf, partitions=2)
        assert bibfs_spg(spark, edges, 2, 2).isEmpty()
        rows = {tuple(r) for r in bibfs_spg(spark, edges, 1, 3).collect()}
        assert rows == {(1, 2), (2, 3)}
        edges.unpersist()


def test_bibfs_distributed_disconnected(spark):
    import pandas as pd

    pdf = pd.DataFrame({"src": [1, 3], "dst": [2, 4]})
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        edges = to_spark_edges(spark, pdf, partitions=2)
        assert bibfs_spg(spark, edges, 1, 4).isEmpty()
        edges.unpersist()
