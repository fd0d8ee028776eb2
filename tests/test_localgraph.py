"""Unit tests for the driver-local CSR substrate."""
import numpy as np
import pandas as pd
import pytest

from repro.localgraph import (
    INF,
    average_distance,
    bfs_depths,
    build_csr,
    distance,
    sample_pairs,
)
from repro.graphs.generators import cycle_graph, er_graph, grid_graph, path_graph, star_graph


def test_build_csr_basic():
    g = build_csr([(1, 2), (2, 3), (3, 1)])
    assert g.n == 3 and g.m == 3
    assert sorted(g.vertices.tolist()) == [1, 2, 3]
    assert g.edge_set() == {(1, 2), (2, 3), (1, 3)}


def test_build_csr_dedup_and_selfloop():
    g = build_csr([(1, 2), (2, 1), (1, 1), (1, 2)])
    assert g.m == 1
    assert g.edge_set() == {(1, 2)}


def test_build_csr_from_pandas():
    pdf = pd.DataFrame({"src": [5, 6], "dst": [6, 7]})
    g = build_csr(pdf)
    assert g.edge_set() == {(5, 6), (6, 7)}


def test_build_csr_empty():
    g = build_csr([])
    assert g.n == 0 and g.m == 0


def test_index_of_missing_raises():
    g = build_csr([(1, 2)])
    with pytest.raises(KeyError):
        g.index_of(99)


def test_degrees():
    g = build_csr(star_graph(5))
    deg = dict(zip(g.vertices.tolist(), g.degrees().tolist()))
    assert deg[1] == 4 and all(deg[v] == 1 for v in (2, 3, 4, 5))


@pytest.mark.parametrize("n", [2, 3, 5, 9])
def test_bfs_depths_path(n):
    g = build_csr(path_graph(n))
    d = bfs_depths(g, 1)
    for v in range(1, n + 1):
        assert d[g.index_of(v)] == v - 1


@pytest.mark.parametrize("n", [4, 5, 8, 11])
def test_bfs_depths_cycle(n):
    g = build_csr(cycle_graph(n))
    d = bfs_depths(g, 1)
    for v in range(1, n + 1):
        expected = min(v - 1, n - (v - 1))
        assert d[g.index_of(v)] == expected


def test_bfs_banned_blocks_paths():
    # path 1-2-3: banning 2 disconnects 3
    g = build_csr(path_graph(3))
    banned = np.zeros(g.n, bool)
    banned[g.index_of(2)] = True
    d = bfs_depths(g, 1, banned=banned)
    assert d[g.index_of(3)] == INF


def test_bfs_banned_source():
    g = build_csr(path_graph(3))
    banned = np.zeros(g.n, bool)
    banned[g.index_of(1)] = True
    assert (bfs_depths(g, 1, banned=banned) == INF).all()


def test_distance_disconnected():
    g = build_csr([(1, 2), (3, 4)])
    assert distance(g, 1, 3) == INF
    assert distance(g, 1, 2) == 1
    assert distance(g, 1, 1) == 0


@pytest.mark.parametrize("rows,cols", [(2, 3), (3, 3), (3, 4)])
def test_grid_distance_is_manhattan(rows, cols):
    g = build_csr(grid_graph(rows, cols))
    def vid(r, c):
        return r * cols + c + 1
    assert distance(g, vid(0, 0), vid(rows - 1, cols - 1)) == rows - 1 + cols - 1


def test_sample_pairs_deterministic_and_distinct():
    g = build_csr(er_graph(30, 0.2, seed=1))
    p1 = sample_pairs(g, 50, seed=3)
    p2 = sample_pairs(g, 50, seed=3)
    assert p1 == p2
    assert all(u != v for u, v in p1)
    ids = set(g.vertices.tolist())
    assert all(u in ids and v in ids for u, v in p1)


def test_average_distance_path():
    g = build_csr(path_graph(2))
    assert average_distance(g, n_pairs=10) == 1.0
