"""Tests for the synthetic graph generators (DESIGN.md §4 substitutions)."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import (
    ba_graph,
    cycle_graph,
    er_graph,
    figure3_graph,
    grid_graph,
    hub_graph,
    path_graph,
    star_graph,
)
from repro.localgraph import INF, bfs_depths, build_csr


def _connected(pdf: pd.DataFrame) -> bool:
    g = build_csr(pdf)
    if g.n == 0:
        return True
    return (bfs_depths(g, int(g.vertices[0])) != INF).all()


def _is_canonical(pdf: pd.DataFrame) -> bool:
    if len(pdf) == 0:
        return True
    ok = (pdf["src"] < pdf["dst"]).all()
    return bool(ok) and not pdf.duplicated(["src", "dst"]).any()


@pytest.mark.parametrize("n,m", [(10, 1), (50, 2), (200, 3), (500, 5)])
def test_ba_graph_connected_canonical(n, m):
    pdf = ba_graph(n, m, seed=4)
    assert _is_canonical(pdf)
    assert _connected(pdf)
    assert build_csr(pdf).n == n


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_ba_graph_deterministic(seed):
    a = ba_graph(100, 2, seed=seed)
    b = ba_graph(100, 2, seed=seed)
    pd.testing.assert_frame_equal(a, b)
    c = ba_graph(100, 2, seed=seed + 10)
    assert not a.equals(c)


def test_ba_graph_heavy_tail():
    deg = build_csr(ba_graph(500, 2, seed=0)).degrees()
    assert deg.max() >= 5 * np.median(deg)


@pytest.mark.parametrize("avg", [3.0, 6.0, 12.5])
def test_hub_graph_degree_target(avg):
    n = 600
    pdf = hub_graph(n, avg, seed=2)
    got = 2 * len(pdf) / n
    assert got == pytest.approx(avg, rel=0.25)
    assert _connected(pdf) and _is_canonical(pdf)


def test_hub_boost_increases_max_degree():
    flat = build_csr(hub_graph(800, 6, hub_boost=0.0, seed=3)).degrees().max()
    hubby = build_csr(hub_graph(800, 6, hub_boost=0.4, n_hubs=5, seed=3)).degrees().max()
    assert hubby > 2 * flat


def test_hub_graph_deterministic():
    a = hub_graph(300, 5, hub_boost=0.2, seed=9)
    b = hub_graph(300, 5, hub_boost=0.2, seed=9)
    pd.testing.assert_frame_equal(a, b)


def test_er_graph_shape():
    pdf = er_graph(40, 0.15, seed=1)
    assert _is_canonical(pdf)
    assert 0 < len(pdf) < 40 * 39 / 2


def test_path_cycle_star_grid_counts():
    assert len(path_graph(6)) == 5
    assert len(cycle_graph(6)) == 6
    assert len(star_graph(6)) == 5
    assert len(grid_graph(3, 4)) == 3 * 3 + 2 * 4  # h: 3 rows×3, v: 2×4


def test_figure3_graph_matches_paper_labels():
    """Distances must reproduce the label table of Fig 3(b)."""
    g = build_csr(figure3_graph())
    expect = {  # (u, v): d from the paper's 2-hop distance cover labels
        (1, 2): 1, (1, 3): 1, (1, 4): 2, (1, 5): 2, (1, 6): 2, (1, 7): 3,
        (2, 3): 2, (2, 4): 1, (2, 5): 1, (2, 6): 1, (2, 7): 2,
        (3, 4): 1, (5, 6): 1, (5, 7): 1, (3, 7): 4,
    }
    for (u, v), d in expect.items():
        du = bfs_depths(g, u)
        assert du[g.index_of(v)] == d, (u, v)
