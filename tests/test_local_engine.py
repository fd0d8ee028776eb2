"""Guided-search correctness battery: the local QbS engine (Algorithm 4)
must reproduce the exact SPG on a wide spread of graphs and query pairs.

Bulk assertions run against the pure-python double-BFS reference; one
representative case per graph family additionally routes through the DuckDB
recursive-CTE oracle via ``repro.oracle.assert_equivalent`` (the mandated
query-result check — see tests/helpers.py).
"""
import pytest

from repro.core.landmarks import select_landmarks_local
from repro.core.local_engine import LocalQbSEngine
from repro.core.reference import reference_delta, reference_scheme
from repro.graphs.generators import (
    cycle_graph,
    er_graph,
    figure3_graph,
    grid_graph,
    hub_graph,
    path_graph,
    star_graph,
)
from repro.localgraph import build_csr, sample_pairs
from repro.spg_oracle import spg_reference

from tests.helpers import assert_spg_oracle


def build_engine(pdf, k):
    g = build_csr(pdf)
    deg = {int(g.vertices[i]): int(d) for i, d in enumerate(g.degrees())}
    landmarks = select_landmarks_local(deg, min(k, g.n))
    scheme = reference_scheme(pdf, landmarks)
    scheme.delta = reference_delta(pdf, landmarks, scheme.meta_edges)
    return LocalQbSEngine.build(pdf, scheme), g


GRAPHS = {
    "path9": (path_graph(9), 2),
    "cycle8": (cycle_graph(8), 2),
    "cycle9": (cycle_graph(9), 3),
    "star10": (star_graph(10), 1),
    "grid44": (grid_graph(4, 4), 3),
    "grid35": (grid_graph(3, 5), 4),
    "fig3": (figure3_graph(), 3),
    "hub40": (hub_graph(40, 4, seed=1), 4),
    "hub60boost": (hub_graph(60, 5, hub_boost=0.3, seed=2), 5),
    "hub80": (hub_graph(80, 6, hub_boost=0.15, seed=3), 8),
    "er30": (er_graph(30, 0.12, seed=4), 3),
    "er40": (er_graph(40, 0.10, seed=5), 5),
}


@pytest.mark.parametrize("name", list(GRAPHS))
def test_engine_matches_reference_on_sampled_pairs(name):
    pdf, k = GRAPHS[name]
    eng, g = build_engine(pdf, k)
    for u, v in sample_pairs(g, 40, seed=hash(name) % 1000):
        assert eng.query(u, v) == spg_reference(g, u, v), (name, u, v)


@pytest.mark.parametrize("name", list(GRAPHS))
def test_engine_all_pairs_small(name):
    """Exhaustive all-pairs check on every graph family (truncated to the
    first 20 vertices to bound runtime)."""
    pdf, k = GRAPHS[name]
    eng, g = build_engine(pdf, k)
    vs = [int(x) for x in g.vertices[:20]]
    for i, u in enumerate(vs):
        for v in vs[i + 1 :]:
            assert eng.query(u, v) == spg_reference(g, u, v), (name, u, v)


@pytest.mark.parametrize("name", ["path9", "grid44", "fig3", "hub40", "er30"])
def test_engine_against_duckdb_oracle(spark, name):
    """Representative pairs through the mandated DuckDB oracle."""
    pdf, k = GRAPHS[name]
    eng, g = build_engine(pdf, k)
    for u, v in sample_pairs(g, 5, seed=42):
        assert_spg_oracle(spark, pdf, eng.query(u, v), u, v)


def test_engine_same_vertex_empty():
    eng, _ = build_engine(path_graph(5), 2)
    assert eng.query(3, 3) == set()
    assert eng.last_stats.distance == 0


def test_engine_adjacent_pair():
    eng, _ = build_engine(path_graph(5), 2)
    assert eng.query(2, 3) == {(2, 3)}
    assert eng.last_stats.distance == 1


def test_engine_landmark_endpoint_fallback():
    pdf = hub_graph(40, 4, seed=6)
    eng, g = build_engine(pdf, 4)
    r = eng.scheme.landmarks[0]
    adj = {int(g.vertices[j]) for j in g.neighbors(g.index_of(r))}
    other = next(int(x) for x in g.vertices if x != r and int(x) not in adj)
    assert eng.query(r, other) == spg_reference(g, r, other)
    assert eng.last_stats.fallback == "bibfs"


def test_engine_disconnected_pair():
    pdf = er_graph(30, 0.05, seed=9)  # likely disconnected
    eng, g = build_engine(pdf, 3)
    found = False
    for u, v in sample_pairs(g, 60, seed=1):
        if spg_reference(g, u, v) == set() and u != v:
            assert eng.query(u, v) == set(), (u, v)
            found = True
    assert found, "sample contained no disconnected pair; adjust seed"


def test_engine_stats_populated():
    eng, g = build_engine(hub_graph(50, 4, seed=7), 5)
    for u, v in sample_pairs(g, 10, seed=2):
        eng.query(u, v)
        st = eng.last_stats
        if st.fallback is None and st.distance not in (0, 1):
            assert st.levels >= 1
            assert st.edges_scanned > 0
            assert st.used_reverse or st.used_recover
            return
    pytest.skip("no non-trivial pair sampled")


def test_figure3_spg_through_engine():
    eng, g = build_engine(figure3_graph(), 3)
    assert eng.query(3, 7) == {(1, 3), (1, 2), (3, 4), (2, 4), (2, 5), (5, 7)}
