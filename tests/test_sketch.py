"""Algorithm 3 / Definition 4.5 tests — pure driver-side, built on the
definition-level reference scheme (no Spark needed)."""
import pytest

from repro.core.reference import reference_delta, reference_scheme
from repro.core.sketch import build_sketch
from repro.graphs.generators import cycle_graph, figure3_graph, grid_graph, hub_graph, path_graph
from repro.localgraph import build_csr, distance, sample_pairs
from repro.core.landmarks import select_landmarks_local


def _scheme(pdf, k):
    g = build_csr(pdf)
    deg = {int(g.vertices[i]): int(d) for i, d in enumerate(g.degrees())}
    landmarks = select_landmarks_local(deg, k)
    s = reference_scheme(pdf, landmarks)
    s.delta = reference_delta(pdf, landmarks, s.meta_edges)
    return s, g


@pytest.mark.parametrize(
    "pdf,k,seed",
    [
        (hub_graph(50, 4, seed=1), 5, 1),
        (hub_graph(70, 5, hub_boost=0.3, seed=2), 6, 2),
        (cycle_graph(12), 3, 3),
        (grid_graph(4, 4), 4, 4),
        (figure3_graph(), 3, 5),
    ],
    ids=["hub50", "hub70", "cycle", "grid", "fig3"],
)
def test_dtop_upper_bounds_distance(pdf, k, seed):
    """Corollary 4.6: d⊤ ≥ d_G(u,v) for every pair."""
    s, g = _scheme(pdf, k)
    lm = s.landmark_set
    for u, v in sample_pairs(g, 30, seed):
        if u in lm or v in lm:
            continue
        sk = build_sketch(s, u, v)
        d = distance(g, u, v)
        if sk.feasible and d >= 0:
            assert sk.d_top >= d, (u, v)


def test_dtop_exact_when_landmark_on_shortest_path():
    """Path graph, landmark in the middle: d⊤ must equal d_G."""
    pdf = path_graph(7)
    s = reference_scheme(pdf, [4])
    s.delta = reference_delta(pdf, [4], s.meta_edges)
    sk = build_sketch(s, 1, 7)
    assert sk.feasible and sk.d_top == 6
    assert sk.side_u == {4: 3} and sk.side_v == {4: 3}
    assert sk.d_star_u == 2 and sk.d_star_v == 2
    assert sk.pairs == [(4, 4)] and sk.meta_edges == set()


def test_dtop_detour_when_no_landmark_on_path():
    """Landmark off the shortest path: d⊤ strictly exceeds d_G."""
    # triangle fan: 1-2, 2-3, and landmark 9 hanging off 1: 9-1
    pdf = figure3_graph()
    s, g = _scheme(pdf, 1)  # single landmark = vertex 2 (max degree)
    sk = build_sketch(s, 3, 4)  # d(3,4)=1; via landmark 2: 2+1=3
    assert sk.d_top == 2 + 1
    assert distance(g, 3, 4) == 1


def test_sketch_pairs_include_singleton_landmark():
    """r = r' (single landmark on the path) must be considered."""
    pdf = path_graph(5)
    s = reference_scheme(pdf, [3])
    sk = build_sketch(s, 1, 5)
    assert sk.pairs == [(3, 3)]
    assert sk.d_top == 4


def test_sketch_collects_all_minimizing_pairs():
    """Fig-4-style: two landmark routes of equal length both in the sketch."""
    # square 1-2-3-4-1 with landmarks 2 and 4; query (1,3): both routes len 2
    pdf = cycle_graph(4)
    s = reference_scheme(pdf, [2, 4])
    s.delta = reference_delta(pdf, [2, 4], s.meta_edges)
    sk = build_sketch(s, 1, 3)
    assert sk.d_top == 2
    assert set(sk.pairs) == {(2, 2), (4, 4)}
    assert sk.side_u == {2: 1, 4: 1} and sk.side_v == {2: 1, 4: 1}


def test_sketch_infeasible_without_labels():
    pdf = path_graph(4)
    s = reference_scheme(pdf, [1])
    # vertex 4's labels exist (clean path), but fake removal:
    s.labels.pop(4, None)
    sk = build_sketch(s, 2, 4)
    assert not sk.feasible
    assert sk.d_star_u == 0 and sk.d_star_v == 0


def test_sketch_meta_edges_follow_meta_spg():
    """Meta-edges on the sketch come from the pair's meta-SPG (Alg 3 L10)."""
    pdf = path_graph(9)  # landmarks 3 and 7: meta edge (3,7,4)
    s = reference_scheme(pdf, [3, 7])
    s.delta = reference_delta(pdf, [3, 7], s.meta_edges)
    sk = build_sketch(s, 1, 9)
    assert sk.d_top == 8
    assert sk.meta_edges == {(3, 7)}
    assert sk.side_u == {3: 2} and sk.side_v == {7: 2}
    assert sk.d_star_u == 1 and sk.d_star_v == 1
