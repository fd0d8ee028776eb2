"""Meta-graph APSP, per-pair meta-SPGs, and Δ precomputation tests."""
import pytest

from repro.core.labelling import build_scheme
from repro.core.landmarks import select_landmarks
from repro.core.metagraph import compute_delta, meta_apsp, meta_pair_spgs
from repro.core.reference import reference_delta, reference_scheme
from repro.graphs.bfs import temp_conf
from repro.graphs.generators import cycle_graph, figure3_graph, grid_graph, hub_graph, to_spark_edges
from repro.localgraph import build_csr, distance


@pytest.fixture(scope="module", autouse=True)
def _small_shuffle(spark):
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        yield


def test_meta_apsp_simple_chain():
    # meta edges 1-2 (w=2), 2-3 (w=3): d(1,3)=5
    dist = meta_apsp([1, 2, 3], [(1, 2, 2), (2, 3, 3)])
    assert dist[(1, 3)] == 5 and dist[(3, 1)] == 5
    assert dist[(1, 1)] == 0


def test_meta_apsp_disconnected_absent():
    dist = meta_apsp([1, 2, 3], [(1, 2, 1)])
    assert (1, 3) not in dist


def test_meta_apsp_prefers_shorter_path():
    dist = meta_apsp([1, 2, 3], [(1, 2, 1), (2, 3, 1), (1, 3, 5)])
    assert dist[(1, 3)] == 2


def test_meta_pair_spgs_includes_all_tied_paths():
    edges = [(1, 2, 1), (2, 4, 1), (1, 3, 1), (3, 4, 1)]
    dist = meta_apsp([1, 2, 3, 4], edges)
    spg = meta_pair_spgs([1, 2, 3, 4], edges, dist)
    assert spg[(1, 4)] == [(1, 2), (1, 3), (2, 4), (3, 4)]
    assert spg[(2, 3)] == [(1, 2), (1, 3), (2, 4), (3, 4)]


def test_meta_pair_spgs_excludes_detours():
    edges = [(1, 2, 1), (2, 3, 1), (1, 3, 5)]
    dist = meta_apsp([1, 2, 3], edges)
    spg = meta_pair_spgs([1, 2, 3], edges, dist)
    assert spg[(1, 3)] == [(1, 2), (2, 3)]


@pytest.mark.parametrize(
    "pdf,k",
    [
        (figure3_graph(), 3),
        (cycle_graph(9), 3),
        (grid_graph(3, 4), 3),
        (hub_graph(40, 4, seed=4), 4),
        (hub_graph(60, 5, hub_boost=0.3, seed=6), 5),
    ],
    ids=["fig3", "cycle", "grid", "hub40", "hub60"],
)
def test_compute_delta_matches_bruteforce(spark, pdf, k):
    edges = to_spark_edges(spark, pdf, partitions=2)
    landmarks = select_landmarks(edges, k)
    scheme = build_scheme(spark, edges, landmarks, enrich=False)
    got = compute_delta(spark, scheme, edges)
    expect = reference_delta(pdf, landmarks, scheme.meta_edges)
    edges.unpersist()
    assert got == expect


def test_enriched_meta_dist_equals_true_landmark_distances(spark):
    """d_M(r,r') = d_G(r,r') for all landmark pairs (meta-path argument,
    Section 4.2)."""
    pdf = hub_graph(50, 4, hub_boost=0.2, seed=8)
    edges = to_spark_edges(spark, pdf, partitions=2)
    landmarks = select_landmarks(edges, 5)
    scheme = build_scheme(spark, edges, landmarks)
    g = build_csr(pdf)
    for i, r in enumerate(landmarks):
        for r2 in landmarks[i + 1 :]:
            d = distance(g, r, r2)
            if d == -1:
                assert (r, r2) not in scheme.meta_dist
            else:
                assert scheme.meta_dist[(r, r2)] == d, (r, r2)
    edges.unpersist()


def test_scheme_size_accounting(spark):
    pdf = figure3_graph()
    edges = to_spark_edges(spark, pdf, partitions=1)
    scheme = build_scheme(spark, edges, select_landmarks(edges, 2))
    n = 7
    assert scheme.size_labels_bytes(n) == (n - 2) * 2
    assert scheme.size_meta_bytes() == len(scheme.meta_edges) * 24
    assert scheme.size_delta_bytes() >= 0
    edges.unpersist()
