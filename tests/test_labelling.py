"""Algorithm 2 tests: the distributed labelling must equal the
definition-level reference (Defs 4.1/4.2) and be order-independent
(Lemma 5.2). Uses small graphs — each case runs a multi-source BFS as
DataFrame joins."""
import pytest

from repro.core.labelling import build_scheme
from repro.core.landmarks import select_landmarks, select_landmarks_local
from repro.core.reference import reference_scheme
from repro.graphs.bfs import temp_conf
from repro.graphs.generators import (
    cycle_graph,
    er_graph,
    figure3_graph,
    hub_graph,
    path_graph,
    star_graph,
    to_spark_edges,
)
from repro.localgraph import build_csr


@pytest.fixture(scope="module", autouse=True)
def _small_shuffle(spark):
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        yield


def _build_both(spark, pdf, k, mode="parallel"):
    edges = to_spark_edges(spark, pdf, partitions=2)
    landmarks = select_landmarks(edges, k)
    scheme = build_scheme(spark, edges, landmarks, mode=mode, enrich=False)
    ref = reference_scheme(pdf, landmarks)
    edges.unpersist()
    return scheme, ref


@pytest.mark.parametrize(
    "pdf,k",
    [
        (path_graph(7), 2),
        (cycle_graph(8), 2),
        (star_graph(8), 1),
        (figure3_graph(), 3),
        (hub_graph(40, 3, seed=1), 4),
        (hub_graph(60, 4, hub_boost=0.3, seed=2), 5),
        (er_graph(30, 0.15, seed=3), 3),
    ],
    ids=["path", "cycle", "star", "fig3", "hub40", "hub60", "er30"],
)
def test_distributed_labelling_matches_reference(spark, pdf, k):
    scheme, ref = _build_both(spark, pdf, k)
    assert scheme.landmarks == ref.landmarks
    assert scheme.labels == ref.labels
    assert scheme.meta_edges == ref.meta_edges


def test_sequential_equals_parallel(spark):
    """Lemma 5.2: the scheme is deterministic w.r.t. R, so QbS ≡ QbS-P."""
    pdf = hub_graph(50, 4, hub_boost=0.2, seed=7)
    par, ref = _build_both(spark, pdf, 4, mode="parallel")
    seq, _ = _build_both(spark, pdf, 4, mode="sequential")
    assert par.labels == seq.labels == ref.labels
    assert par.meta_edges == seq.meta_edges == ref.meta_edges


def test_unknown_mode_raises(spark):
    edges = to_spark_edges(spark, path_graph(3), partitions=1)
    with pytest.raises(ValueError):
        build_scheme(spark, edges, [1], mode="bogus", enrich=False)
    edges.unpersist()


def test_labels_never_contain_landmarks_and_respect_cleanness(spark):
    pdf = hub_graph(40, 4, hub_boost=0.2, seed=9)
    scheme, _ = _build_both(spark, pdf, 4)
    lm = scheme.landmark_set
    for v, ent in scheme.labels.items():
        assert v not in lm
        assert len({r for r, _ in ent}) == len(ent)  # one entry per landmark
        for r, d in ent:
            assert r in lm and d >= 1


def test_figure4_style_label_exclusion(spark):
    """A vertex whose every shortest path to a landmark passes another
    landmark must not be labelled with it (Def 4.2). On the paper's Fig 3
    graph with landmarks {1,2,5}: every shortest path 7→1 passes 2 or 5."""
    pdf = figure3_graph()
    edges = to_spark_edges(spark, pdf, partitions=1)
    scheme = build_scheme(spark, edges, [1, 2, 5], enrich=False)
    edges.unpersist()
    assert all(r != 1 for r, _ in scheme.labels.get(7, []))
    # but 7 is cleanly connected to 2 (7-5-2 passes 5... 7-2? d(7,2)=2 via 5)
    ref = reference_scheme(pdf, [1, 2, 5])
    assert scheme.labels == ref.labels


def test_meta_edge_weights_are_true_distances(spark):
    pdf = hub_graph(40, 4, seed=5)
    scheme, _ = _build_both(spark, pdf, 5)
    g = build_csr(pdf)
    from repro.localgraph import distance

    for a, b, w in scheme.meta_edges:
        assert distance(g, a, b) == w


def test_select_landmarks_matches_local(spark):
    pdf = hub_graph(50, 5, hub_boost=0.2, seed=3)
    edges = to_spark_edges(spark, pdf, partitions=2)
    got = select_landmarks(edges, 6)
    g = build_csr(pdf)
    deg = {int(g.vertices[i]): int(d) for i, d in enumerate(g.degrees())}
    assert got == select_landmarks_local(deg, 6)
    edges.unpersist()
