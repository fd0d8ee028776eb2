"""Distributed guided search (Algorithm 4 as DataFrame joins): must equal
the local engine and the DuckDB oracle on every tested graph/pair."""
import pytest

from repro.core.qbs import build_index
from repro.graphs.bfs import temp_conf
from repro.graphs.generators import cycle_graph, figure3_graph, grid_graph, hub_graph
from repro.localgraph import build_csr, sample_pairs
from repro.spg_oracle import spg_reference

from tests.helpers import assert_spg_oracle

GRAPHS = {
    "fig3": (figure3_graph(), 3, 3),
    "cycle10": (cycle_graph(10), 2, 4),
    "grid34": (grid_graph(3, 4), 3, 4),
    "hub50": (hub_graph(50, 4, hub_boost=0.25, seed=21), 5, 5),
}


@pytest.fixture(scope="module", autouse=True)
def _small_shuffle(spark):
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        yield


@pytest.fixture(scope="module")
def built(spark):
    out = {}
    for name, (pdf, k, _) in GRAPHS.items():
        out[name] = build_index(spark, pdf, n_landmarks=k, partitions=2)
    yield out
    for q in out.values():
        q.unpersist()


@pytest.mark.parametrize("name", list(GRAPHS))
def test_distributed_equals_local_and_oracle(spark, built, name):
    pdf, _, n_pairs = GRAPHS[name]
    qbs = built[name]
    g = build_csr(pdf)
    for u, v in sample_pairs(g, n_pairs, seed=31):
        df = qbs.query_df(u, v)
        got = {(int(r["a"]), int(r["b"])) for r in df.collect()}
        assert got == qbs.query_local(u, v), (name, u, v)
        assert_spg_oracle(spark, pdf, df, u, v)


def test_distributed_trivial_and_edge_cases(spark, built):
    qbs = built["fig3"]
    assert qbs.query_df(3, 3).isEmpty()
    rows = {tuple(r) for r in qbs.query_df(1, 2).collect()}
    assert rows == {(1, 2)}
    # landmark endpoint falls back to distributed Bi-BFS
    r = qbs.scheme.landmarks[0]
    pdf = GRAPHS["fig3"][0]
    g = build_csr(pdf)
    for other in (int(x) for x in g.vertices):
        if other != r:
            got = {(int(x["a"]), int(x["b"])) for x in qbs.query_df(r, other).collect()}
            assert got == spg_reference(g, r, other), (r, other)


def test_figure3_query_distributed(spark, built):
    qbs = built["fig3"]
    got = {tuple(r) for r in qbs.query_df(3, 7).collect()}
    assert got == {(1, 3), (1, 2), (3, 4), (2, 4), (2, 5), (5, 7)}


def test_recover_only_case(spark):
    """Pair whose every shortest path passes a landmark: bi-BFS on G⁻ finds
    a longer detour (or none), the recover search supplies the answer."""
    from repro.graphs.generators import star_graph

    pdf = star_graph(8)
    qbs = build_index(spark, pdf, n_landmarks=1, partitions=2)
    g = build_csr(pdf)
    got = {tuple(r) for r in qbs.query_df(2, 5).collect()}
    assert got == spg_reference(g, 2, 5) == {(1, 2), (1, 5)}
    qbs.unpersist()
