"""End-to-end: build a QbS index on registry datasets (small scale) and
answer queries on both substrates, oracle-checked."""
import pytest

from repro.core.qbs import build_index
from repro.graphs.bfs import temp_conf
from repro.graphs.registry import dataset_edges
from repro.localgraph import build_csr
from repro.spg_oracle import spg_reference

from tests.helpers import assert_spg_oracle


@pytest.fixture(scope="module", autouse=True)
def _small_shuffle(spark):
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        yield


@pytest.mark.parametrize("name", ["douban", "wikitalk", "friendster"])
def test_end2end_registry_dataset(spark, name):
    pdf = dataset_edges(name, scale=0.02)
    g = build_csr(pdf)
    qbs = build_index(spark, pdf, n_landmarks=8, partitions=2)
    from repro.localgraph import sample_pairs

    checked = 0
    for u, v in sample_pairs(g, 6, seed=3):
        ref = spg_reference(g, u, v)
        assert qbs.query_local(u, v) == ref, (name, u, v)
        got = {(int(r["a"]), int(r["b"])) for r in qbs.query_df(u, v).collect()}
        assert got == ref, (name, u, v)
        checked += 1
    assert checked == 6
    # one pair through the mandated DuckDB oracle
    u, v = sample_pairs(g, 1, seed=9)[0]
    assert_spg_oracle(spark, pdf, qbs.query_df(u, v), u, v)
    qbs.unpersist()


def test_landmarks_capped_by_graph_size(spark):
    pdf = dataset_edges("douban", scale=0.003)
    qbs = build_index(spark, pdf, n_landmarks=10, partitions=1)
    assert len(qbs.scheme.landmarks) == 10
    qbs.unpersist()


def test_query_stats_exposed(spark):
    pdf = dataset_edges("douban", scale=0.01)
    qbs = build_index(spark, pdf, n_landmarks=5, partitions=2)
    g = qbs.local.g
    from repro.localgraph import sample_pairs

    for u, v in sample_pairs(g, 5, seed=4):
        qbs.query_df(u, v).collect()
        st = qbs.index.last_stats
        assert st.distance is not None
        if st.fallback is None and st.distance > 1:
            assert st.levels >= 1
            break
    qbs.unpersist()
