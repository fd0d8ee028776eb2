"""Tests of the distributed (DataFrame-join) BFS engine against the local
reference and the DuckDB distance oracle."""
import pytest
from pyspark.sql import functions as F

from repro import oracle
from repro.graphs.bfs import (
    bfs_levels,
    canonical_spg,
    keyed_expand,
    materialize,
    neighbor_ids,
    neighbor_pairs,
    remove_vertices,
    temp_conf,
    walk_down,
)
from repro.graphs.generators import cycle_graph, figure3_graph, hub_graph, path_graph, to_spark_edges
from repro.localgraph import INF, bfs_depths, build_csr

pytestmark = pytest.mark.usefixtures("spark")


@pytest.fixture(scope="module", autouse=True)
def _small_shuffle(spark):
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        yield


def _levels_dict(df):
    return {int(r["v"]): int(r["depth"]) for r in df.collect()}


def test_bfs_levels_path(spark):
    edges = to_spark_edges(spark, path_graph(5), partitions=2)
    got = _levels_dict(bfs_levels(spark, edges, 1))
    assert got == {1: 0, 2: 1, 3: 2, 4: 3, 5: 4}
    edges.unpersist()


def test_bfs_levels_matches_local_reference(spark):
    pdf = hub_graph(80, 4, hub_boost=0.2, seed=11)
    g = build_csr(pdf)
    edges = to_spark_edges(spark, pdf, partitions=4)
    src = int(g.vertices[0])
    got = _levels_dict(bfs_levels(spark, edges, src))
    ref = bfs_depths(g, src)
    expect = {int(g.vertices[i]): int(ref[i]) for i in range(g.n) if ref[i] != INF}
    assert got == expect
    edges.unpersist()


def test_bfs_levels_depth_as_distance_oracle(spark):
    """BFS levels are single-source distances — check one row against the
    DuckDB recursive-CTE distance oracle via assert_equivalent."""
    from repro.spg_oracle import distance_sql

    pdf = cycle_graph(9)
    edges = to_spark_edges(spark, pdf, partitions=2)
    lv = bfs_levels(spark, edges, 1)
    got = lv.where(F.col("v") == 5).select(F.col("depth").alias("dist"))
    oracle.assert_equivalent(got, distance_sql(1, 5), edges=pdf)
    edges.unpersist()


def test_bfs_levels_max_depth(spark):
    edges = to_spark_edges(spark, path_graph(6), partitions=2)
    got = _levels_dict(bfs_levels(spark, edges, 1, max_depth=2))
    assert got == {1: 0, 2: 1, 3: 2}
    edges.unpersist()


def test_neighbor_ids(spark):
    edges = to_spark_edges(spark, path_graph(4), partitions=2)
    assert sorted(neighbor_ids(spark, edges, [2])) == [1, 3]
    assert sorted(neighbor_ids(spark, edges, [2, 3])) == [1, 2, 3, 4]
    assert neighbor_ids(spark, edges, []) == []
    edges.unpersist()


def test_neighbor_pairs(spark):
    edges = to_spark_edges(spark, path_graph(3), partitions=2)
    pairs = {tuple(r) for r in neighbor_pairs(spark, edges, [2]).itertuples(index=False)}
    assert pairs == {(2, 1), (2, 3)}
    assert len(neighbor_pairs(spark, edges, [])) == 0
    edges.unpersist()


def test_keyed_expand_aggregates_cleanliness(spark):
    # two roots on a path; root 10's frontier dirty, root 20's clean
    edges = to_spark_edges(spark, path_graph(3), partitions=2)
    out = keyed_expand(spark, edges, [(10, 2, False), (20, 2, True)])
    got = {(int(r.root), int(r.v)): bool(r.clean) for r in out.itertuples(index=False)}
    assert got == {(10, 1): False, (10, 3): False, (20, 1): True, (20, 3): True}
    edges.unpersist()


def test_walk_down_follows_depths(spark):
    pdf = cycle_graph(6)
    g = build_csr(pdf)
    edges = to_spark_edges(spark, pdf, partitions=2)
    depth = {int(g.vertices[i]): int(d) for i, d in enumerate(bfs_depths(g, 1))}
    got = walk_down(spark, edges, [4], depth.get)
    # both arcs of the even cycle descend to 1
    assert got == {(3, 4), (4, 5), (2, 3), (5, 6), (1, 2), (1, 6)}
    edges.unpersist()


def test_walk_down_from_level_zero_is_empty(spark):
    edges = to_spark_edges(spark, path_graph(3), partitions=2)
    assert walk_down(spark, edges, [1], {1: 0}.get) == set()
    edges.unpersist()


def test_remove_vertices_sparsifies(spark):
    edges = to_spark_edges(spark, figure3_graph(), partitions=2)
    gm = remove_vertices(edges, [2])  # vertex 2 is the figure's high-degree hub
    left = {(int(r["src"]), int(r["dst"])) for r in gm.collect()}
    assert all(2 not in e for e in left)
    # both orientations of every surviving edge remain
    assert (1, 3) in left and (3, 1) in left
    edges.unpersist()


def test_remove_vertices_empty_list_is_identity(spark):
    edges = to_spark_edges(spark, path_graph(3), partitions=2)
    assert remove_vertices(edges, []) is edges
    edges.unpersist()


def test_canonical_spg_dedups_and_orders(spark):
    df = spark.createDataFrame([(2, 1), (1, 2), (3, 3), (4, 5)], "a long, b long")
    got = {(int(r["a"]), int(r["b"])) for r in canonical_spg(df).collect()}
    assert got == {(1, 2), (4, 5)}


def test_materialize_preserves_rows(spark):
    df = spark.createDataFrame([(1, 0), (2, 1)], "v long, depth long")
    assert sorted(map(tuple, materialize(df).collect())) == [(1, 0), (2, 1)]


def test_temp_conf_restores(spark):
    before = spark.conf.get("spark.sql.shuffle.partitions")
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "2"}):
        assert spark.conf.get("spark.sql.shuffle.partitions") == "2"
    assert spark.conf.get("spark.sql.shuffle.partitions") == before
