"""Self-tests of the SPG oracles: the DuckDB recursive-CTE SQL and the
python reference must agree with each other and with hand-computed answers.
"""
import duckdb
import pytest

from repro.graphs.generators import (
    cycle_graph,
    er_graph,
    figure3_graph,
    grid_graph,
    hub_graph,
    path_graph,
)
from repro.localgraph import build_csr, sample_pairs
from repro.spg_oracle import (
    distance_reference,
    distance_sql,
    edges_pdf,
    spg_edges_pdf,
    spg_reference,
    spg_sql,
)


def _duck_spg(pdf, u, v):
    con = duckdb.connect()
    try:
        con.register("edges", pdf)
        out = con.execute(spg_sql(u, v)).fetchdf()
    finally:
        con.close()
    return set(zip(out["a"].astype(int), out["b"].astype(int)))


def _duck_dist(pdf, u, v):
    con = duckdb.connect()
    try:
        con.register("edges", pdf)
        out = con.execute(distance_sql(u, v)).fetchdf()
    finally:
        con.close()
    return int(out["dist"].iloc[0]) if len(out) else -1


def test_path_spg_is_whole_path():
    pdf = path_graph(5)
    expect = {(1, 2), (2, 3), (3, 4), (4, 5)}
    assert _duck_spg(pdf, 1, 5) == expect
    assert spg_reference(build_csr(pdf), 1, 5) == expect


def test_even_cycle_spg_both_arcs():
    pdf = cycle_graph(6)  # antipodal pair 1-4: both length-3 arcs
    expect = {(1, 2), (2, 3), (3, 4), (4, 5), (5, 6), (1, 6)}
    assert _duck_spg(pdf, 1, 4) == expect
    assert spg_reference(build_csr(pdf), 1, 4) == expect


def test_odd_cycle_spg_single_arc():
    pdf = cycle_graph(5)
    assert _duck_spg(pdf, 1, 3) == {(1, 2), (2, 3)}


def test_grid_spg_is_rectangle():
    # 2x2 sub-rectangle of a 3x3 grid: corners 1 and 5 (ids: r*3+c+1)
    pdf = grid_graph(3, 3)
    expect = {(1, 2), (2, 5), (1, 4), (4, 5)}
    assert _duck_spg(pdf, 1, 5) == expect
    assert spg_reference(build_csr(pdf), 1, 5) == expect


def test_figure3_spg_answer_from_paper():
    """Example 3.1: answer of SPG(3,7) is the green subgraph — both length-4
    paths 3-1-2-5-7 and 3-4-2-5-7."""
    pdf = figure3_graph()
    expect = {(1, 3), (1, 2), (3, 4), (2, 4), (2, 5), (5, 7)}
    assert _duck_spg(pdf, 3, 7) == expect
    assert spg_reference(build_csr(pdf), 3, 7) == expect


def test_adjacent_pair_spg_single_edge():
    pdf = path_graph(3)
    assert _duck_spg(pdf, 1, 2) == {(1, 2)}


def test_same_vertex_empty():
    pdf = path_graph(3)
    assert _duck_spg(pdf, 2, 2) == set()
    assert spg_reference(build_csr(pdf), 2, 2) == set()


def test_disconnected_empty():
    pdf = edges_pdf([(1, 2), (3, 4)])
    assert _duck_spg(pdf, 1, 3) == set()
    assert _duck_dist(pdf, 1, 3) == -1
    assert distance_reference(build_csr(pdf), 1, 3) == -1


def test_distance_sql_matches_reference():
    pdf = hub_graph(60, 4, seed=5)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 10, seed=1):
        assert _duck_dist(pdf, u, v) == distance_reference(g, u, v)


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_reference_equals_duckdb_on_random_graphs(seed):
    pdf = er_graph(25, 0.12, seed=seed)
    if len(pdf) == 0:
        pytest.skip("empty random graph")
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 6, seed=seed):
        assert _duck_spg(pdf, u, v) == spg_reference(g, u, v), (u, v)


def test_edges_pdf_canonicalizes():
    pdf = edges_pdf([(2, 1), (1, 2), (3, 3), (4, 2)])
    assert list(map(tuple, pdf.values)) == [(1, 2), (2, 4)]


def test_spg_edges_pdf_columns():
    pdf = spg_edges_pdf({(5, 3), (1, 2)})
    assert list(pdf.columns) == ["a", "b"]
    assert list(map(tuple, pdf.values)) == [(1, 2), (3, 5)]
