"""ParentPPL baseline tests: parent-set recording, query correctness, and
the size/budget behaviour (Tables 2–3 DNF/OOE shape)."""
import pytest

from repro.baselines.parent_ppl import build_parent_ppl
from repro.baselines.ppl import BudgetExceeded, build_ppl
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

GRAPHS = {
    "path": path_graph(8),
    "cycle": cycle_graph(9),
    "star": star_graph(9),
    "grid": grid_graph(4, 4),
    "fig3": figure3_graph(),
    "hub50": hub_graph(50, 4, seed=13),
    "hub70": hub_graph(70, 5, hub_boost=0.3, seed=14),
    "er30": er_graph(30, 0.1, seed=15),
}


#: families where the 2-hop path cover holds so the query is exact (the
#: same paper gap as PPL applies — see repro.baselines.ppl docstring)
EXACT = ["path", "cycle", "star", "fig3"]


@pytest.mark.parametrize("name", EXACT)
def test_parent_ppl_spg_exact_where_cover_holds(name):
    pdf = GRAPHS[name]
    idx = build_parent_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 25, seed=17):
        assert idx.query_spg(u, v) == spg_reference(g, u, v), (name, u, v)


@pytest.mark.parametrize("name", list(GRAPHS))
def test_parent_ppl_spg_always_sound(name):
    pdf = GRAPHS[name]
    idx = build_parent_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 25, seed=17):
        assert idx.query_spg(u, v) <= spg_reference(g, u, v), (name, u, v)


def test_parent_ppl_gap_matches_ppl_gap():
    """Parents do not repair the paper's cover gap: the shadowed vertices
    carry no label entry at all, so there are no parents to walk."""
    from repro.graphs.generators import grid_graph

    idx = build_parent_ppl(grid_graph(4, 4))
    g = build_csr(grid_graph(4, 4))
    assert spg_reference(g, 14, 8) - idx.query_spg(14, 8) == {(15, 16), (12, 16)}


@pytest.mark.parametrize("name", ["path", "hub50"])
def test_parent_ppl_against_duckdb_oracle(spark, name):
    pdf = GRAPHS[name]
    idx = build_parent_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 4, seed=18):
        assert_spg_oracle(spark, pdf, idx.query_spg_complete(u, v), u, v)


def test_parent_ppl_figure3_example():
    idx = build_parent_ppl(figure3_graph())
    assert idx.query_spg(3, 7) == {(1, 3), (1, 2), (3, 4), (2, 4), (2, 5), (5, 7)}


def test_parent_sets_point_one_level_up():
    idx = build_parent_ppl(path_graph(5))
    g = build_csr(path_graph(5))
    for (vid, rank), ws in idx.parents.items():
        r = idx.vertex_of_rank[rank]
        d = idx.dist(vid, r)
        for w in ws:
            assert idx.dist(w, r) == d - 1, (vid, r, w)


def test_parent_ppl_larger_than_ppl():
    """Paper Table 3: ParentPPL labels ≈ 2× PPL (parents cost extra)."""
    pdf = hub_graph(80, 5, hub_boost=0.2, seed=19)
    p = build_ppl(pdf)
    pp = build_parent_ppl(pdf)
    assert pp.n_entries == p.n_entries  # same label entries...
    assert pp.size_bytes() > p.size_bytes()  # ...plus parent storage


def test_parent_ppl_budgets():
    pdf = hub_graph(200, 6, seed=20)
    with pytest.raises(BudgetExceeded) as e:
        build_parent_ppl(pdf, time_budget_s=0.0)
    assert e.value.kind == "DNF"
    with pytest.raises(BudgetExceeded) as e:
        build_parent_ppl(pdf, mem_budget_bytes=100)
    assert e.value.kind == "OOE"


def test_parent_ppl_trivial_cases():
    idx = build_parent_ppl(path_graph(4))
    assert idx.query_spg(2, 2) == set()
    assert idx.query_spg(3, 4) == {(3, 4)}
