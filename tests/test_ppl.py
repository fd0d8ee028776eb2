"""PPL baseline tests: 2-hop path cover construction + recursive SPG query
(Section 3.2, Algorithm 1), checked against the python reference and the
DuckDB oracle, plus budget (DNF/OOE) behaviour."""
import pytest

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
from repro.spg_oracle import distance_reference, spg_reference

from tests.helpers import assert_spg_oracle

GRAPHS = {
    "path": path_graph(8),
    "cycle8": cycle_graph(8),
    "cycle9": cycle_graph(9),
    "star": star_graph(9),
    "grid": grid_graph(4, 4),
    "fig3": figure3_graph(),
    "hub50": hub_graph(50, 4, seed=3),
    "hub70": hub_graph(70, 5, hub_boost=0.3, seed=4),
    "er30": er_graph(30, 0.1, seed=5),
}


@pytest.mark.parametrize("name", list(GRAPHS))
def test_ppl_distances_exact(name):
    pdf = GRAPHS[name]
    idx = build_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 25, seed=7):
        ref = distance_reference(g, u, v)
        got = idx.dist(u, v)
        assert (got == ref) or (ref == -1 and got == float("inf")), (name, u, v)


#: families where the paper's 2-hop path cover claim actually holds, so the
#: recursive query is exact (audited exhaustively below)
EXACT = ["path", "cycle8", "cycle9", "star", "fig3"]


@pytest.mark.parametrize("name", EXACT)
def test_ppl_spg_exact_where_cover_holds(name):
    pdf = GRAPHS[name]
    idx = build_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 25, seed=8):
        assert idx.query_spg(u, v) == spg_reference(g, u, v), (name, u, v)


@pytest.mark.parametrize("name", list(GRAPHS))
def test_ppl_spg_always_sound(name):
    """The paper's recursion never invents edges, on any graph."""
    pdf = GRAPHS[name]
    idx = build_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 25, seed=8):
        assert idx.query_spg(u, v) <= spg_reference(g, u, v), (name, u, v)


@pytest.mark.parametrize("name", list(GRAPHS))
def test_ppl_spg_complete_variant_exact_everywhere(name):
    """The label-only completeness fallback is exact on every family."""
    pdf = GRAPHS[name]
    idx = build_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 15, seed=10):
        assert idx.query_spg_complete(u, v) == spg_reference(g, u, v), (name, u, v)


def test_ppl_paper_gap_documented():
    """Reproduction finding (DESIGN.md / ppl.py docstring): the paper's
    2-hop path cover claim fails on tie-dense graphs — on the 4×4 grid the
    pair (14,8) misses exactly the equality-shadowed path 14-15-16-12-8."""
    idx = build_ppl(grid_graph(4, 4))
    g = build_csr(grid_graph(4, 4))
    got = idx.query_spg(14, 8)
    ref = spg_reference(g, 14, 8)
    assert ref - got == {(15, 16), (12, 16)}
    assert got < ref  # strict, sound subset
    # the exhaustive audit: some pairs affected, none unsound
    miss = sum(
        1
        for u in range(1, 17)
        for v in range(u + 1, 17)
        if spg_reference(g, u, v) - idx.query_spg(u, v)
    )
    assert 0 < miss <= 20


@pytest.mark.parametrize("name", ["path", "fig3", "hub50"])
def test_ppl_spg_against_duckdb_oracle(spark, name):
    pdf = GRAPHS[name]
    idx = build_ppl(pdf)
    g = build_csr(pdf)
    for u, v in sample_pairs(g, 4, seed=9):
        assert_spg_oracle(spark, pdf, idx.query_spg_complete(u, v), u, v)


def test_ppl_figure3_example():
    """Example 3.4: answering SPG(3,7) through PPL recursion."""
    idx = build_ppl(figure3_graph())
    assert idx.query_spg(3, 7) == {(1, 3), (1, 2), (3, 4), (2, 4), (2, 5), (5, 7)}


def test_ppl_trivial_cases():
    idx = build_ppl(path_graph(4))
    assert idx.query_spg(2, 2) == set()
    assert idx.query_spg(1, 2) == {(1, 2)}


def test_ppl_disconnected():
    import pandas as pd

    idx = build_ppl(pd.DataFrame({"src": [1, 3], "dst": [2, 4]}))
    assert idx.query_spg(1, 3) == set()
    assert idx.dist(1, 3) == float("inf")


def test_ppl_labels_smaller_than_naive():
    """Pruning must beat the naive |V|² labelling on a hub graph."""
    pdf = hub_graph(80, 5, hub_boost=0.3, seed=6)
    idx = build_ppl(pdf)
    n = build_csr(pdf).n
    assert idx.n_entries < n * n / 2


def test_ppl_time_budget_dnf():
    pdf = hub_graph(300, 6, seed=7)
    with pytest.raises(BudgetExceeded) as e:
        build_ppl(pdf, time_budget_s=0.0)
    assert e.value.kind == "DNF"


def test_ppl_mem_budget_ooe():
    pdf = hub_graph(100, 5, seed=8)
    with pytest.raises(BudgetExceeded) as e:
        build_ppl(pdf, mem_budget_bytes=50)
    assert e.value.kind == "OOE"


def test_ppl_scan_counter_grows():
    idx = build_ppl(grid_graph(4, 4))
    idx.query_spg(1, 16)
    assert idx.last_scans > 0


def test_ppl_size_bytes_convention():
    idx = build_ppl(path_graph(5))
    assert idx.size_bytes() == idx.n_entries * 5
