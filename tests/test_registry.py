"""Tests for the 12-dataset registry (Table 1 analogues)."""
import pytest

from repro.graphs.registry import DATASETS, PAPER_TABLE1, DatasetSpec, dataset_edges
from repro.localgraph import INF, bfs_depths, build_csr


def test_registry_has_all_twelve_paper_datasets():
    assert list(DATASETS) == list(PAPER_TABLE1)
    assert len(DATASETS) == 12


@pytest.mark.parametrize("name", list(DATASETS))
def test_dataset_small_scale_generates_connected_graph(name):
    pdf = dataset_edges(name, scale=0.02)
    g = build_csr(pdf)
    assert g.n >= 20
    assert (bfs_depths(g, int(g.vertices[0])) != INF).all()


@pytest.mark.parametrize("name", list(DATASETS))
def test_dataset_deterministic(name):
    a = dataset_edges(name, scale=0.02)
    b = dataset_edges(name, scale=0.02)
    assert a.equals(b)


def test_dataset_scale_changes_size():
    small = dataset_edges("douban", scale=0.02)
    big = dataset_edges("douban", scale=0.05)
    assert len(big) > len(small)


def test_unknown_dataset_raises():
    with pytest.raises(KeyError):
        dataset_edges("nope")


def test_hubby_datasets_have_hubbier_degrees():
    flat = build_csr(dataset_edges("friendster", scale=0.03)).degrees()
    hubby = build_csr(dataset_edges("wikitalk", scale=0.03)).degrees()
    assert hubby.max() / hubby.mean() > flat.max() / flat.mean()


def test_spec_min_vertices_floor():
    spec = DatasetSpec("tiny", 100, 4.0, 0.0, 1)
    assert build_csr(spec.edges(scale=0.0001)).n >= 20
