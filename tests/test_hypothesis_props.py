"""Property-based tests (hypothesis): on arbitrary random graphs, the
local QbS engine and Bi-BFS must equal the exact reference, and PPL must
stay sound. Spark-free (the distributed engines are equality-tested against
the local one in test_search_distributed.py)."""
import numpy as np
from hypothesis import given, settings, strategies as st

from repro.baselines.bibfs import bibfs_local
from repro.baselines.ppl import build_ppl
from repro.core.landmarks import select_landmarks_local
from repro.core.local_engine import LocalQbSEngine
from repro.core.reference import reference_delta, reference_scheme
from repro.graphs.generators import er_graph, hub_graph
from repro.localgraph import build_csr
from repro.spg_oracle import spg_reference


def _graph(kind: str, n: int, seed: int):
    if kind == "er":
        pdf = er_graph(n, 0.15, seed=seed)
        if len(pdf) == 0:
            pdf = hub_graph(n, 2, seed=seed)
        return pdf
    return hub_graph(n, 3, hub_boost=0.2, seed=seed)


graph_strategy = st.tuples(
    st.sampled_from(["er", "hub"]),
    st.integers(min_value=8, max_value=40),
    st.integers(min_value=0, max_value=10_000),
    st.integers(min_value=1, max_value=6),
    st.integers(min_value=0, max_value=10_000),
)


@settings(max_examples=40, deadline=None)
@given(graph_strategy)
def test_qbs_local_equals_reference(params):
    kind, n, seed, k, pair_seed = params
    pdf = _graph(kind, n, seed)
    g = build_csr(pdf)
    deg = {int(g.vertices[i]): int(d) for i, d in enumerate(g.degrees())}
    landmarks = select_landmarks_local(deg, min(k, g.n))
    scheme = reference_scheme(pdf, landmarks)
    scheme.delta = reference_delta(pdf, landmarks, scheme.meta_edges)
    eng = LocalQbSEngine.build(pdf, scheme)
    rng = np.random.default_rng(pair_seed)
    for _ in range(5):
        u, v = (int(g.vertices[i]) for i in rng.integers(0, g.n, 2))
        assert eng.query(u, v) == spg_reference(g, u, v), (u, v, landmarks)


@settings(max_examples=30, deadline=None)
@given(graph_strategy)
def test_bibfs_local_equals_reference(params):
    kind, n, seed, _, pair_seed = params
    pdf = _graph(kind, n, seed)
    g = build_csr(pdf)
    rng = np.random.default_rng(pair_seed)
    for _ in range(5):
        u, v = (int(g.vertices[i]) for i in rng.integers(0, g.n, 2))
        edges, _ = bibfs_local(g, u, v)
        assert edges == spg_reference(g, u, v), (u, v)


@settings(max_examples=20, deadline=None)
@given(graph_strategy)
def test_ppl_always_sound(params):
    kind, n, seed, _, pair_seed = params
    pdf = _graph(kind, n, seed)
    g = build_csr(pdf)
    idx = build_ppl(pdf)
    rng = np.random.default_rng(pair_seed)
    for _ in range(5):
        u, v = (int(g.vertices[i]) for i in rng.integers(0, g.n, 2))
        assert idx.query_spg(u, v) <= spg_reference(g, u, v), (u, v)
