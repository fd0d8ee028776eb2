"""Benchmark — Table 2 query-time columns, both panels.

Distributed panel: QbS guided search vs Bi-BFS as iterative DataFrame
joins (3 datasets × mean over pairs). Local panel: QbS-local vs PPL vs
ParentPPL vs Bi-BFS-local on the same pairs. Full table via
``python jobs/table2_perf.py`` (EXPERIMENTS.md).
"""
import pytest

from repro.baselines.bibfs import bibfs_local, bibfs_spg
from repro.baselines.ppl import BudgetExceeded, build_ppl
from repro.bench.harness import BenchConfig, sample_query_pairs
from repro.core.qbs import build_index
from repro.graphs.registry import DATASETS

CFG = BenchConfig()
DIST_SET = ["douban", "wikitalk", "twitter"]
LOCAL_SET = ["douban", "wikitalk", "orkut", "twitter", "friendster", "clueweb09"]


@pytest.fixture(scope="module")
def built(spark):
    out = {}
    for name in dict.fromkeys(DIST_SET + LOCAL_SET):
        pdf = DATASETS[name].edges(CFG.scale)
        out[name] = build_index(spark, pdf, n_landmarks=CFG.n_landmarks)
    yield out
    for q in out.values():
        q.unpersist()


def _pairs(qbs, n, seed=77):
    return sample_query_pairs(qbs.local.g, n, seed=seed, exclude=qbs.scheme.landmark_set)


@pytest.mark.parametrize("name", DIST_SET)
def test_query_qbs_distributed(benchmark, spark, built, name):
    qbs = built[name]
    pairs = _pairs(qbs, 3)

    def run():
        for u, v in pairs:
            qbs.query_df(u, v).collect()

    benchmark.pedantic(run, rounds=1, iterations=1)


@pytest.mark.parametrize("name", DIST_SET)
def test_query_bibfs_distributed(benchmark, spark, built, name):
    qbs = built[name]
    pairs = _pairs(qbs, 3)

    def run():
        for u, v in pairs:
            bibfs_spg(spark, qbs.index.edges, u, v).collect()

    benchmark.pedantic(run, rounds=1, iterations=1)


@pytest.mark.parametrize("name", LOCAL_SET)
def test_query_qbs_local(benchmark, built, name):
    qbs = built[name]
    pairs = _pairs(qbs, 50)
    benchmark.pedantic(
        lambda: [qbs.query_local(u, v) for u, v in pairs], rounds=1, iterations=1
    )


@pytest.mark.parametrize("name", LOCAL_SET)
def test_query_bibfs_local(benchmark, built, name):
    qbs = built[name]
    pairs = _pairs(qbs, 50)
    g = qbs.local.g
    benchmark.pedantic(
        lambda: [bibfs_local(g, u, v) for u, v in pairs], rounds=1, iterations=1
    )


@pytest.mark.parametrize("name", ["douban", "dblp"])
def test_query_ppl_local(benchmark, built, name):
    pdf = DATASETS[name].edges(CFG.scale)
    try:
        ppl = build_ppl(pdf, time_budget_s=CFG.ppl_time_budget_s)
    except BudgetExceeded:
        pytest.skip("PPL DNF at this scale")
    qbs = built.get(name) or None
    pairs = (
        _pairs(qbs, 50)
        if qbs
        else sample_query_pairs(ppl.g, 50, seed=77)
    )
    benchmark.pedantic(
        lambda: [ppl.query_spg(u, v) for u, v in pairs], rounds=1, iterations=1
    )
