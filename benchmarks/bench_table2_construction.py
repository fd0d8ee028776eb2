"""Benchmark — Table 2 construction-time columns.

Times QbS-P (parallel multi-source DataFrame BFS labelling) on a spread of
datasets, QbS (sequential) and the budgeted PPL/ParentPPL baselines on the
two smallest — the full 12-dataset table comes from
``python jobs/table2_perf.py`` (EXPERIMENTS.md).
"""
import pytest

from repro.baselines.parent_ppl import build_parent_ppl
from repro.baselines.ppl import BudgetExceeded, build_ppl
from repro.bench.harness import BenchConfig
from repro.core.labelling import build_scheme
from repro.core.landmarks import select_landmarks
from repro.graphs.generators import to_spark_edges
from repro.graphs.registry import DATASETS

CFG = BenchConfig()
QBS_P_SET = ["douban", "dblp", "youtube", "wikitalk", "orkut", "clueweb09"]


@pytest.mark.parametrize("name", QBS_P_SET)
def test_construction_qbs_parallel(benchmark, spark, name):
    pdf = DATASETS[name].edges(CFG.scale)
    edges = to_spark_edges(spark, pdf)
    landmarks = select_landmarks(edges, CFG.n_landmarks)
    scheme = benchmark.pedantic(
        lambda: build_scheme(spark, edges, landmarks, mode="parallel", enrich=False),
        rounds=1,
        iterations=1,
    )
    edges.unpersist()
    assert scheme.n_label_entries() > 0


@pytest.mark.parametrize("name", ["douban", "dblp"])
def test_construction_qbs_sequential(benchmark, spark, name):
    pdf = DATASETS[name].edges(CFG.scale)
    edges = to_spark_edges(spark, pdf)
    landmarks = select_landmarks(edges, CFG.n_landmarks)
    scheme = benchmark.pedantic(
        lambda: build_scheme(spark, edges, landmarks, mode="sequential", enrich=False),
        rounds=1,
        iterations=1,
    )
    edges.unpersist()
    assert scheme.n_label_entries() > 0


@pytest.mark.parametrize("name", ["douban", "dblp"])
def test_construction_ppl(benchmark, name):
    pdf = DATASETS[name].edges(CFG.scale)

    def run():
        try:
            return build_ppl(
                pdf,
                time_budget_s=CFG.ppl_time_budget_s,
                mem_budget_bytes=CFG.ppl_mem_budget_bytes,
            )
        except BudgetExceeded as e:
            return e.kind

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out is not None


@pytest.mark.parametrize("name", ["douban"])
def test_construction_parent_ppl(benchmark, name):
    pdf = DATASETS[name].edges(CFG.scale)

    def run():
        try:
            return build_parent_ppl(
                pdf,
                time_budget_s=CFG.ppl_time_budget_s,
                mem_budget_bytes=CFG.ppl_mem_budget_bytes,
            )
        except BudgetExceeded as e:
            return e.kind

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out is not None
