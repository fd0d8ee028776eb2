"""Smoke tests for the table harnesses the jobs wrap (tiny scale, two
datasets): rows must carry both measured and paper columns so
EXPERIMENTS.md can diff them."""
import pytest

from repro.bench.harness import BenchConfig
from repro.bench.sweep import run_sweep
from repro.bench.table1 import run_table1
from repro.bench.table2 import run_table2
from repro.bench.table3 import run_table3
from repro.graphs.bfs import temp_conf


@pytest.fixture(scope="module", autouse=True)
def _small_shuffle(spark):
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "4"}):
        yield


def _tiny_cfg() -> BenchConfig:
    cfg = BenchConfig()
    cfg.scale = 0.01
    cfg.n_landmarks = 5
    cfg.n_queries_dist = 2
    cfg.n_queries_local = 5
    cfg.ppl_time_budget_s = 30
    cfg.datasets = ["douban", "wikitalk"]
    return cfg


def test_table1_rows(spark):
    rows = run_table1(spark, _tiny_cfg())
    assert [r["dataset"] for r in rows] == ["douban", "wikitalk"]
    for r in rows:
        assert r["V"] > 0 and r["E_un"] > 0 and r["avg_dist"] > 0
        assert "paper_V" in r and "paper_avg_deg" in r


def test_table2_rows(spark):
    rows = run_table2(spark, _tiny_cfg())
    for r in rows:
        assert isinstance(r["constr_qbs_p_s"], float)
        assert isinstance(r["constr_qbs_s"], float)
        assert r["q_qbs_dist_ms"] > 0 and r["q_bibfs_dist_ms"] > 0
        assert r["q_qbs_local_ms"] > 0 and r["q_bibfs_local_ms"] > 0
        assert r["work_qbs_edges"] >= 0 and r["work_bibfs_edges"] > 0
        assert "paper_q_qbs_ms" in r


def test_table3_rows(spark):
    rows = run_table3(spark, _tiny_cfg())
    for r in rows:
        assert float(r["qbs_L_MB"]) >= 0
        assert r["label_entries"] > 0
        assert "paper_L" in r and "paper_ppl" in r


def test_sweep_rows(spark):
    cfg = _tiny_cfg()
    rows = run_sweep(spark, cfg, datasets=["douban"], landmark_counts=[3, 6])
    assert [r["landmarks"] for r in rows] == [3, 6]
    assert all(r["constr_s"] > 0 for r in rows)
