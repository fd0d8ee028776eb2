"""Bench harness unit tests (config, sampling, output writers)."""
import os

import pytest

from repro.bench.harness import (
    BenchConfig,
    RESULTS_DIR,
    fmt_mb,
    fmt_ms,
    markdown_table,
    sample_query_pairs,
    timed,
    write_csv,
)
from repro.graphs.generators import hub_graph
from repro.localgraph import build_csr


def test_bench_config_defaults():
    cfg = BenchConfig()
    assert cfg.n_landmarks == 20
    assert len(cfg.datasets) == 12


def test_timed_measures():
    with timed() as t:
        sum(range(1000))
    assert 0 <= t() < 1.0


def test_sample_query_pairs_excludes():
    g = build_csr(hub_graph(50, 4, seed=1))
    excl = {int(g.vertices[0]), int(g.vertices[1])}
    pairs = sample_query_pairs(g, 30, seed=2, exclude=excl)
    assert len(pairs) == 30
    assert all(u not in excl and v not in excl and u != v for u, v in pairs)


def test_sample_query_pairs_deterministic():
    g = build_csr(hub_graph(40, 4, seed=2))
    assert sample_query_pairs(g, 10, seed=5) == sample_query_pairs(g, 10, seed=5)


def test_write_csv_and_markdown(tmp_path, monkeypatch):
    import repro.bench.harness as h

    monkeypatch.setattr(h, "RESULTS_DIR", tmp_path)
    rows = [{"a": 1, "b": "x"}, {"a": 2, "b": "y"}]
    p = h.write_csv("t", rows)
    assert p.exists() and p.read_text().startswith("a,b")
    md = markdown_table(rows)
    assert md.splitlines()[0] == "| a | b |"
    assert "| 2 | y |" in md
    assert markdown_table([]) == "(no rows)"


def test_fmt_helpers():
    assert fmt_ms(0.001234) == "1.234"
    assert fmt_mb(2_500_000) == "2.500"
