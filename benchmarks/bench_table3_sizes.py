"""Benchmark — Table 3 (labelling sizes): times the offline phase +
size accounting per dataset and sanity-checks the size conventions.
Full table via ``python jobs/table3_sizes.py`` (EXPERIMENTS.md)."""
import pytest

from repro.bench.harness import BenchConfig
from repro.bench.table3 import table3_row
from repro.graphs.registry import DATASETS

CFG = BenchConfig()
SET = ["douban", "wikitalk", "twitter", "friendster"]


@pytest.mark.parametrize("name", SET)
def test_table3_row(benchmark, spark, name):
    row = benchmark.pedantic(
        lambda: table3_row(spark, name, CFG), rounds=1, iterations=1
    )
    assert float(row["qbs_L_MB"]) > 0
    assert row["dataset"] == name
