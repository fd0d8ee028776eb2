"""Benchmark-local fixtures: reuse the session-scoped ``spark`` fixture
from the repo-root conftest and quiet the shuffle for tiny iterative joins."""
import pytest

from repro.graphs.bfs import temp_conf


@pytest.fixture(scope="package", autouse=True)
def _bench_shuffle(spark):
    with temp_conf(spark, **{"spark.sql.shuffle.partitions": "8"}):
        yield
