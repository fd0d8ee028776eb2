"""Shared test utilities: oracle plumbing and fixture graphs.

Every test that checks an SPG or distance *query result* routes through
``repro.oracle.assert_equivalent`` with DuckDB recursive-CTE SQL from
``repro.spg_oracle`` (see DESIGN.md §6); the helpers here remove the
boilerplate of registering edge tables and canonicalizing result frames.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from repro import oracle
from repro.localgraph import CSRGraph, build_csr
from repro.spg_oracle import SPG_COLS, spg_sql

SPG_SCHEMA = T.StructType(
    [T.StructField("a", T.LongType(), False), T.StructField("b", T.LongType(), False)]
)


def spg_df(spark: SparkSession, edge_iter) -> DataFrame:
    """Canonical Spark DataFrame (a,b) from any iterable of SPG edges."""
    rows = sorted({(int(min(a, b)), int(max(a, b))) for a, b in edge_iter})
    return spark.createDataFrame(rows, SPG_SCHEMA) if rows else spark.createDataFrame([], SPG_SCHEMA)


def assert_spg_oracle(
    spark: SparkSession, edges_pdf: pd.DataFrame, result, u: int, v: int, *, cap: int = 64
) -> None:
    """Assert ``result`` (edge iterable or (a,b) DataFrame) equals the DuckDB
    ground-truth SPG for (u,v) over ``edges_pdf``."""
    df = result if isinstance(result, DataFrame) else spg_df(spark, result)
    oracle.assert_equivalent(df.select(*SPG_COLS), spg_sql(u, v, cap=cap), edges=edges_pdf)


def csr(edges_pdf: pd.DataFrame) -> CSRGraph:
    return build_csr(edges_pdf)
