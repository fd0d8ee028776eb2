"""QbS facade: build the offline index, answer queries on either substrate.

``build_index`` runs the offline phase (landmark selection + Algorithm 2 +
Section-5.2 precomputation) over a canonical pandas edge table and returns a
:class:`repro.core.search.QbSIndex` ready for distributed queries plus a
:class:`repro.core.local_engine.LocalQbSEngine` for the local panel.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from ..graphs.bfs import remove_vertices
from ..graphs.generators import to_spark_edges
from .labelling import build_scheme
from .landmarks import select_landmarks
from .local_engine import LocalQbSEngine
from .scheme import LabellingScheme
from .search import QbSIndex, guided_spg


@dataclass
class QbS:
    """A built QbS instance over one graph."""

    index: QbSIndex
    local: LocalQbSEngine

    @property
    def scheme(self) -> LabellingScheme:
        return self.index.scheme

    def query_df(self, u: int, v: int):
        """Distributed SPG query -> canonical (a,b) DataFrame."""
        return guided_spg(self.index, u, v)

    def query_local(self, u: int, v: int) -> set[tuple[int, int]]:
        """Local SPG query -> canonical edge set."""
        return self.local.query(u, v)

    def unpersist(self) -> None:
        for df in (self.index.edges, self.index.sparsified):
            df.unpersist()


def build_index(
    spark: SparkSession,
    edges_pdf: pd.DataFrame,
    *,
    n_landmarks: int = 20,
    mode: str = "parallel",
    partitions: int = 8,
) -> QbS:
    """Offline phase. ``mode`` selects QbS-P ('parallel', one multi-source
    BFS) or QbS ('sequential', landmark-at-a-time) labelling construction —
    both produce the identical scheme (Lemma 5.2)."""
    edges = to_spark_edges(spark, edges_pdf, partitions=partitions)
    landmarks = select_landmarks(edges, n_landmarks)
    scheme = build_scheme(spark, edges, landmarks, mode=mode)
    sparsified = remove_vertices(edges, landmarks).cache()
    sparsified.count()
    n_vertices = int(
        edges.selectExpr("src as v").union(edges.selectExpr("dst as v")).distinct().count()
    )
    local = LocalQbSEngine.build(edges_pdf, scheme)
    idx = QbSIndex(
        spark=spark,
        edges=edges,
        sparsified=sparsified,
        scheme=scheme,
        n_vertices=n_vertices,
        csr=local.g,
    )
    return QbS(index=idx, local=local)
