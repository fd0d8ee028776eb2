"""The labelling scheme ``L = (M, L)`` (Definitions 4.1–4.2) and its size
accounting for Table 3.

The scheme is held both ways the paper uses it:

* ``labels`` / ``meta_*`` / ``delta`` — driver-side dicts powering the
  O(|R|²) per-query sketch (the paper keeps the scheme in RAM; it is
  O(|R|·|V|), orders of magnitude smaller than the graph),
* the labelling is *produced* distributedly (``core.labelling``) and the
  recover search re-joins labels as a DataFrame (``core.search``).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd

Edge = tuple[int, int]


@dataclass
class LabellingScheme:
    """Meta-graph + path labelling (+ precomputed landmark SPGs Δ)."""

    landmarks: list[int]
    #: v -> [(r, d_G(v,r))] for landmarks r with a landmark-free shortest path
    labels: dict[int, list[tuple[int, int]]]
    #: canonical (r, r', σ) meta-graph edges (Def 4.1)
    meta_edges: list[tuple[int, int, int]]
    #: all-pairs meta distances, both orientations + (r,r)=0 (Section 5.2)
    meta_dist: dict[tuple[int, int], int] = field(default_factory=dict)
    #: (r,r') -> canonical meta-edges on shortest r–r' meta-paths
    meta_spg: dict[tuple[int, int], list[Edge]] = field(default_factory=dict)
    #: canonical meta-edge -> ground SPG edges of its landmark pair (Δ)
    delta: dict[Edge, list[Edge]] = field(default_factory=dict)

    def label_of(self, v: int) -> list[tuple[int, int]]:
        return self.labels.get(v, [])

    @property
    def landmark_set(self) -> set[int]:
        return set(self.landmarks)

    def n_label_entries(self) -> int:
        return sum(len(e) for e in self.labels.values())

    def labels_pdf(self) -> pd.DataFrame:
        """Flat (v, r, dist) pandas frame (for DataFrame joins / tests)."""
        rows = [(v, r, d) for v, ent in self.labels.items() for r, d in ent]
        return pd.DataFrame(rows or None, columns=["v", "r", "dist"], dtype="int64")

    # ---- Table 3 size conventions (paper Section 6.1/6.2.2) ----

    def size_labels_bytes(self, n_vertices: int) -> int:
        """size(L): the paper stores each vertex's label in |R|*8 bits."""
        return (n_vertices - len(self.landmarks)) * len(self.landmarks)

    def size_delta_bytes(self) -> int:
        """size(Δ): 8 bytes per edge of the precomputed shortest-path graphs
        between all landmark pairs (union of Δ along each pair's meta-SPG,
        summed over pairs — 'shortest paths between |R|² pairs')."""
        total = 0
        for pair, medges in self.meta_spg.items():
            if pair[0] == pair[1]:
                continue
            edges: set[Edge] = set()
            for e in medges:
                edges.update(self.delta.get(e, []))
            total += len(edges)
        return total * 8

    def size_meta_bytes(self) -> int:
        """Meta-graph storage: (r, r', σ) per edge, 8 bytes each id/weight."""
        return len(self.meta_edges) * 24
