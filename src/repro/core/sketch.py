"""Algorithm 3 — fast sketching.

Given the labelling scheme, a query (u,v) gets a *sketch*: the upper bound
``d⊤ = min_{r,r'} δ_ur + d_M(r,r') + δ_r'v`` (Def 4.5, Corollary 4.6:
d⊤ ≥ d_G(u,v)) together with the side edges (u,r)/(v,r') of minimizing
pairs, the meta-edges on the shortest meta-paths between them, and the
per-side search bounds ``d*_t = max σ_S(r,t) − 1`` (Eq 4).

``{r,r'}`` ranges over unordered pairs *including singletons* (r = r',
d_M = 0) — otherwise shortest paths through exactly one landmark would be
missed. Pure driver-side, O(|R|²) with the Section-5.2 precomputation.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from .scheme import Edge, LabellingScheme

#: "no landmark path" sentinel (paper: d⊤ = +∞).
UNREACHABLE = 1 << 60


@dataclass
class Sketch:
    """Sketch S_uv = (V_S, E_S, σ_S) in query-oriented form."""

    d_top: int = UNREACHABLE
    #: σ_S(u,r) per sketch edge (u,r) — i.e. δ_ur of minimizing pairs
    side_u: dict[int, int] = field(default_factory=dict)
    #: σ_S(v,r') per sketch edge (v,r')
    side_v: dict[int, int] = field(default_factory=dict)
    #: minimizing (r from u side, r' from v side) pairs
    pairs: list[tuple[int, int]] = field(default_factory=list)
    #: canonical meta-edges on shortest meta-paths of minimizing pairs
    meta_edges: set[Edge] = field(default_factory=set)

    @property
    def feasible(self) -> bool:
        return self.d_top < UNREACHABLE

    @property
    def d_star_u(self) -> int:
        """Eq 4 forward-search bound (0 when no sketch edge)."""
        return max(self.side_u.values(), default=1) - 1

    @property
    def d_star_v(self) -> int:
        return max(self.side_v.values(), default=1) - 1


def _meta_dist(scheme: LabellingScheme, r: int, r2: int) -> int | None:
    if r == r2:
        return 0
    return scheme.meta_dist.get((r, r2))


def build_sketch(scheme: LabellingScheme, u: int, v: int) -> Sketch:
    """Compute the sketch for SPG(u,v) from the labelling scheme."""
    sk = Sketch()
    lu = scheme.label_of(u)
    lv = scheme.label_of(v)
    best = UNREACHABLE
    pairs: list[tuple[int, int, int, int]] = []  # (r, δ_ur, r2, δ_vr2)
    for r, du in lu:
        for r2, dv in lv:
            dm = _meta_dist(scheme, r, r2)
            if dm is None:
                continue
            tot = du + dm + dv
            if tot < best:
                best = tot
                pairs = [(r, du, r2, dv)]
            elif tot == best:
                pairs.append((r, du, r2, dv))
    if best == UNREACHABLE:
        return sk
    sk.d_top = best
    for r, du, r2, dv in pairs:
        sk.side_u[r] = du
        sk.side_v[r2] = dv
        sk.pairs.append((r, r2))
        if r != r2:
            key = (min(r, r2), max(r, r2))
            sk.meta_edges.update(scheme.meta_spg.get(key, []))
    return sk
