"""Algorithm 4 — guided searching, distributed engine.

The online query path prescribed for this reproduction: a sketch-guided
bidirectional BFS over the sparsified graph G⁻ plus reverse/recover walks,
where every super-step is a DataFrame broadcast join against the cached
edge tables (``repro.graphs.bfs``) and the O(frontier) state lives on the
driver (see the engine module note). Logic mirrors
``core.local_engine`` stage for stage — tests assert the two engines and
the DuckDB oracle agree.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession

from ..graphs.bfs import neighbor_ids, walk_down
from ..spg_oracle import SPG_COLS
from .local_engine import QueryStats
from .scheme import Edge, LabellingScheme
from .sketch import Sketch, build_sketch


@dataclass
class QbSIndex:
    """Everything the online phase needs (built by ``core.qbs.build_index``):
    the full and sparsified symmetric edge DataFrames (cached) and the
    labelling scheme (driver copy — O(|R|·|V|), held in RAM as in the
    paper) plus a {v: {r: δ}} map for recover-search filters."""

    spark: SparkSession
    edges: DataFrame  # full symmetric, cached
    sparsified: DataFrame  # G⁻ = G[V∖R], cached
    scheme: LabellingScheme
    n_vertices: int
    labmap: dict[int, dict[int, int]] = field(default_factory=dict)
    last_stats: QueryStats = field(default_factory=QueryStats)
    #: optional CSR copy for the O(deg) adjacency fast-path (d=1 queries);
    #: None falls back to a Spark lookup
    csr: object = None

    def __post_init__(self) -> None:
        if not self.labmap:
            self.labmap = {v: dict(ent) for v, ent in self.scheme.labels.items()}


def _empty(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame([], "a long, b long").select(*SPG_COLS)


def _edges_df(spark: SparkSession, edges: set[Edge]) -> DataFrame:
    if not edges:
        return _empty(spark)
    return spark.createDataFrame(sorted(edges), "a long, b long")


def guided_spg(idx: QbSIndex, u: int, v: int) -> DataFrame:
    """Answer SPG(u,v) distributedly; canonical (a,b) DataFrame."""
    spark = idx.spark
    idx.last_stats = st = QueryStats()
    if u == v:
        st.distance = 0
        return _empty(spark)
    R = idx.scheme.landmark_set
    if u in R or v in R:  # no label / absent from G⁻ — fall back (DESIGN §7)
        from ..baselines.bibfs import bibfs_spg

        st.fallback = "bibfs"
        return bibfs_spg(spark, idx.edges, u, v)
    if idx.csr is not None:
        g = idx.csr
        adjacent = g.index_of(v) in g.neighbors(g.index_of(u))
    else:
        adjacent = v in neighbor_ids(spark, idx.edges, [u])
    if adjacent:
        st.distance = 1
        return _edges_df(spark, {(min(u, v), max(u, v))})

    sk = build_sketch(idx.scheme, u, v)
    d_top = sk.d_top if sk.feasible else None

    du: dict[int, int] = {u: 0}
    dv: dict[int, int] = {v: 0}
    fu, fv = [u], [v]
    lu = lv = 0
    met = False
    d_meet: int | None = None
    while True:
        if d_top is not None and lu + lv >= d_top:
            break
        if not fu and not fv:
            break
        # pick_search (Alg 4 line 7): prefer the side whose Eq-4 bound is
        # unmet, then the smaller explored side
        if not fv:
            side = "u"
        elif not fu:
            side = "v"
        else:
            su, sv = sk.d_star_u > lu, sk.d_star_v > lv
            if su != sv:
                side = "u" if su else "v"
            else:
                side = "u" if len(du) <= len(dv) else "v"
        frontier, depths, other, lvl = (
            (fu, du, dv, lu) if side == "u" else (fv, dv, du, lv)
        )
        nbrs = neighbor_ids(spark, idx.sparsified, frontier)
        st.edges_scanned += len(nbrs)
        st.levels += 1
        nxt = []
        for y in nbrs:
            if y not in depths:
                depths[y] = lvl + 1
                nxt.append(y)
        if side == "u":
            fu, lu = nxt, lu + 1
        else:
            fv, lv = nxt, lv + 1
        meets = [y for y in nxt if y in other]
        if meets:
            met = True
            d_meet = min(depths[y] + other[y] for y in meets)
            break

    out: set[Edge] = set()
    if met:
        assert d_meet is not None
        st.used_reverse = True
        X = {x for x in du if x in dv and du[x] + dv[x] == d_meet}
        ctr: list[int] = []
        out |= walk_down(spark, idx.edges, X, du.get, counter=ctr)
        out |= walk_down(spark, idx.edges, X, dv.get, counter=ctr)
        st.edges_scanned += sum(ctr)
    if d_top is not None and (not met or d_meet == d_top):
        st.used_recover = True
        out |= _recover(idx, sk, du, dv, lu, lv)
    st.distance = (
        min(d_meet, d_top)
        if (met and d_top is not None)
        else (d_meet if met else d_top)
    )
    return _edges_df(spark, out)


def _recover(
    idx: QbSIndex, sk: Sketch, du: dict[int, int], dv: dict[int, int], lu: int, lv: int
) -> set[Edge]:
    """Recover search: Z detection + label-walks + back-walks + Δ splicing.
    Label-walks descend δ-to-r levels (landmark itself at level 0), so each
    step is the same walk_down super-step joined on the full edge table."""
    spark = idx.spark
    out: set[Edge] = set()
    for me in sk.meta_edges:
        out.update(idx.scheme.delta.get(me, []))
    lm_set = idx.scheme.landmark_set
    for depths, d_t, side in ((du, lu, sk.side_u), (dv, lv, sk.side_v)):
        for r, sigma in side.items():

            def level_of(y: int, r=r):  # δ_yr with the landmark at level 0
                if y == r:
                    return 0
                if y in lm_set:
                    return None
                return idx.labmap.get(y, {}).get(r)

            d_m = min(sigma - 1, d_t)
            Z = [
                x
                for x, k in depths.items()
                if k == d_m and level_of(x) is not None and level_of(x) + k == sigma
            ]
            if not Z:
                continue
            ctr: list[int] = []
            out |= walk_down(spark, idx.edges, Z, level_of, counter=ctr)
            out |= walk_down(
                spark, idx.edges, [x for x in Z if depths[x] > 0], depths.get, counter=ctr
            )
            idx.last_stats.edges_scanned += sum(ctr)
    return out
