"""Job: answer one shortest-path-graph query with QbS (distributed guided
search) and print the edge set.

    python jobs/query_spg.py --dataset douban --u 5 --v 423 [--scale S]
"""
from __future__ import annotations

import argparse

from _session import get_spark
from repro.core.qbs import build_index
from repro.graphs.registry import dataset_edges


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", required=True)
    ap.add_argument("--u", type=int, required=True)
    ap.add_argument("--v", type=int, required=True)
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--landmarks", type=int, default=20)
    args = ap.parse_args()
    spark = get_spark("query-spg")
    pdf = dataset_edges(args.dataset, scale=args.scale)
    qbs = build_index(spark, pdf, n_landmarks=args.landmarks)
    rows = sorted((int(r["a"]), int(r["b"])) for r in qbs.query_df(args.u, args.v).collect())
    st = qbs.index.last_stats
    print(f"SPG({args.u},{args.v}): {len(rows)} edges, d={st.distance}")
    for a, b in rows:
        print(f"{a}\t{b}")
    spark.stop()


if __name__ == "__main__":
    main()
