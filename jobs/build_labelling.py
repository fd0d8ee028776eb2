"""Job: build and summarize a QbS labelling scheme for one dataset.

    python jobs/build_labelling.py --dataset douban [--scale S]
        [--landmarks K] [--mode parallel|sequential]
"""
from __future__ import annotations

import argparse

from _session import get_spark
from repro.core.qbs import build_index
from repro.graphs.registry import dataset_edges


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", required=True)
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--landmarks", type=int, default=20)
    ap.add_argument("--mode", default="parallel", choices=["parallel", "sequential"])
    args = ap.parse_args()
    spark = get_spark("build-labelling")
    pdf = dataset_edges(args.dataset, scale=args.scale)
    qbs = build_index(spark, pdf, n_landmarks=args.landmarks, mode=args.mode)
    s = qbs.scheme
    print(f"dataset={args.dataset} |V|={qbs.index.n_vertices} |E|={len(pdf)}")
    print(f"landmarks={s.landmarks}")
    print(f"label entries={s.n_label_entries()} meta edges={len(s.meta_edges)}")
    print(
        f"size(L)={s.size_labels_bytes(qbs.index.n_vertices)}B "
        f"size(delta)={s.size_delta_bytes()}B size(M)={s.size_meta_bytes()}B"
    )
    spark.stop()


if __name__ == "__main__":
    main()
