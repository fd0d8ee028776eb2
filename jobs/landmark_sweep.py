"""Job: landmark sweep (paper Figs 9–11 as a table) — construction time,
label sizes and local query time for |R| ∈ {5,10,20,40}.

    python jobs/landmark_sweep.py [--scale S] [--datasets a,b,c]
"""
from __future__ import annotations

import argparse

from _session import get_spark
from repro.bench.harness import BenchConfig, markdown_table, write_csv
from repro.bench.sweep import run_sweep


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--datasets", type=str, default=None)
    args = ap.parse_args()
    cfg = BenchConfig()
    if args.scale is not None:
        cfg.scale = args.scale
    spark = get_spark("sweep")
    rows = run_sweep(spark, cfg, datasets=args.datasets.split(",") if args.datasets else None)
    print(markdown_table(rows))
    print("wrote", write_csv("sweep", rows))
    spark.stop()


if __name__ == "__main__":
    main()
