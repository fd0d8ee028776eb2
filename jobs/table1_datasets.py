"""Job: reproduce Table 1 (dataset statistics) — prints the markdown table
and writes results/table1.csv.

    python jobs/table1_datasets.py [--scale S] [--datasets a,b,c]
"""
from __future__ import annotations

import argparse

from _session import get_spark
from repro.bench.harness import BenchConfig, markdown_table, write_csv
from repro.bench.table1 import run_table1


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--datasets", type=str, default=None)
    args = ap.parse_args()
    cfg = BenchConfig()
    if args.scale is not None:
        cfg.scale = args.scale
    if args.datasets:
        cfg.datasets = args.datasets.split(",")
    spark = get_spark("table1")
    rows = run_table1(spark, cfg)
    print(markdown_table(rows))
    print("wrote", write_csv("table1", rows))
    spark.stop()


if __name__ == "__main__":
    main()
