"""Job: reproduce Table 2 (construction time + average query time) —
prints the markdown table and writes results/table2.csv.

    python jobs/table2_perf.py [--scale S] [--datasets a,b,c]
        [--queries-dist N] [--queries-local N] [--ppl-budget SECONDS]
"""
from __future__ import annotations

import argparse

from _session import get_spark
from repro.bench.harness import BenchConfig, markdown_table, write_csv
from repro.bench.table2 import run_table2


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--datasets", type=str, default=None)
    ap.add_argument("--queries-dist", type=int, default=None)
    ap.add_argument("--queries-local", type=int, default=None)
    ap.add_argument("--ppl-budget", type=float, default=None)
    args = ap.parse_args()
    cfg = BenchConfig()
    if args.scale is not None:
        cfg.scale = args.scale
    if args.datasets:
        cfg.datasets = args.datasets.split(",")
    if args.queries_dist is not None:
        cfg.n_queries_dist = args.queries_dist
    if args.queries_local is not None:
        cfg.n_queries_local = args.queries_local
    if args.ppl_budget is not None:
        cfg.ppl_time_budget_s = args.ppl_budget
    spark = get_spark("table2")
    rows = run_table2(spark, cfg)
    print(markdown_table(rows))
    print("wrote", write_csv("table2", rows))
    spark.stop()


if __name__ == "__main__":
    main()
