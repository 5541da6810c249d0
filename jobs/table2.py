"""Reproduce Table II: Q1–Q12 on the largest graph via the interval
evaluator, reporting interval-based time, total time and output size.

Usage: ``python jobs/table2.py [--graph G10] [--repeats 3] [--seed N]``
"""
from __future__ import annotations

import argparse

from _session import get_spark
from repro.bench.tables import format_table2, table2_rows
from repro.tpg.generator import g_lite


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--graph", default="G10")
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_spark("table2")
    data = g_lite(args.graph, seed=args.seed)
    print(f"graph {args.graph}: {data.stats()}")
    rows = table2_rows(spark, data, repeats=args.repeats)
    print(format_table2(rows))
    spark.stop()


if __name__ == "__main__":
    main()
