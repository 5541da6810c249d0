"""Reproduce Table I: statistics of the experiment graphs.

Usage: ``python jobs/table1.py [--graphs G1,G2,...] [--seed N]``

Pure generator work — no Spark needed; prints our G-lite ladder next to
the paper's G1–G10 counts.
"""
from __future__ import annotations

import argparse

from repro.bench.tables import format_table1, table1_rows
from repro.tpg.generator import G_LITE


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--graphs", default=",".join(G_LITE))
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    rows = table1_rows(tuple(args.graphs.split(",")), seed=args.seed)
    print(format_table1(rows))


if __name__ == "__main__":
    main()
