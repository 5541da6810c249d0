"""Shape checks for Fig. 4 (temporal window m) and Fig. 5 (positivity).

Usage: ``python jobs/sweeps.py [--graph G10] [--persons 2000]``
"""
from __future__ import annotations

import argparse

from _session import get_spark
from repro.bench.tables import positivity_sweep_rows, window_sweep_rows
from repro.tpg.generator import g_lite, G_LITE


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--graph", default="G10")
    ap.add_argument("--skip-window", action="store_true")
    ap.add_argument("--skip-positivity", action="store_true")
    args = ap.parse_args()
    spark = get_spark("sweeps")
    if not args.skip_window:
        data = g_lite(args.graph)
        print("== Fig. 4 shape: temporal-navigation window m (interval backend) ==")
        for r in window_sweep_rows(spark, data):
            print(
                f"{r['query']:>4} m={r['m']:>2} total={r['total_s']:.3f}s "
                f"output={r['output']}"
            )
    if not args.skip_positivity:
        print("== Fig. 5 shape: positivity rate ==")
        for r in positivity_sweep_rows(spark, persons=G_LITE[args.graph]):
            print(
                f"rate={r['rate']:.2f} {r['query']:>4} total={r['total_s']:.3f}s "
                f"output={r['output']}"
            )
    spark.stop()


if __name__ == "__main__":
    main()
