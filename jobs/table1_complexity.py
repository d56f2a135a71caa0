#!/usr/bin/env python
"""Reproduce Table 1 — complexity of BINGO vs alias/ITS/rejection
(+ reservoir), empirically: per-op latencies across a degree sweep and
fitted log-log scaling exponents next to the claimed asymptotics.

Usage: python jobs/table1_complexity.py [--degrees 64,256,...] [--seed 0]
(also runnable via spark-submit; no SparkSession is required).
"""
import argparse

from repro.bench.harness import fmt_table, save_results
from repro.bench.table1 import run_table1


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--degrees", default="64,256,1024,4096,16384")
    ap.add_argument("--n-ops", type=int, default=400)
    ap.add_argument("--n-draws", type=int, default=1500)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    degrees = tuple(int(x) for x in args.degrees.split(","))

    res = run_table1(
        degrees=degrees, n_ops=args.n_ops, n_draws=args.n_draws, seed=args.seed
    )

    print("== Table 1 (measured): per-op latency (µs) and structure bytes ==")
    rows = [
        (
            r["method"],
            r["d"],
            f"{r['insert_us']:.2f}",
            f"{r['delete_us']:.2f}",
            f"{r['sample_us']:.2f}",
            r["bytes"],
        )
        for r in res["rows"]
    ]
    print(fmt_table(
        ["method", "d", "insert_us", "delete_us", "sample_us", "bytes"], rows
    ))

    print("\n== Fitted log-log scaling exponent vs claimed complexity ==")
    srows = []
    for m, s in res["slopes"].items():
        c = res["claimed"][m]
        srows.append(
            (
                m,
                f"{s['insert']:+.2f} ({c[0]})",
                f"{s['delete']:+.2f} ({c[1]})",
                f"{s['sample']:+.2f} ({c[2]})",
                f"{s['memory']:+.2f} ({c[3]})",
            )
        )
    print(fmt_table(["method", "insert", "delete", "sample", "memory"], srows))
    path = save_results("table1", res)
    print(f"\nraw results -> {path}")


if __name__ == "__main__":
    main()
