#!/usr/bin/env python
"""Reproduce Table 2 — the graph dataset suite: statistics of the five
synthetic *-lite graphs next to the paper's original graphs.

Usage: python jobs/table2_datasets.py [--no-spark] [--seed 7]
With Spark (default), the degree statistics are computed via a Catalyst
aggregation; --no-spark falls back to pandas.
"""
import argparse

from repro.bench.harness import fmt_table, save_results
from repro.bench.table2 import run_table2


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--no-spark", action="store_true")
    ap.add_argument("--seed", type=int, default=7)
    args = ap.parse_args()

    spark = None
    if not args.no_spark:
        from pyspark.sql import SparkSession

        spark = (
            SparkSession.builder.appName("table2")
            .master("local[*]")
            .config("spark.driver.host", "127.0.0.1")
            .config("spark.ui.enabled", "false")
            .getOrCreate()
        )
    try:
        res = run_table2(spark=spark, seed=args.seed)
    finally:
        if spark is not None:
            spark.stop()

    print("== Table 2 (lite suite vs paper originals) ==")
    rows = [
        (
            r["abbr"],
            r["dataset"],
            r["vertices"],
            r["edges"],
            r["avg_deg"],
            r["max_deg"],
            f"{r['paper_vertices']}/{r['paper_edges']}",
            f"{r['paper_avg_deg']}/{r['paper_max_deg']}",
        )
        for r in res["rows"]
    ]
    print(fmt_table(
        ["abbr", "dataset", "V", "E", "avg_deg", "max_deg",
         "paper V/E", "paper avg/max"],
        rows,
    ))
    path = save_results("table2", res)
    print(f"\nraw results -> {path}")


if __name__ == "__main__":
    main()
