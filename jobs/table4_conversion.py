#!/usr/bin/env python
"""Reproduce Table 4 — group-type conversion ratios on the LiveJournal
graph under mixed batched updates, next to the paper's percentages.

Usage: python jobs/table4_conversion.py [--graph LJ] [--rounds 10]
       [--batch-size 1000] [--seed 0]
"""
import argparse

from repro.bench.harness import fmt_table, save_results
from repro.bench.table4 import KINDS, run_table4


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--graph", default="LJ")
    ap.add_argument("--rounds", type=int, default=10)
    ap.add_argument("--batch-size", type=int, default=1000)
    ap.add_argument("--mode", default="mixed")
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()

    res = run_table4(
        graph=args.graph,
        rounds=args.rounds,
        batch_size=args.batch_size,
        mode=args.mode,
        seed=args.seed,
    )

    print(f"== Table 4 (measured, {args.graph}): conversions as % of the "
          "initial group population of the source kind; "
          "(paper LJ value in parens) ==")
    rows = []
    for f in KINDS:
        cells = []
        for t in KINDS:
            if f == t:
                cells.append("-")
            else:
                paper = res["paper"].get(f, {}).get(t, "?")
                cells.append(f"{res['matrix'][f][t]:.2f} ({paper})")
        rows.append([f, *cells])
    print(fmt_table(["from \\ to", *KINDS], rows))
    print("\ngroup census:", res["group_census"])
    print("touches:", res["touches"])
    path = save_results("table4", res)
    print(f"\nraw results -> {path}")


if __name__ == "__main__":
    main()
