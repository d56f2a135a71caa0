#!/usr/bin/env python
"""Reproduce Table 3 — BINGO vs KnightKing/gSampler/FlowWalker: total
runtime (s) and memory (MB) over 10 rounds of (BATCHSIZE updates + app)
for {DeepWalk, node2vec, PPR} x {Insertion, Deletion, Mixed} x the five
lite graphs, plus the per-comparator average speedup column.

Usage: python jobs/table3_sota.py [--graphs AM,GO,CT,LJ,TW]
       [--apps deepwalk,node2vec,ppr] [--modes insertion,deletion,mixed]
       [--rounds 10] [--batch-size 1000] [--walkers 256] [--length 80]
"""
import argparse
import sys
import time

from repro.bench.harness import fmt_table, save_results
from repro.bench.table3 import run_table3


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--graphs", default="AM,GO,CT,LJ,TW")
    ap.add_argument("--apps", default="deepwalk,node2vec,ppr")
    ap.add_argument("--modes", default="insertion,deletion,mixed")
    ap.add_argument("--frameworks",
                    default="bingo,knightking,gsampler,flowwalker")
    ap.add_argument("--rounds", type=int, default=10)
    ap.add_argument("--batch-size", type=int, default=1000)
    ap.add_argument("--walkers", type=int, default=256)
    ap.add_argument("--length", type=int, default=80)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()

    t0 = time.time()
    res = run_table3(
        graphs=args.graphs.split(","),
        apps=args.apps.split(","),
        modes=args.modes.split(","),
        frameworks=args.frameworks.split(","),
        rounds=args.rounds,
        batch_size=args.batch_size,
        walkers=args.walkers,
        length=args.length,
        seed=args.seed,
        progress=lambda msg: print(f"  [{time.time()-t0:7.1f}s] {msg}",
                                   file=sys.stderr),
    )

    graphs = args.graphs.split(",")
    print("== Table 3 (measured): runtime (s), memory (MB) ==")
    by_block: dict = {}
    for r in res["rows"]:
        by_block.setdefault((r["app"], r["mode"]), {}).setdefault(
            r["framework"], {}
        )[r["graph"]] = r
    for (app, mode), fws in by_block.items():
        print(f"\n-- {app} / {mode} --")
        rows = []
        for fw, cells in fws.items():
            vals = [
                f"{cells[g]['runtime_s']:.2f}, {cells[g]['memory_mb']:.0f}"
                if g in cells else "-"
                for g in graphs
            ]
            sp = res["speedups"].get(fw, {}).get(f"{app}/{mode}")
            rows.append([fw, *vals, f"{sp:.2f}x" if sp else "-"])
        print(fmt_table(["framework", *graphs, "avg speedup vs bingo"], rows))
    path = save_results("table3", res)
    print(f"\nraw results -> {path}  (total wall {time.time()-t0:.0f}s)")


if __name__ == "__main__":
    main()
