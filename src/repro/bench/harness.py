"""Benchmark harness shared by jobs/ and benchmarks/: wall-clock timing,
memory formatting, paper-style fixed-width table rendering, and JSON
result persistence under results/."""
from __future__ import annotations

import json
import time
from pathlib import Path

RESULTS_DIR = Path(__file__).resolve().parents[3] / "results"


class Timer:
    """Context-manager stopwatch: ``with Timer() as t: ...; t.seconds``."""

    def __enter__(self) -> "Timer":
        self._t0 = time.perf_counter()
        self.seconds = 0.0
        return self

    def __exit__(self, *exc) -> None:
        self.seconds = time.perf_counter() - self._t0


def mb(nbytes: float) -> float:
    return nbytes / (1 << 20)


def fmt_table(headers, rows) -> str:
    """Render an aligned text table (the shape Tables 1-4 are printed in)."""
    cells = [[str(h) for h in headers]] + [[str(c) for c in row] for row in rows]
    widths = [max(len(r[i]) for r in cells) for i in range(len(headers))]
    lines = []
    for j, row in enumerate(cells):
        lines.append("  ".join(c.ljust(w) for c, w in zip(row, widths)))
        if j == 0:
            lines.append("  ".join("-" * w for w in widths))
    return "\n".join(lines)


def save_results(name: str, payload) -> Path:
    """Persist a table's raw numbers to results/<name>.json."""
    RESULTS_DIR.mkdir(exist_ok=True)
    path = RESULTS_DIR / f"{name}.json"
    path.write_text(json.dumps(payload, indent=2, default=str))
    return path


def fit_loglog_slope(xs, ys) -> float:
    """Least-squares slope of log(y) vs log(x) — the measured scaling
    exponent compared against Table 1's claimed complexities."""
    import numpy as np

    lx = np.log(np.asarray(xs, dtype=float))
    ly = np.log(np.maximum(np.asarray(ys, dtype=float), 1e-12))
    lx = lx - lx.mean()
    return float((lx * (ly - ly.mean())).sum() / (lx * lx).sum())
