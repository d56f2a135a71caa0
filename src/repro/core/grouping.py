"""Sort-based walker grouping — the shared dispatch kernel.

Every engine groups the walker batch by current vertex and draws each
vertex's walkers in one call (the CPU analog of per-vertex GPU kernels).
A mask-per-unique implementation is O(n_walkers * n_unique); this
sort-based version is O(n log n) and is used by BINGO and all SOTA
comparators alike so dispatch overhead cancels out of Table 3.
"""
from __future__ import annotations

import numpy as np


def iter_vertex_groups(cur: np.ndarray):
    """Yield (vertex, walker_indices) for each distinct vertex in ``cur``."""
    order = np.argsort(cur, kind="stable")
    sorted_cur = cur[order]
    uniq, starts = np.unique(sorted_cur, return_index=True)
    bounds = np.append(starts, len(cur))
    for i in range(len(uniq)):
        yield int(uniq[i]), order[starts[i] : bounds[i + 1]]
