"""Vectorized random-walk engine over any sampler store (paper §6:
"Bingo performs random walks in a step-by-step manner, where each step
involves sampling to select the next node").

The engine advances all walkers one step at a time; walkers that share a
current vertex are drawn in one vectorized store call (the CPU analog of
BINGO's per-vertex GPU kernels). Second-order (node2vec) walks use
KnightKing's two-step approach, which the paper adopts (§7.3): sample
from the static per-vertex space, then accept/reject against the history
factor f(w, v) of Eq. 1 normalized by max(1/p, 1, 1/q).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

_MAX_SECOND_ORDER_ROUNDS = 10_000


@dataclass(frozen=True)
class Node2VecParams:
    """Return (p) and in-out (q) hyper-parameters of node2vec (Eq. 1)."""

    p: float = 0.5
    q: float = 2.0

    @property
    def fmax(self) -> float:
        return max(1.0 / self.p, 1.0, 1.0 / self.q)


@dataclass
class WalkResult:
    """Outcome of one walk round.

    ``paths`` is an (n_walkers, length+1) int64 array padded with -1
    after each walker's termination (dead end or stop-probability exit).
    ``visits`` counts how often each vertex id was visited across all
    walkers — the indicator PPR and friends aggregate. ``steps`` is the
    total number of sampled transitions (the workload measure used by
    the piecewise breakdown in Fig. 16).
    """

    paths: np.ndarray
    visits: np.ndarray
    steps: int

    def mean_length(self) -> float:
        return float((self.paths >= 0).sum(axis=1).mean() - 1.0)


def _second_order_filter(
    store,
    rng: np.random.Generator,
    prev: np.ndarray,
    cur: np.ndarray,
    cand: np.ndarray,
    n2v: Node2VecParams,
) -> np.ndarray:
    """KnightKing-style rejection: accept candidate ``cand`` for walkers
    at ``cur`` with previous vertex ``prev``; resample rejected walkers
    until all accept. Returns the accepted next vertices."""
    out = cand.copy()
    pending = np.nonzero((prev >= 0) & (out >= 0))[0]
    fmax = n2v.fmax
    for _ in range(_MAX_SECOND_ORDER_ROUNDS):
        if len(pending) == 0:
            return out
        c = out[pending]
        f = np.ones(len(pending), dtype=np.float64)
        back = c == prev[pending]
        f[back] = 1.0 / n2v.p
        # distance 1: candidate adjacent to the previous vertex.
        rest = np.nonzero(~back)[0]
        for j in rest:
            if not store.has_edge(int(prev[pending[j]]), int(c[j])):
                f[j] = 1.0 / n2v.q
        accept = rng.random(len(pending)) * fmax < f
        rejected = pending[~accept]
        if len(rejected) == 0:
            return out
        out[rejected] = store.sample_next(rng, cur[rejected])
        # A dead end cannot appear here (cur had a neighbor to propose),
        # but guard anyway: drop any -1 from the pending set.
        pending = rejected[out[rejected] >= 0]
    raise RuntimeError("second-order rejection failed to converge")


def random_walk(
    store,
    starts,
    rng: np.random.Generator,
    *,
    length: int = 80,
    stop_prob: float | None = None,
    node2vec: Node2VecParams | None = None,
) -> WalkResult:
    """Run one walk per entry of ``starts`` for up to ``length`` steps.

    ``stop_prob`` adds a per-step termination coin (PPR's 1/80 — the
    expected walk length stays ``1/stop_prob``). ``node2vec`` switches on
    the second-order rejection filter. Walkers die at dead-end vertices
    (no out-edges), matching the paper's step-by-step engine.
    """
    starts = np.asarray(starts, dtype=np.int64)
    n = len(starts)
    paths = np.full((n, length + 1), -1, dtype=np.int64)
    paths[:, 0] = starts
    cur = starts.copy()
    prev = np.full(n, -1, dtype=np.int64)
    active = np.ones(n, dtype=bool)
    steps = 0
    for t in range(1, length + 1):
        if not active.any():
            break
        idx = np.nonzero(active)[0]
        if stop_prob is not None:
            keep = rng.random(len(idx)) >= stop_prob
            active[idx[~keep]] = False
            idx = idx[keep]
            if len(idx) == 0:
                break
        nxt = store.sample_next(rng, cur[idx])
        if node2vec is not None:
            nxt = _second_order_filter(store, rng, prev[idx], cur[idx], nxt, node2vec)
        dead = nxt < 0
        steps += int((~dead).sum())
        active[idx[dead]] = False
        live = idx[~dead]
        paths[live, t] = nxt[~dead]
        prev[live] = cur[live]
        cur[live] = nxt[~dead]
    flat = paths[paths >= 0]
    visits = np.bincount(flat)
    return WalkResult(paths=paths, visits=visits, steps=steps)
