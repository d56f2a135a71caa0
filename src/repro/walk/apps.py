"""The paper's four random-walk kernels (§6: random_walk_deepwalk,
random_walk_node2vec, random_walk_ppr, random_walk_simple_sampling),
with the paper's default parameters: walk length 80, node2vec p=0.5 /
q=2 (KnightKing's settings), PPR termination probability 1/80, and
vertex-count walkers (capped for lite-scale runs via ``walkers``)."""
from __future__ import annotations

import numpy as np

from .engine import Node2VecParams, WalkResult, random_walk

DEFAULT_LENGTH = 80
PPR_STOP = 1.0 / 80.0
# Safety cap on PPR's geometric walk length (P(exceed) ~ 5e-3 at 420).
PPR_MAX_LENGTH = 420


def _starts(store, rng: np.random.Generator, walkers: int | None) -> np.ndarray:
    """One walker per vertex (paper default), optionally subsampled to
    ``walkers`` starts for lite-scale benchmarking."""
    verts = store.vertices()
    if len(verts) == 0:
        return verts
    if walkers is None or walkers >= len(verts):
        return verts
    return rng.choice(verts, size=walkers, replace=False)


def deepwalk(store, rng: np.random.Generator, *, length: int = DEFAULT_LENGTH,
             walkers: int | None = None, starts=None) -> WalkResult:
    """Biased DeepWalk: first-order biased walks of fixed length."""
    s = _starts(store, rng, walkers) if starts is None else np.asarray(starts)
    return random_walk(store, s, rng, length=length)


def node2vec(store, rng: np.random.Generator, *, p: float = 0.5, q: float = 2.0,
             length: int = DEFAULT_LENGTH, walkers: int | None = None,
             starts=None) -> WalkResult:
    """node2vec: second-order walks via KnightKing-style rejection (§7.3)."""
    s = _starts(store, rng, walkers) if starts is None else np.asarray(starts)
    return random_walk(store, s, rng, length=length,
                       node2vec=Node2VecParams(p=p, q=q))


def ppr(store, rng: np.random.Generator, *, stop_prob: float = PPR_STOP,
        max_length: int = PPR_MAX_LENGTH, walkers: int | None = None,
        starts=None) -> WalkResult:
    """Personalized PageRank walks: geometric termination, visit counts
    are the PPR mass estimator."""
    s = _starts(store, rng, walkers) if starts is None else np.asarray(starts)
    return random_walk(store, s, rng, length=max_length, stop_prob=stop_prob)


def simple_sampling(store, rng: np.random.Generator, *, walkers: int | None = None,
                    starts=None) -> WalkResult:
    """One-hop neighbor sampling (the random_walk_simple_sampling kernel)."""
    s = _starts(store, rng, walkers) if starts is None else np.asarray(starts)
    return random_walk(store, s, rng, length=1)


APPS = {"deepwalk": deepwalk, "node2vec": node2vec, "ppr": ppr,
        "simple": simple_sampling}
