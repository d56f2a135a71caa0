"""Alias-method sampler (paper §2.3, Fig. 2(b)).

O(d) construction (Vose's algorithm), O(1) sampling. Any single-bias
update requires rebuilding the whole table — the O(d) update cost in
Table 1 that motivates BINGO. The alias table is also reused by BINGO
itself for the (tiny, K-entry) inter-group stage.
"""
from __future__ import annotations

import numpy as np

from .sampler_api import VertexSampler


class AliasTable:
    """Immutable alias table over a weight vector (Vose construction)."""

    __slots__ = ("prob", "alias", "total", "n")

    def __init__(self, weights) -> None:
        w = np.asarray(weights, dtype=np.float64)
        if len(w) == 0:
            raise ValueError("alias table needs at least one weight")
        if (w < 0).any():
            raise ValueError("weights must be non-negative")
        self.n = len(w)
        self.total = float(w.sum())
        if self.total <= 0:
            raise ValueError("total weight must be positive")
        scaled = w * (self.n / self.total)
        prob = np.ones(self.n, dtype=np.float64)
        alias = np.arange(self.n, dtype=np.int64)
        small = [i for i in range(self.n) if scaled[i] < 1.0]
        large = [i for i in range(self.n) if scaled[i] >= 1.0]
        while small and large:
            s = small.pop()
            l = large.pop()
            prob[s] = scaled[s]
            alias[s] = l
            scaled[l] = scaled[l] + scaled[s] - 1.0
            (small if scaled[l] < 1.0 else large).append(l)
        # Leftovers are 1.0 within float error; prob already initialized.
        self.prob = prob
        self.alias = alias

    def sample(self, rng: np.random.Generator, size: int = 1) -> np.ndarray:
        """Vectorized O(1)-per-draw sampling: pick bucket, then coin flip."""
        u = rng.random(size) * self.n
        j = u.astype(np.int64)
        accept = (u - j) < self.prob[j]
        return np.where(accept, j, self.alias[j])

    def sample_one(self, rng: np.random.Generator) -> int:
        """Scalar fast path for single-walker draws (the common case when
        walkers are spread thinly over vertices). Uses the one-uniform
        alias trick: the integer part picks the bucket, the fractional
        part re-used as the accept coin."""
        u = rng.random() * self.n
        j = int(u)
        return j if (u - j) < self.prob[j] else int(self.alias[j])

    @property
    def nbytes(self) -> int:
        return self.prob.nbytes + self.alias.nbytes


class AliasSampler(VertexSampler):
    """Per-vertex alias sampler with rebuild-on-update (Table 1 row 2)."""

    name = "alias"

    def __init__(self, biases) -> None:
        self._w = np.asarray(biases, dtype=np.float64).copy()
        self._table = AliasTable(self._w)

    @property
    def degree(self) -> int:
        return len(self._w)

    @property
    def total_weight(self) -> float:
        return float(self._w.sum())

    def sample(self, rng: np.random.Generator, size: int = 1) -> np.ndarray:
        return self._table.sample(rng, size)

    def insert(self, bias) -> int:
        self._w = np.append(self._w, float(bias))
        self._table = AliasTable(self._w)  # O(d) rebuild — the paper's point
        return len(self._w) - 1

    def delete(self, index: int) -> None:
        if not 0 <= index < len(self._w):
            raise IndexError(index)
        self._w[index] = self._w[-1]
        self._w = self._w[:-1]
        if len(self._w):
            self._table = AliasTable(self._w)  # O(d) rebuild
        else:
            self._table = None

    def weight_of(self, index: int) -> float:
        return float(self._w[index])

    @property
    def nbytes(self) -> int:
        t = self._table.nbytes if self._table is not None else 0
        return self._w.nbytes + t
