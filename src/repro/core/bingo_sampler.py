"""``VertexSampler`` adapter over ``BingoVertex`` — lets BINGO plug into
the same per-vertex benchmark/test harness as the Table 1 baselines
(alias, ITS, rejection, reservoir)."""
from __future__ import annotations

import numpy as np

from .bingo_vertex import BingoVertex
from .sampler_api import VertexSampler


class BingoSampler(VertexSampler):
    name = "bingo"

    def __init__(self, biases, *, adaptive: bool = True, float_bias: bool = False) -> None:
        biases = np.asarray(biases)
        self._v = BingoVertex(
            np.arange(len(biases), dtype=np.int64),
            biases,
            adaptive=adaptive,
            float_bias=float_bias,
        )
        self._next_dst = len(biases)

    @property
    def vertex(self) -> BingoVertex:
        return self._v

    @property
    def degree(self) -> int:
        return self._v.degree

    @property
    def total_weight(self) -> float:
        return self._v.total_weight

    def sample(self, rng: np.random.Generator, size: int = 1) -> np.ndarray:
        return self._v.sample(rng, size)

    def insert(self, bias) -> int:
        dst = self._next_dst
        self._next_dst += 1
        return self._v.insert(dst, bias)

    def delete(self, index: int) -> None:
        # BingoVertex deletes by destination id; its internal swap renames
        # the tail index to ``index``, matching the interface contract.
        dst = int(self._v.neighbors_view()[index])
        self._v.delete(dst)

    def weight_of(self, index: int) -> float:
        # λ-scaled in float mode — proportional to the raw bias, which is
        # all Eq. 2 requires.
        return self._v.weight_of(index)

    @property
    def nbytes(self) -> int:
        return self._v.structure_nbytes
