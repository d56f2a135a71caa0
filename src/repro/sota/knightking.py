"""KnightKing comparator (paper §6.2 CPU SOTA; [73]).

KnightKing samples biased first-order walks from per-vertex **alias
tables** (O(1) sampling) and handles second-order biases with rejection
— which our shared walk engine applies on top, since the paper adopts
KnightKing's own approach for node2vec (§7.3). Being a static-graph
engine, every update round forces a full O(d)-per-vertex alias rebuild,
the cost Table 1 attributes to the alias method and Table 3 exposes at
graph scale.
"""
from __future__ import annotations

import numpy as np

from ..core.alias import AliasTable
from .base import StaticRebuildStore, per_vertex_sample


class KnightKingStore(StaticRebuildStore):
    name = "knightking"

    def rebuild(self) -> None:
        self._tables = {
            u: AliasTable(biases) for u, _dsts, biases in self.adj.items()
        }

    def sample_next(self, rng: np.random.Generator, cur: np.ndarray) -> np.ndarray:
        return per_vertex_sample(
            self._tables,
            lambda u: self.adj.neighbors(u)[0],
            rng,
            cur,
            lambda t, r, m: t.sample(r, m),
            draw_one=lambda t, r: t.sample_one(r),
        )

    def structure_nbytes(self) -> int:
        return sum(t.nbytes for t in self._tables.values())
