"""Simulated SOTA comparators for Table 3 (see DESIGN.md substitutions)."""
from .base import StaticRebuildStore
from .flowwalker import FlowWalkerStore
from .gsampler import GSamplerStore
from .knightking import KnightKingStore

SOTA_STORES = {
    "knightking": KnightKingStore,
    "gsampler": GSamplerStore,
    "flowwalker": FlowWalkerStore,
}

__all__ = [
    "FlowWalkerStore",
    "GSamplerStore",
    "KnightKingStore",
    "SOTA_STORES",
    "StaticRebuildStore",
]
