"""Random-walk engine and the paper's application kernels."""
from .apps import APPS, deepwalk, node2vec, ppr, simple_sampling
from .engine import Node2VecParams, WalkResult, random_walk

__all__ = [
    "APPS",
    "Node2VecParams",
    "WalkResult",
    "deepwalk",
    "node2vec",
    "ppr",
    "random_walk",
    "simple_sampling",
]
