"""Shared test helpers: statistical distribution checks with fixed seeds."""
from __future__ import annotations

import numpy as np


def empirical_probs(draws: np.ndarray, k: int) -> np.ndarray:
    counts = np.bincount(np.asarray(draws, dtype=np.int64), minlength=k)
    return counts / len(draws)


def assert_distribution(draws, expected_probs, *, z: float = 4.5) -> None:
    """Assert empirical frequencies match ``expected_probs`` within a
    z-sigma binomial band per category. With z=4.5 and fixed seeds the
    false-failure probability per category is ~7e-6 — deterministic in
    practice, but still sensitive to any real bias."""
    p = np.asarray(expected_probs, dtype=np.float64)
    emp = empirical_probs(draws, len(p))
    n = len(draws)
    tol = z * np.sqrt(p * (1 - p) / n) + 1e-12
    bad = np.abs(emp - p) > tol
    assert not bad.any(), (
        f"distribution mismatch at {np.nonzero(bad)[0]}: emp={emp[bad]} "
        f"expected={p[bad]} tol={tol[bad]}"
    )


def rng(seed: int = 0) -> np.random.Generator:
    return np.random.default_rng(seed)
