"""Shared test utilities: tiny trajectory factories and an O(mn³)
brute-force reference that is *independent* of the scan-trick kernels.
"""
from __future__ import annotations

import numpy as np

from repro.core.full_dp import full_distance, slice_costs


def brute_force_best(kind: str, costs) -> tuple[float, int, int]:
    """Enumerate every subtrajectory, full DP each — the O(mn³) ground truth."""
    n = (costs.sub if hasattr(costs, "sub") else np.asarray(costs)).shape[1]
    best, bs, be = np.inf, 0, 0
    for s in range(n):
        for e in range(s, n):
            d = full_distance(kind, slice_costs(costs, s, e + 1))
            if d < best:
                best, bs, be = d, s, e
    return best, bs, be


def random_traj(rng: np.random.Generator, n: int, dim: int = 2, scale: float = 1.0) -> np.ndarray:
    """Smooth-ish random trajectory (cumulative steps)."""
    return np.cumsum(rng.normal(0, scale, size=(n, dim)), axis=0)


def random_symbol_traj(rng: np.random.Generator, n: int, alphabet: int = 4) -> np.ndarray:
    """Symbol trajectory (1-D integer points) for unit-cost WED tests."""
    return rng.integers(0, alphabet, size=(n, 1)).astype(np.float64)


def symbols(s: str) -> np.ndarray:
    """Paper-style letter trajectory → 1-D points ('a' → 0.0, 'b' → 1.0 …)."""
    return np.array([[float(ord(c) - ord("a"))] for c in s])
