"""Vectorised scan primitives shared by the DP kernels.

The CMA recurrences (paper §5) contain per-row terms of the form
``min_{k<j} (x[k] + carry(k, j))`` where the carry is a prefix-sum
difference. After subtracting the prefix sums these become *running minima*,
which numpy computes in O(n) per row — the trick that keeps the Python-level
work at O(m) rows instead of O(mn) scalar ops.
"""
from __future__ import annotations

import numpy as np


def running_min_argmin(x: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Running minimum of ``x`` and an index achieving it.

    Returns ``(rmin, rarg)`` with ``rmin[k] = min(x[:k+1])`` and
    ``x[rarg[k]] == rmin[k]``. Ties resolve to the *latest* achieving index,
    which is immaterial for cost correctness (any optimal start is valid).
    """
    rmin = np.minimum.accumulate(x)
    hit = np.where(x == rmin, np.arange(len(x)), 0)
    rarg = np.maximum.accumulate(hit)
    return rmin, rarg


def prefix_sums(x: np.ndarray) -> np.ndarray:
    """``P`` with ``P[0] = 0`` and ``P[k] = x[0] + … + x[k-1]`` (len+1)."""
    out = np.empty(len(x) + 1, dtype=np.float64)
    out[0] = 0.0
    np.cumsum(x, out=out[1:])
    return out
