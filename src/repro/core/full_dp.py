"""Full-trajectory distance DPs (paper Eq. 2, Eq. 3, and discrete Fréchet).

These compute Θ(τq, τd) for *whole* trajectories. They serve as the
correctness reference for the CMA kernels (brute force over all O(n²)
subtrajectories calls these) and as the per-start inner DP of ExactS.
"""
from __future__ import annotations

import numpy as np

from repro.core.costs import WedCosts
from repro.core.kernels import prefix_sums, running_min_argmin


def wed_full(costs: WedCosts) -> float:
    """WED(τq, τd) by the classical DP (Eq. 2), rows vectorised.

    Boundaries: ``wed(τq[1:i], τ∅) = Σ del``, ``wed(τ∅, τd[1:j]) = Σ ins``.
    """
    return float(wed_full_lastrow(costs)[-1])


def wed_full_lastrow(costs: WedCosts) -> np.ndarray:
    """Last DP row: ``row[j] = wed(τq, τd[1:j+1])`` for every prefix end j."""
    SUB, DEL, INS = costs.sub, costs.delete, costs.insert
    m, n = SUB.shape
    ins_pre = prefix_sums(INS)
    del_pre = prefix_sums(DEL)
    # Row i = 0 descends from the τ∅ boundary row w[-1,j] = ins_pre[j+1].
    b = np.minimum(ins_pre[:n] + SUB[0], ins_pre[1:] + DEL[0])
    g = b - ins_pre[1:]
    gm, _ = running_min_argmin(g)
    w = ins_pre[1:] + np.minimum(del_pre[1], gm)
    for i in range(1, m):
        b = np.empty(n)
        b[0] = min(del_pre[i] + SUB[i, 0], w[0] + DEL[i])
        b[1:] = np.minimum(w[:-1] + SUB[i, 1:], w[1:] + DEL[i])
        g = b - ins_pre[1:]
        gm, _ = running_min_argmin(g)
        w = ins_pre[1:] + np.minimum(del_pre[i + 1], gm)
    return w


def dtw_full(SUB: np.ndarray) -> float:
    """DTW(τq, τd) by the classical DP (Eq. 3), rows vectorised."""
    return float(dtw_full_lastrow(SUB)[-1])


def dtw_full_lastrow(SUB: np.ndarray) -> np.ndarray:
    """Last DP row: ``row[j] = dtw(τq, τd[1:j+1])``."""
    m, n = SUB.shape
    w = np.cumsum(SUB[0])  # Eq. 3, i = 1 boundary
    for i in range(1, m):
        a = w.copy()  # a[0] = w[i-1,0]: first column only descends
        np.minimum(a[1:], w[:-1], out=a[1:])
        P = prefix_sums(SUB[i])
        hm, _ = running_min_argmin(a - P[:n])
        w = P[1:] + hm
    return w


def fd_full(SUB: np.ndarray) -> float:
    """Discrete Fréchet distance by the classical DP."""
    return float(fd_full_lastrow(SUB)[-1])


def fd_full_lastrow(SUB: np.ndarray) -> np.ndarray:
    """Last DP row: ``row[j] = fd(τq, τd[1:j+1])``."""
    m, n = SUB.shape
    w = np.maximum.accumulate(SUB[0])
    for i in range(1, m):
        prev = w
        w = np.empty(n)
        w[0] = max(prev[0], SUB[i, 0])
        for j in range(1, n):
            w[j] = max(min(prev[j], w[j - 1], prev[j - 1]), SUB[i, j])
    return w


def full_distance(kind: str, costs: WedCosts | np.ndarray) -> float:
    """Θ(τq, τd) for kernel kind ``'wed'`` | ``'dtw'`` | ``'fd'``."""
    if kind == "wed":
        assert isinstance(costs, WedCosts)
        return wed_full(costs)
    if kind == "dtw":
        return dtw_full(np.asarray(costs))
    if kind == "fd":
        return fd_full(np.asarray(costs))
    raise ValueError(f"unknown kernel kind {kind!r}")


def slice_costs(costs: WedCosts | np.ndarray, start: int, stop: int) -> WedCosts | np.ndarray:
    """Cost arrays restricted to the data window ``τd[start:stop]`` (0-idx, exclusive)."""
    if isinstance(costs, WedCosts):
        return WedCosts(costs.sub[:, start:stop], costs.delete, costs.insert[start:stop])
    return np.asarray(costs)[:, start:stop]
