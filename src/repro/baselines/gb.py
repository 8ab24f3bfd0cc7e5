"""Greedy Backtracking baseline (Gudmundsson et al. [8]) — Fréchet only.

Finds the subtrajectory minimising the discrete Fréchet distance as a
*min-bottleneck path* problem on the m×n cost matrix: a path may enter at any
top-row cell (i=0, any j), moves by (i+1,j), (i,j+1) or (i+1,j+1), exits at
any bottom-row cell, and costs the maximum SUB value it passes through.

We solve it with a best-first search (a heap ordered by the path maximum)
with each cell settled at most once — the memoisation that keeps the search
O(mn log mn). The repeated heap traffic is the constant-factor overhead the
paper observes makes GB "slightly less efficient" than CMA's single-pass DP.
"""
from __future__ import annotations

import heapq

import numpy as np


def gb_fd(SUB: np.ndarray) -> tuple[float, int, int]:
    """Best subtrajectory under discrete Fréchet distance, exact."""
    SUB = np.asarray(SUB, dtype=np.float64)
    m, n = SUB.shape
    # (bottleneck, i, j, start) — heapq orders by bottleneck.
    heap: list[tuple[float, int, int, int]] = [
        (float(SUB[0, j]), 0, j, j) for j in range(n)
    ]
    heapq.heapify(heap)
    settled = np.zeros((m, n), dtype=bool)
    while heap:
        cost, i, j, start = heapq.heappop(heap)
        if settled[i, j]:
            continue
        settled[i, j] = True
        if i == m - 1:
            return cost, start, j
        for ni, nj in ((i + 1, j), (i, j + 1), (i + 1, j + 1)):
            if ni < m and nj < n and not settled[ni, nj]:
                heapq.heappush(heap, (max(cost, float(SUB[ni, nj])), ni, nj, start))
    raise RuntimeError("unreachable: bottom row is always reachable")
