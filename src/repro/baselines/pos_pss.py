"""POS / PSS approximate baselines (reimplemented from descriptions in
paper §6.1; originals in Wang et al. [26]) — O(mn), approximate.

Both scan the data trajectory once, maintaining the distance
``Θ(τq, τd[s:t])`` of the *current segment* (split start ``s``) with an
incremental column DP (O(m) per appended point), and decide at each point
whether to split (restart the segment at ``t+1``):

- **POS** (prefix-only): split when appending the current point strictly
  worsened the segment distance — it never looks ahead.
- **PSS** (prefix–suffix): additionally requires that the remaining suffix
  looks more promising than the current segment
  (``Θ(τq, τd[t+1:n]) < Θ(τq, τd[s:t])``), using suffix distances
  precomputed in one backward DP (reversal symmetry of the distances).

The incremental column DP here is also the machinery RLS reuses.
"""
from __future__ import annotations

import numpy as np

from repro.core.costs import WedCosts
from repro.core.full_dp import (
    dtw_full_lastrow,
    fd_full_lastrow,
    wed_full_lastrow,
)
from repro.core.kernels import prefix_sums, running_min_argmin

Result = tuple[float, int, int]


class IncrementalDP:
    """Column DP of ``Θ(τq, τd[s:t])`` supporting append-a-point in O(m)."""

    def __init__(self, kind: str, costs: WedCosts | np.ndarray):
        self.kind = kind
        if isinstance(costs, WedCosts):
            self.SUB, self.DEL, self.INS = costs.sub, costs.delete, costs.insert
            self.del_pre = prefix_sums(self.DEL)
        else:
            self.SUB = np.asarray(costs, dtype=np.float64)
            self.DEL = self.INS = self.del_pre = None
        self.m, self.n = self.SUB.shape
        self.reset(0)

    def reset(self, start: int) -> None:
        """Begin an empty segment whose first point will be ``τd[start]``."""
        self.start = start
        self.t = start - 1
        if self.kind == "wed":
            self.col = self.del_pre[1:].copy()  # Θ(τq[1:i], τ∅) = Σ del
            self.empty = 0.0
        else:
            self.col = None  # dtw/fd undefined on empty segments

    def append(self) -> float:
        """Extend the segment with the next data point; return Θ(τq, τd[s:t])."""
        self.t += 1
        t = self.t
        if self.kind == "wed":
            new_empty = self.empty + self.INS[t]
            b = np.empty(self.m)
            b[0] = min(self.empty + self.SUB[0, t], self.col[0] + self.INS[t])
            b[1:] = np.minimum(
                self.col[:-1] + self.SUB[1:, t], self.col[1:] + self.INS[t]
            )
            gm, _ = running_min_argmin(b - self.del_pre[1:])
            self.col = self.del_pre[1:] + np.minimum(new_empty, gm)
            self.empty = new_empty
        elif self.kind == "dtw":
            if self.col is None:
                self.col = np.cumsum(self.SUB[:, t])
            else:
                a = self.col.copy()
                np.minimum(a[1:], self.col[:-1], out=a[1:])
                P = prefix_sums(self.SUB[:, t])
                hm, _ = running_min_argmin(a - P[: self.m])
                self.col = P[1:] + hm
        else:  # fd
            if self.col is None:
                self.col = np.maximum.accumulate(self.SUB[:, t])
            else:
                prev = self.col
                col = np.empty(self.m)
                col[0] = max(prev[0], self.SUB[0, t])
                for i in range(1, self.m):
                    col[i] = max(
                        min(prev[i], col[i - 1], prev[i - 1]), self.SUB[i, t]
                    )
                self.col = col
        return float(self.col[-1])


def _reverse_costs(costs: WedCosts | np.ndarray) -> WedCosts | np.ndarray:
    if isinstance(costs, WedCosts):
        return WedCosts(
            costs.sub[::-1, ::-1].copy(),
            costs.delete[::-1].copy(),
            costs.insert[::-1].copy(),
        )
    return np.asarray(costs)[::-1, ::-1].copy()


def suffix_distances(kind: str, costs: WedCosts | np.ndarray) -> np.ndarray:
    """``sd[t] = Θ(τq, τd[t:n])`` for every suffix start, one backward DP.

    Uses the reversal symmetry of WED/DTW/FD: Θ(q, d) = Θ(rev q, rev d).
    """
    rev = _reverse_costs(costs)
    if kind == "wed":
        row = wed_full_lastrow(rev)
    else:
        row = dtw_full_lastrow(rev) if kind == "dtw" else fd_full_lastrow(rev)
    return row[::-1].copy()  # sd[t] = row[n - 1 - t]


def best_window_in_suffix(kind: str, costs: WedCosts | np.ndarray) -> np.ndarray:
    """``bw[t] = min_{t ≤ s ≤ e} Θ(τq, τd[s:e])`` — the best subtrajectory
    entirely inside the suffix, PSS's look-ahead signal.

    One CMA pass on the reversed pair gives the best window *starting* at
    each s; a right-to-left running min finishes the job. O(mn).
    """
    from repro.core.cma import cma_dtw_state, cma_fd_state, cma_wed_state

    rev = _reverse_costs(costs)
    state = {"wed": cma_wed_state, "dtw": cma_dtw_state, "fd": cma_fd_state}[kind]
    C_rev, _ = state(rev)
    best_start = C_rev[::-1]  # best window starting at s
    return np.minimum.accumulate(best_start[::-1])[::-1].copy()


def _split_scan(kind, costs, should_split) -> Result:
    """Shared scan: ``should_split(cur, prev, t, s)`` decides restarts,
    where ``cur = Θ(τq, τd[s:t])`` and ``prev`` is the previous value."""
    dp = IncrementalDP(kind, costs)
    n = dp.n
    best: Result = (np.inf, 0, 0)
    s, prev = 0, np.inf
    for t in range(n):
        cur = dp.append()
        if cur < best[0]:
            best = (cur, s, t)
        if t + 1 < n and should_split(cur, prev, t, s):
            s = t + 1
            dp.reset(s)
            prev = np.inf
        else:
            prev = cur
    return best


def pos(kind: str, costs: WedCosts | np.ndarray) -> Result:
    """Prefix-Only Search: split at t when the current prefix segment
    already beats letting the segment run to the end of the trajectory
    (``Θ(τq, τd[s:t]) < Θ(τq, τd[s:n])``) — the split decision looks only
    at the segment *before* the split point (paper §6.1)."""
    sd = suffix_distances(kind, costs)
    return _split_scan(kind, costs, lambda cur, prev, t, s: cur < sd[s])


def pss(kind: str, costs: WedCosts | np.ndarray) -> Result:
    """Prefix-Suffix Search: split at t when either the prefix segment or
    the remaining suffix beats letting the segment run to the end
    (``min(Θ(τq, τd[s:t]), Θ(τq, τd[t+1:n])) < Θ(τq, τd[s:n])``) — POS's
    rule plus the "subtrajectory after the splitting point" (paper §6.1).
    Strictly better-informed splits than POS; same O(mn)."""
    sd = suffix_distances(kind, costs)
    return _split_scan(
        kind, costs, lambda cur, prev, t, s: min(cur, sd[t + 1]) < sd[s]
    )
