"""Effectiveness metrics of the paper's §6.1: AR, MR, RR.

All three are defined against the complete subtrajectory distance matrix
``D[s, e] = Θ(τq, τd[s:e])`` of the evaluated data trajectory (produced by
:func:`repro.baselines.exacts.subtraj_distance_matrix`).
"""
from __future__ import annotations

import numpy as np

_TOL = 1e-9


def approximation_ratio(found: float, optimal: float, *, count_valued: bool = False) -> float:
    """AR: found distance / optimal distance (1 for exact algorithms).

    Distances can legitimately be 0 (e.g. EDR with a planted match). For
    count-valued distances (EDR/NetEDR: integer edit counts) the offset is
    one whole edit, keeping AR finite and meaningful at optimal = 0; for
    continuous distances a tiny offset only guards the exact-tie case.
    """
    s = 1.0 if count_valued else _TOL
    return float((found + s) / (optimal + s))


def mean_rank(found: float, D: np.ndarray) -> int:
    """MR: 1 + #subtrajectories strictly better than the found one."""
    finite = D[np.isfinite(D)]
    return int((finite < found - _TOL).sum()) + 1


def relative_rank(found: float, D: np.ndarray) -> float:
    """RR: fraction (%) of subtrajectories better than the found one."""
    finite = D[np.isfinite(D)]
    return float((finite < found - _TOL).sum()) / len(finite) * 100.0


def effectiveness(found: float, D: np.ndarray, *, count_valued: bool = False) -> dict[str, float]:
    """AR / MR / RR of a found distance against the full matrix."""
    opt = float(np.nanmin(np.where(np.isfinite(D), D, np.nan)))
    return {
        "AR": approximation_ratio(found, opt, count_valued=count_valued),
        "MR": mean_rank(found, D),
        "RR": relative_rank(found, D),
    }
