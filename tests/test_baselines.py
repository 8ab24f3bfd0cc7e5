"""Baseline algorithms: exact ones must equal CMA; approximate ones must be
valid (in-range windows, AR ≥ 1) and show the paper's quality ordering."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.exacts import exacts, subtraj_distance_matrix
from repro.baselines.gb import gb_fd
from repro.baselines.pos_pss import IncrementalDP, pos, pss, suffix_distances
from repro.baselines.rls import RLSPolicy
from repro.baselines.spring import spring_dtw
from repro.core import costs as C
from repro.core.cma import cma
from repro.core.full_dp import full_distance, slice_costs
from tests.helpers import random_symbol_traj, random_traj


def _pair(seed, max_m=9, max_n=16, kind="spatial"):
    rng = np.random.default_rng(seed)
    m, n = int(rng.integers(1, max_m)), int(rng.integers(2, max_n))
    if kind == "symbol":
        return random_symbol_traj(rng, m), random_symbol_traj(rng, n)
    return random_traj(rng, m), random_traj(rng, n)


_WED_BUILDERS = [
    lambda q, d: C.wed_unit_costs(q, d),
    lambda q, d: C.erp_costs(q, d),
    lambda q, d: C.edr_costs(q, d, eps=1.0),
]


# ---------------------------------------------------------------- ExactS ---
@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("builder", range(3))
def test_exacts_equals_cma_wed_family(seed, builder):
    q, d = _pair(seed * 7 + builder)
    costs = _WED_BUILDERS[builder](q, d)
    assert exacts("wed", costs)[0] == pytest.approx(cma("wed", costs)[0])


@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("kind,build", [("dtw", C.dtw_costs), ("fd", C.fd_costs)])
def test_exacts_equals_cma_sub_only(seed, kind, build):
    q, d = _pair(seed + 400)
    costs = build(q, d)
    assert exacts(kind, costs)[0] == pytest.approx(cma(kind, costs)[0])


@pytest.mark.parametrize("seed", range(8))
def test_subtraj_matrix_consistent_with_full_dp(seed):
    q, d = _pair(seed + 500, max_m=6, max_n=9)
    costs = C.erp_costs(q, d)
    D = subtraj_distance_matrix("wed", costs)
    n = len(d)
    for s in range(n):
        for e in range(s, n):
            assert D[s, e] == pytest.approx(
                full_distance("wed", slice_costs(costs, s, e + 1))
            )
    assert np.all(np.isinf(D[np.tril_indices(n, -1)]))


# ---------------------------------------------------------------- Spring ---
@pytest.mark.parametrize("seed", range(15))
def test_spring_equals_cma_dtw(seed):
    q, d = _pair(seed + 600)
    SUB = C.dtw_costs(q, d)
    best, s, e, _ = spring_dtw(SUB)
    c_best, c_s, c_e = cma("dtw", SUB)
    assert best == pytest.approx(c_best)
    # The found window must itself achieve the optimum.
    assert full_distance("dtw", SUB[:, s : e + 1]) == pytest.approx(best)


def test_spring_threshold_reports_disjoint_matches():
    """With a finite ε, SPRING emits disjoint subsequences all under ε."""
    rng = np.random.default_rng(3)
    q = random_traj(rng, 4)
    d = np.vstack([q, random_traj(rng, 6) + 30, q, random_traj(rng, 3) + 60])
    SUB = C.dtw_costs(q, d)
    _, _, _, reports = spring_dtw(SUB, epsilon=0.5)
    assert len(reports) >= 2
    assert all(dist <= 0.5 for dist, _, _ in reports)
    spans = sorted((s, e) for _, s, e in reports)
    assert all(prev_e < s for (_, prev_e), (s, _) in zip(spans, spans[1:]))


# -------------------------------------------------------------------- GB ---
@pytest.mark.parametrize("seed", range(15))
def test_gb_equals_cma_fd(seed):
    q, d = _pair(seed + 700)
    SUB = C.fd_costs(q, d)
    g_best, g_s, g_e = gb_fd(SUB)
    assert g_best == pytest.approx(cma("fd", SUB)[0])
    assert full_distance("fd", SUB[:, g_s : g_e + 1]) == pytest.approx(g_best)


# --------------------------------------------------------- IncrementalDP ---
@pytest.mark.parametrize("kind", ["wed", "dtw", "fd"])
@pytest.mark.parametrize("seed", range(6))
def test_incremental_dp_matches_full_dp(kind, seed):
    q, d = _pair(seed + 800, max_m=7, max_n=12)
    costs = (
        C.erp_costs(q, d) if kind == "wed" else (C.dtw_costs if kind == "dtw" else C.fd_costs)(q, d)
    )
    n = len(d)
    rng = np.random.default_rng(seed)
    s = int(rng.integers(0, n - 1))
    dp = IncrementalDP(kind, costs)
    dp.reset(s)
    for t in range(s, n):
        got = dp.append()
        ref = full_distance(kind, slice_costs(costs, s, t + 1))
        assert got == pytest.approx(ref), (kind, s, t)


@pytest.mark.parametrize("kind", ["wed", "dtw", "fd"])
@pytest.mark.parametrize("seed", range(6))
def test_best_window_in_suffix_signal(kind, seed):
    """bw[0] is the global optimum; bw is non-increasing in hindsight order."""
    from repro.baselines.pos_pss import best_window_in_suffix

    q, d = _pair(seed + 950, max_m=6, max_n=10)
    costs = (
        C.erp_costs(q, d) if kind == "wed" else (C.dtw_costs if kind == "dtw" else C.fd_costs)(q, d)
    )
    bw = best_window_in_suffix(kind, costs)
    assert bw[0] == pytest.approx(cma(kind, costs)[0])
    assert np.all(np.diff(bw) >= -1e-12)
    # Each bw[t] is achieved by some window inside the suffix.
    n = len(d)
    for t in range(n):
        vals = [
            full_distance(kind, slice_costs(costs, s, e + 1))
            for s in range(t, n)
            for e in range(s, n)
        ]
        assert bw[t] == pytest.approx(min(vals))


@pytest.mark.parametrize("kind", ["wed", "dtw", "fd"])
@pytest.mark.parametrize("seed", range(6))
def test_suffix_distances_match_full_dp(kind, seed):
    q, d = _pair(seed + 900, max_m=7, max_n=12)
    costs = (
        C.erp_costs(q, d) if kind == "wed" else (C.dtw_costs if kind == "dtw" else C.fd_costs)(q, d)
    )
    sd = suffix_distances(kind, costs)
    n = len(d)
    for t in range(n):
        assert sd[t] == pytest.approx(
            full_distance(kind, slice_costs(costs, t, n))
        ), t


# --------------------------------------------------------------- POS/PSS ---
@pytest.mark.parametrize("alg", [pos, pss])
@pytest.mark.parametrize("seed", range(10))
@pytest.mark.parametrize("kind", ["wed", "dtw", "fd"])
def test_approx_algorithms_valid_and_never_better_than_optimal(alg, seed, kind):
    q, d = _pair(seed + 1100)
    costs = (
        C.erp_costs(q, d) if kind == "wed" else (C.dtw_costs if kind == "dtw" else C.fd_costs)(q, d)
    )
    dist, s, e = alg(kind, costs)
    n = len(d)
    assert 0 <= s <= e < n
    # The reported distance is the true distance of the reported window …
    assert full_distance(kind, slice_costs(costs, s, e + 1)) == pytest.approx(dist)
    # … and an approximation can never beat the exact optimum.
    assert dist >= cma(kind, costs)[0] - 1e-9


def test_pss_quality_dominates_pos_on_aggregate():
    """Paper §6.1: 'the result quality of PSS is better than that of POS'.

    Checked in aggregate over random instances (per-instance it may tie)."""
    rng = np.random.default_rng(42)
    pos_total, pss_total = 0.0, 0.0
    for _ in range(40):
        q = random_traj(rng, 6)
        d = np.vstack(
            [random_traj(rng, 5) + rng.normal(0, 5, 2), q + rng.normal(0, 0.3, q.shape), random_traj(rng, 5)]
        )
        costs = C.dtw_costs(q, d)
        pos_total += pos("dtw", costs)[0]
        pss_total += pss("dtw", costs)[0]
    assert pss_total <= pos_total + 1e-9


# ------------------------------------------------------------------- RLS ---
@pytest.mark.parametrize("skip", [False, True])
def test_rls_policy_trains_and_returns_valid_windows(skip):
    rng = np.random.default_rng(11)
    episodes = []
    for _ in range(6):
        q = random_traj(rng, 5)
        d = np.vstack([random_traj(rng, 4) + 20, q + rng.normal(0, 0.2, q.shape)])
        episodes.append(("dtw", C.dtw_costs(q, d)))
    policy = RLSPolicy(skip=skip, seed=0).train(episodes, epochs=2)
    q, d = _pair(77)
    costs = C.dtw_costs(q, d)
    dist, s, e = policy.search("dtw", costs)
    assert 0 <= s <= e < len(d)
    assert dist >= cma("dtw", costs)[0] - 1e-9
    assert full_distance("dtw", costs[:, s : e + 1]) == pytest.approx(dist)


def test_rls_search_is_deterministic_after_training():
    rng = np.random.default_rng(5)
    q, d = random_traj(rng, 5), random_traj(rng, 20)
    costs = C.dtw_costs(q, d)
    p = RLSPolicy(seed=1).train([("dtw", costs)], epochs=1)
    assert p.search("dtw", costs) == p.search("dtw", costs)
