"""Synthetic trajectory generators (dataset substrate, DESIGN.md §4)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.synth_data import (
    CITY_SPECS,
    make_queries,
    taxi_trajectories,
)


@pytest.mark.parametrize("city", list(CITY_SPECS))
def test_trajectories_deterministic_in_seed(city):
    a = taxi_trajectories(city, 5, seed=3)
    b = taxi_trajectories(city, 5, seed=3)
    assert len(a) == len(b) == 5
    for x, y in zip(a, b):
        assert np.allclose(x, y)
    c = taxi_trajectories(city, 5, seed=4)
    assert not np.allclose(a[0][: len(c[0])], c[0][: len(a[0])])


@pytest.mark.parametrize("city", list(CITY_SPECS))
def test_trajectories_respect_bbox_and_min_len(city):
    spec = CITY_SPECS[city]
    w, h = spec["bbox"]
    for t in taxi_trajectories(city, 8, seed=1):
        assert len(t) >= spec["min_len"]
        assert t[:, 0].min() >= -1e-9 and t[:, 0].max() <= w + 1e-9
        assert t[:, 1].min() >= -1e-9 and t[:, 1].max() <= h + 1e-9


def test_city_length_ordering_matches_paper():
    """Porto < Xi'an < Beijing mean lengths — the axis Tables 2–3 vary."""
    means = {
        c: np.mean([len(t) for t in taxi_trajectories(c, 20, seed=0)])
        for c in ("porto", "xian", "beijing")
    }
    assert means["porto"] < means["xian"] < means["beijing"]


def test_trajectory_steps_are_bounded():
    """Momentum walk: consecutive points move ~step_km, never teleport."""
    for city in CITY_SPECS:
        step = CITY_SPECS[city]["step_km"]
        for t in taxi_trajectories(city, 3, seed=2):
            gaps = np.linalg.norm(np.diff(t, axis=0), axis=1)
            assert gaps.max() <= step + 1e-9


@pytest.mark.parametrize("city", list(CITY_SPECS))
def test_queries_length_range_and_determinism(city):
    qs = make_queries(city, 6, len_range=(8, 12), seed=5)
    assert len(qs) == 6
    assert all(8 <= len(q) <= 12 for q in qs)
    qs2 = make_queries(city, 6, len_range=(8, 12), seed=5)
    for a, b in zip(qs, qs2):
        assert np.allclose(a, b)


def test_queries_sampled_from_data_are_subwindows():
    data = taxi_trajectories("porto", 5, seed=7)
    qs = make_queries("porto", 4, len_range=(8, 12), seed=8, noise_km=0.0, data=data)
    for q in qs:
        # With zero noise, each query appears verbatim inside some data traj.
        found = any(
            any(np.allclose(t[s : s + len(q)], q) for s in range(len(t) - len(q) + 1))
            for t in data
        )
        assert found


def test_queries_are_noisy_not_exact():
    q1 = make_queries("porto", 3, len_range=(10, 10), seed=6, noise_km=0.0)
    q2 = make_queries("porto", 3, len_range=(10, 10), seed=6, noise_km=0.05)
    assert not np.allclose(q1[0], q2[0])
