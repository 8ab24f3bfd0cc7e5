"""Pruning substrates: GBP (Spark ≡ numpy ≡ DuckDB SQL), KPF bounds
(Theorem B.1: never above the true optimum), OSF-like envelope bound."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core import costs as C
from repro.core.cma import cma
from repro.oracle import assert_equivalent
from repro.search.api import build_pair_costs, kernel_kind
from repro.search.pruning import (
    gbp_candidates_df,
    gbp_candidates_local,
    gbp_close_count,
    grid_cells,
    key_point_indices,
    kpf_bound,
    kpf_bounds_df,
    kpf_sequential_filter,
    osf_bound,
)
from repro.synth_data import explode_points, make_queries, taxi_trajectories, trajectories_df

EPS = 0.8


@pytest.fixture(scope="module")
def sets():
    data = taxi_trajectories("porto", 8, seed=31, len_scale=0.5)
    queries = make_queries("porto", 3, len_range=(6, 10), seed=32)
    return queries, data


# --------------------------------------------------------------------- GBP


def test_grid_cells_basic():
    cells = grid_cells(np.array([[0.0, 0.0], [0.79, 0.81], [-0.1, 2.5]]), EPS)
    assert cells.tolist() == [[0, 0], [0, 1], [-1, 3]]


def test_gbp_close_count_manual():
    q = np.array([[0.5, 0.5], [10.0, 10.0]])
    d = np.array([[1.0, 1.0]])
    # q[0] is in a neighbouring cell of d[0]; q[1] is far away.
    assert gbp_close_count(q, d, EPS) == 1


@pytest.mark.parametrize("mu", [0.2, 0.5, 0.9])
def test_gbp_spark_equals_local(spark, sets, mu):
    queries, data = sets
    qpts = explode_points(trajectories_df(spark, queries)).withColumnRenamed(
        "traj_id", "query_id"
    )
    dpts = explode_points(trajectories_df(spark, data))
    got = gbp_candidates_df(spark, qpts, dpts, EPS, mu).toPandas()
    got_set = set(zip(got.query_id, got.traj_id))
    assert got_set == gbp_candidates_local(queries, data, EPS, mu)


def test_gbp_spark_matches_duckdb_oracle(spark, sets):
    """The inverted-grid-index dataflow vs the same query in DuckDB SQL."""
    queries, data = sets
    qpts = explode_points(trajectories_df(spark, queries)).withColumnRenamed(
        "traj_id", "query_id"
    )
    dpts = explode_points(trajectories_df(spark, data))
    got = gbp_candidates_df(spark, qpts, dpts, EPS, mu := 0.4)
    assert_equivalent(
        got,
        f"""
        WITH qc AS (SELECT query_id, seq,
                           CAST(floor(x/{EPS}) AS BIGINT) cx,
                           CAST(floor(y/{EPS}) AS BIGINT) cy FROM qpts),
             dc AS (SELECT DISTINCT traj_id,
                           CAST(floor(x/{EPS}) AS BIGINT) cx,
                           CAST(floor(y/{EPS}) AS BIGINT) cy FROM dpts),
             close AS (
               SELECT qc.query_id, dc.traj_id, count(DISTINCT qc.seq) AS close
               FROM qc JOIN dc
                 ON abs(qc.cx - dc.cx) <= 1 AND abs(qc.cy - dc.cy) <= 1
               GROUP BY qc.query_id, dc.traj_id),
             qlen AS (SELECT query_id, count(*) AS m FROM qpts GROUP BY query_id)
        SELECT close.query_id, close.traj_id
        FROM close JOIN qlen ON close.query_id = qlen.query_id
        WHERE close.close >= {mu} * qlen.m
        """,
        qpts=qpts,
        dpts=dpts,
    )


def test_gbp_keeps_planted_match():
    """A trajectory containing the query verbatim always survives GBP."""
    rng = np.random.default_rng(0)
    q = np.cumsum(rng.normal(0, 0.2, (10, 2)), axis=0) + 5
    d = np.vstack([rng.uniform(0, 10, (5, 2)), q, rng.uniform(0, 10, (5, 2))])
    assert gbp_close_count(q, d, EPS) == len(q)
    assert (0, 0) in gbp_candidates_local([q], [d], EPS, mu=0.9)


# --------------------------------------------------------------------- KPF


def test_key_point_indices_sampling():
    assert key_point_indices(10, 0.3).tolist() == [0, 3, 6, 9]
    assert key_point_indices(1, 0.05).tolist() == [0]
    assert len(key_point_indices(100, 0.05)) == 5
    assert key_point_indices(6, 0.5).tolist() == [0, 2, 4]


@pytest.mark.parametrize("distance", ["DTW", "ERP", "EDR", "FD"])
@pytest.mark.parametrize("seed", range(8))
def test_kpf_bound_below_true_optimum_at_full_rate(distance, seed):
    """Theorem B.1: at r = 1 the bound is a true lower bound of min_j C_{m,j}."""
    rng = np.random.default_rng(seed)
    q = np.cumsum(rng.normal(0, 0.5, (6, 2)), axis=0)
    d = np.cumsum(rng.normal(0, 0.5, (15, 2)), axis=0)
    bound = kpf_bound(q, d, distance, r=1.0, eps=0.5)
    opt = cma(kernel_kind(distance), build_pair_costs(distance, q, d, eps=0.5))[0]
    assert bound <= opt + 1e-9


def test_kpf_bounds_df_matches_local(spark, sets):
    queries, data = sets
    qpts = explode_points(trajectories_df(spark, queries)).withColumnRenamed(
        "traj_id", "query_id"
    )
    dpts = explode_points(trajectories_df(spark, data))
    got = kpf_bounds_df(spark, qpts, dpts, "DTW", r=0.5).toPandas()
    for _, row in got.iterrows():
        ref = kpf_bound(
            queries[int(row.query_id)], data[int(row.traj_id)], "DTW", r=0.5
        )
        assert row.bound == pytest.approx(ref, rel=1e-6), (row.query_id, row.traj_id)


def test_kpf_bounds_df_matches_duckdb_oracle(spark, sets):
    queries, data = sets
    qpts = explode_points(trajectories_df(spark, queries)).withColumnRenamed(
        "traj_id", "query_id"
    )
    dpts = explode_points(trajectories_df(spark, data))
    got = kpf_bounds_df(spark, qpts, dpts, "DTW", r=0.5)
    assert_equivalent(
        got,
        """
        WITH kp AS (SELECT query_id, seq, x qx, y qy FROM qpts WHERE seq % 2 = 0),
             per AS (
               SELECT kp.query_id, d.traj_id, kp.seq,
                      min(sqrt((kp.qx-d.x)^2 + (kp.qy-d.y)^2)) AS min_sub
               FROM kp CROSS JOIN dpts d GROUP BY kp.query_id, d.traj_id, kp.seq),
             qlen AS (SELECT query_id, count(*) m FROM qpts GROUP BY query_id),
             nk AS (SELECT query_id, count(*) nk FROM kp GROUP BY query_id)
        SELECT per.query_id, per.traj_id, sum(min_sub) * any_value(m) / any_value(nk) AS bound
        FROM per JOIN qlen USING (query_id) JOIN nk USING (query_id)
        GROUP BY per.query_id, per.traj_id
        """,
        qpts=qpts,
        dpts=dpts,
    )


def test_kpf_sequential_filter_prunes_and_keeps_optimum():
    # Three candidates; exact searches only run while bounds beat the best.
    dists = {(0, 0): 5.0, (0, 1): 1.0, (0, 2): 9.0}
    bounded = [(0.5, 0, 1), (2.0, 0, 0), (8.0, 0, 2)]
    calls = []

    def search(qid, tid):
        calls.append((qid, tid))
        return dists[(qid, tid)], 0, 0

    best, searched = kpf_sequential_filter(bounded, search)
    assert best[0][0] == 1.0 and best[0][1] == 1
    assert searched == 1  # bounds 2.0 and 8.0 both exceed best = 1.0
    assert calls == [(0, 1)]


# --------------------------------------------------------------- OSF-like


@pytest.mark.parametrize("distance", ["DTW", "ERP", "EDR", "FD"])
@pytest.mark.parametrize("seed", range(6))
def test_osf_bound_is_lower_bound(distance, seed):
    rng = np.random.default_rng(seed + 100)
    q = np.cumsum(rng.normal(0, 0.5, (5, 2)), axis=0) + 3
    d = np.cumsum(rng.normal(0, 0.5, (12, 2)), axis=0)
    bound = osf_bound(q, d, distance)
    opt = cma(kernel_kind(distance), build_pair_costs(distance, q, d, eps=0.5))[0]
    assert bound <= opt + 1e-9


def test_osf_weaker_than_kpf():
    """The comparison pruner is (weakly) looser than KPF at full rate —
    the property App. C's experiments rely on."""
    rng = np.random.default_rng(1)
    weaker = 0
    for _ in range(20):
        q = np.cumsum(rng.normal(0, 0.5, (6, 2)), axis=0) + rng.uniform(-5, 5, 2)
        d = np.cumsum(rng.normal(0, 0.5, (15, 2)), axis=0)
        if osf_bound(q, d, "DTW") <= kpf_bound(q, d, "DTW", r=1.0) + 1e-9:
            weaker += 1
    assert weaker >= 18
