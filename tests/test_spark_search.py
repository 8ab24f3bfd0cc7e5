"""Distributed search: Spark path ≡ driver path; relational steps (top-K,
GBP candidates, KPF bounds) oracle-checked against DuckDB SQL."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.search.distributed import pairwise_search_df, topk_df
from repro.search.local import pairwise_results, topk
from repro.synth_data import explode_points, make_queries, taxi_trajectories, trajectories_df


@pytest.fixture(scope="module")
def tiny():
    data = taxi_trajectories("porto", 10, seed=21, len_scale=0.5)
    queries = make_queries("porto", 3, len_range=(6, 10), seed=22)
    return queries, data


@pytest.fixture(scope="module")
def tiny_df(spark, tiny):
    _, data = tiny
    return trajectories_df(spark, data)


@pytest.mark.parametrize("algorithm,distance", [
    ("CMA", "DTW"),
    ("CMA", "ERP"),
    ("CMA", "EDR"),
    ("CMA", "FD"),
    ("ExactS", "DTW"),
    ("POS", "ERP"),
    ("PSS", "DTW"),
    ("Spring", "DTW"),
    ("GB", "FD"),
])
def test_distributed_equals_local(spark, tiny, tiny_df, algorithm, distance):
    queries, data = tiny
    got = (
        pairwise_search_df(spark, queries, tiny_df, algorithm, distance)
        .toPandas()
        .sort_values(["query_id", "traj_id"])
        .reset_index(drop=True)
    )
    ref = pd.DataFrame(pairwise_results(algorithm, distance, queries, data))
    ref = ref.sort_values(["query_id", "traj_id"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(
        got.astype({"start": "int64", "end": "int64"}), ref, check_dtype=False
    )


def test_topk_window_query_matches_duckdb_oracle(spark, tiny, tiny_df):
    queries, _ = tiny
    pair_df = pairwise_search_df(spark, queries, tiny_df, "CMA", "DTW").cache()
    got = topk_df(pair_df, k=2).select("query_id", "traj_id", "dist")
    assert_equivalent(
        got,
        """
        SELECT query_id, traj_id, dist FROM (
          SELECT query_id, traj_id, dist,
                 row_number() OVER (PARTITION BY query_id
                                    ORDER BY dist ASC, traj_id ASC) AS rn
          FROM pairs
        ) WHERE rn <= 2
        """,
        pairs=pair_df,
    )
    pair_df.unpersist()


def test_topk_local_matches_spark(spark, tiny, tiny_df):
    queries, data = tiny
    pair_df = pairwise_search_df(spark, queries, tiny_df, "CMA", "ERP")
    got = (
        topk_df(pair_df, k=1)
        .toPandas()
        .sort_values("query_id")
        .reset_index(drop=True)
    )
    ref = pd.DataFrame(topk(pairwise_results("CMA", "ERP", queries, data), k=1))
    pd.testing.assert_frame_equal(
        got[["query_id", "traj_id", "dist"]],
        ref[["query_id", "traj_id", "dist"]],
        check_dtype=False,
    )


def test_restricted_pairs_df_limits_search(spark, tiny, tiny_df):
    queries, data = tiny
    keep = [(0, 1), (0, 3), (2, 5)]
    pairs_df = spark.createDataFrame(keep, "query_id long, traj_id long")
    got = (
        pairwise_search_df(
            spark, queries, tiny_df, "CMA", "DTW", pairs_df=pairs_df
        )
        .toPandas()
        .sort_values(["query_id", "traj_id"])
    )
    assert sorted(zip(got.query_id, got.traj_id)) == sorted(keep)
    ref = pd.DataFrame(
        pairwise_results("CMA", "DTW", queries, data, pairs=set(keep))
    ).sort_values(["query_id", "traj_id"])
    assert np.allclose(got["dist"].to_numpy(), ref["dist"].to_numpy())


def test_explode_points_matches_duckdb(spark, tiny_df):
    exploded = explode_points(tiny_df)
    # Row-count and coordinate aggregates per trajectory vs DuckDB over the
    # same collected points (the array column itself is not orderable).
    got = exploded.groupBy("traj_id").count().withColumnRenamed("count", "n")
    pdf = exploded.toPandas()
    assert_equivalent(
        got,
        "SELECT traj_id, count(*) AS n FROM pts GROUP BY traj_id",
        pts=pdf,
    )
    assert (pdf.groupby("traj_id")["seq"].min() == 0).all()
