"""Distributed similar-subtrajectory search (the repro's Spark dataflow).

Per the reproduction hint, the O(mn) per-pair kernel is applied as an
Arrow-backed ``mapInPandas`` UDF over partitioned trajectory data: the
(small) query set is broadcast, each partition of data trajectories runs the
numpy kernels batch-wise, and the final top-K per query is a Catalyst window
query (oracle-checked against DuckDB in tests).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.baselines.rls import RLSPolicy
from repro.search.api import search_pair

PAIR_SCHEMA = "query_id long, traj_id long, dist double, start int, end int"


def pairwise_search_df(
    spark: SparkSession,
    queries: list[np.ndarray],
    data_df: DataFrame,
    algorithm: str,
    distance: str,
    *,
    pairs_df: DataFrame | None = None,
    policy: RLSPolicy | None = None,
    num_partitions: int | None = None,
    **params,
) -> DataFrame:
    """(query_id, traj_id, dist, start, end) for every surviving pair.

    ``data_df`` is ``(traj_id, pts)``; ``pairs_df`` (optional, from the
    pruning stages) is ``(query_id, traj_id)`` and restricts the search via
    a join — a ``None`` means the full cross product with the query set.
    """
    if pairs_df is not None:
        # One row per surviving (query, trajectory) pair, spread round-robin:
        # pairs sharing a long trajectory must not serialise in one task —
        # the straggler pair, not the partition count, bounds wall-clock.
        work = data_df.join(pairs_df, "traj_id", "inner").select(
            "traj_id", "pts", F.col("query_id").alias("only_qid")
        )
        work = work.repartition(
            num_partitions or spark.sparkContext.defaultParallelism * 2
        )
    else:
        work = data_df.withColumn("only_qid", F.lit(None).cast("long"))
        if num_partitions:
            work = work.repartition(num_partitions)

    bq = spark.sparkContext.broadcast(
        [(qid, np.asarray(q, dtype=np.float64)) for qid, q in enumerate(queries)]
    )
    bp = spark.sparkContext.broadcast(policy)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        queries_local = bq.value
        policy_local = bp.value
        for pdf in batches:
            out = {"query_id": [], "traj_id": [], "dist": [], "start": [], "end": []}
            for tid, pts, only_qid in zip(
                pdf["traj_id"], pdf["pts"], pdf["only_qid"]
            ):
                d = np.asarray([np.asarray(p) for p in pts], dtype=np.float64)
                # only_qid set ⇒ this row is one (query, trajectory) pair;
                # null (None/NaN) ⇒ run every query against the trajectory.
                todo = (
                    queries_local
                    if only_qid is None or only_qid != only_qid
                    else [(int(only_qid), queries_local[int(only_qid)][1])]
                )
                for qid, q in todo:
                    dist, s, e = search_pair(
                        algorithm, distance, q, d, policy=policy_local, **params
                    )
                    out["query_id"].append(qid)
                    out["traj_id"].append(tid)
                    out["dist"].append(float(dist))
                    out["start"].append(int(s))
                    out["end"].append(int(e))
            yield pd.DataFrame(out).astype(
                {
                    "query_id": "int64",
                    "traj_id": "int64",
                    "dist": "float64",
                    "start": "int32",
                    "end": "int32",
                }
            )

    return work.mapInPandas(run, PAIR_SCHEMA)


def topk_df(pair_df: DataFrame, k: int = 1) -> DataFrame:
    """Top-K per query as a Catalyst window query (deterministic ties)."""
    w = Window.partitionBy("query_id").orderBy(F.col("dist").asc(), F.col("traj_id").asc())
    return (
        pair_df.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
        .drop("rank")
    )
