"""Driver-side reference search over a set of data trajectories.

This is the sequential counterpart of :mod:`repro.search.distributed` — the
same per-pair kernels, no Spark. It validates the distributed path in tests
and is used wherever the paper's sequential search semantics (KPF's
best-so-far pruning) need a faithful driver loop.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.rls import RLSPolicy
from repro.search.api import search_pair


def pairwise_results(
    algorithm: str,
    distance: str,
    queries: list[np.ndarray],
    data: list[np.ndarray],
    *,
    pairs: set[tuple[int, int]] | None = None,
    policy: RLSPolicy | None = None,
    **params,
) -> list[dict]:
    """Best subtrajectory per (query, data trajectory) pair.

    ``pairs`` restricts evaluation to surviving (query_id, traj_id) pairs
    (the pruning stages produce this set); ``None`` means all pairs.
    """
    rows = []
    for qid, q in enumerate(queries):
        for tid, d in enumerate(data):
            if pairs is not None and (qid, tid) not in pairs:
                continue
            dist, s, e = search_pair(
                algorithm, distance, q, d, policy=policy, **params
            )
            rows.append(
                {
                    "query_id": qid,
                    "traj_id": tid,
                    "dist": float(dist),
                    "start": int(s),
                    "end": int(e),
                }
            )
    return rows


def topk(rows: list[dict], k: int = 1) -> list[dict]:
    """Top-K most similar subtrajectories per query (paper Def. 6 / App. E).

    Deterministic tie-break on (dist, traj_id) so the Spark window query and
    the DuckDB oracle agree row-for-row.
    """
    out: list[dict] = []
    by_query: dict[int, list[dict]] = {}
    for r in rows:
        by_query.setdefault(r["query_id"], []).append(r)
    for qid in sorted(by_query):
        ranked = sorted(by_query[qid], key=lambda r: (r["dist"], r["traj_id"]))
        out.extend(ranked[:k])
    return out
