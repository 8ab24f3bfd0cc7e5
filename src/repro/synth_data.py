"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


# ---------------------------------------------------------------------------
# Trajectory data (similar-subtrajectory-search reproduction)
#
# The paper evaluates on Porto / Xi'an / Beijing taxi data (avg trajectory
# lengths 67 / 401 / 1705, counts 1.7M / 150K / 10K). Neither dataset ships
# offline, so we generate momentum-random-walk "taxi" trajectories inside
# each city's bounding box (km frame), with lengths and counts scaled to
# laptop scale — preserving the *relative* length ordering across cities,
# which is the axis the paper's tables vary (see DESIGN.md §4).
# ---------------------------------------------------------------------------

#: City specs: bbox (km) and scaled mean trajectory length.
CITY_SPECS = {
    "porto": {"bbox": (23.44, 24.7), "mean_len": 60, "min_len": 20, "step_km": 0.25},
    "xian": {"bbox": (33.43, 23.5), "mean_len": 140, "min_len": 60, "step_km": 0.12},
    "beijing": {"bbox": (49.80, 42.11), "mean_len": 450, "min_len": 200, "step_km": 0.35},
}


def _one_walk(g: np.random.Generator, length: int, bbox: tuple[float, float], step: float) -> np.ndarray:
    """Momentum random walk: heading diffuses, position reflects at bbox."""
    w, h = bbox
    pos = np.array([g.uniform(0.1 * w, 0.9 * w), g.uniform(0.1 * h, 0.9 * h)])
    heading = g.uniform(0, 2 * np.pi)
    pts = np.empty((length, 2))
    for i in range(length):
        pts[i] = pos
        heading += g.normal(0, 0.35)
        pos = pos + step * np.array([np.cos(heading), np.sin(heading)])
        # Reflect at the city boundary.
        for k, lim in enumerate((w, h)):
            if pos[k] < 0:
                pos[k] = -pos[k]
                heading = np.pi - heading if k == 0 else -heading
            elif pos[k] > lim:
                pos[k] = 2 * lim - pos[k]
                heading = np.pi - heading if k == 0 else -heading
    return pts


def taxi_trajectories(
    city: str,
    n: int,
    *,
    seed: int = 0,
    len_scale: float = 1.0,
    bbox_scale: float = 1.0,
) -> list[np.ndarray]:
    """``n`` synthetic taxi trajectories for ``city`` (deterministic in seed).

    ``bbox_scale`` shrinks the city frame: with trajectory *counts* scaled
    down by orders of magnitude from the real datasets, shrinking the area
    keeps the spatial density (and hence the pruning/search balance) the
    paper's experiments operate at — see DESIGN.md §4.
    """
    spec = CITY_SPECS[city]
    bbox = (spec["bbox"][0] * bbox_scale, spec["bbox"][1] * bbox_scale)
    g = _rng(seed)
    out = []
    for _ in range(n):
        length = max(
            spec["min_len"], int(g.gamma(4.0, spec["mean_len"] * len_scale / 4.0))
        )
        out.append(_one_walk(g, length, bbox, spec["step_km"]))
    return out


def make_queries(
    city: str,
    q: int,
    *,
    len_range: tuple[int, int],
    seed: int = 100,
    noise_km: float = 0.02,
    data: list[np.ndarray] | None = None,
    bbox_scale: float = 1.0,
) -> list[np.ndarray]:
    """Query trajectories, mirroring the paper's protocol (queries drawn
    from the same population as the data trajectories).

    With ``data`` given, each query is a noisy subwindow of a randomly
    chosen data trajectory — guaranteeing genuinely similar subtrajectories
    exist (what the paper gets by sampling queries from the dataset).
    Without ``data``, queries are noisy windows of fresh data-like walks.
    """
    spec = CITY_SPECS[city]
    bbox = (spec["bbox"][0] * bbox_scale, spec["bbox"][1] * bbox_scale)
    g = _rng(seed)
    lo, hi = len_range
    out = []
    for _ in range(q):
        m = int(g.integers(lo, hi + 1))
        if data is not None:
            src = data[int(g.integers(len(data)))]
            m = min(m, len(src))
            s = int(g.integers(0, len(src) - m + 1))
            out.append(src[s : s + m] + g.normal(0, noise_km, size=(m, 2)))
        else:
            walk = _one_walk(g, m + 10, bbox, spec["step_km"])
            s = int(g.integers(0, 10))
            out.append(walk[s : s + m] + g.normal(0, noise_km, size=(m, 2)))
    return out


def trajectories_df(spark: SparkSession, trajs: list[np.ndarray]) -> DataFrame:
    """Spark DataFrame ``(traj_id: long, pts: array<array<double>>)``."""
    from pyspark.sql.types import (
        ArrayType,
        DoubleType,
        LongType,
        StructField,
        StructType,
    )

    schema = StructType(
        [
            StructField("traj_id", LongType(), False),
            StructField("pts", ArrayType(ArrayType(DoubleType(), False), False), False),
        ]
    )
    rows = [(i, [[float(x), float(y)] for x, y in t]) for i, t in enumerate(trajs)]
    return spark.createDataFrame(rows, schema)


def explode_points(df: DataFrame) -> DataFrame:
    """Exploded relational view ``(traj_id, seq, x, y)`` (pure Catalyst)."""
    from pyspark.sql import functions as F

    return df.select(
        "traj_id", F.posexplode("pts").alias("seq", "pt")
    ).select(
        "traj_id",
        "seq",
        F.col("pt")[0].alias("x"),
        F.col("pt")[1].alias("y"),
    )


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )
