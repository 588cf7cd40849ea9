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


# --- high-dimensional vector datasets (HD-Index reproduction) ---------------
# The paper's datasets (Table 4) are public feature collections; offline we
# synthesise Gaussian-mixture clouds matched in dimensionality, value domain
# and dtype (SIFT/Enron are integer-valued). Clustered geometry is essential:
# uniform high-dimensional data has no neighbourhood structure and every ANN
# method collapses to chance, which would flatten the comparisons the paper
# makes. See DESIGN.md §2.


def make_vectors(
    *,
    n: int,
    nu: int,
    lo: float,
    hi: float,
    n_clusters: int = 32,
    cluster_spread: float = 0.05,
    seed: int = 0,
    integer: bool = False,
) -> np.ndarray:
    """Seeded Gaussian-mixture point cloud in ``[lo, hi]^nu``.

    ``cluster_spread`` is the within-cluster std as a fraction of the domain
    width. Points are clipped to the domain; ``integer`` rounds to ints
    (SIFT-/Enron-like features).
    """
    g = _rng(seed)
    width = hi - lo
    centers = g.uniform(lo + 0.1 * width, hi - 0.1 * width, size=(n_clusters, nu))
    assign = g.integers(0, n_clusters, size=n)
    X = centers[assign] + g.normal(0.0, cluster_spread * width, size=(n, nu))
    X = np.clip(X, lo, hi)
    if integer:
        X = np.round(X)
    return X.astype(np.float64)


def make_queries(
    X: np.ndarray,
    *,
    n_queries: int,
    lo: float,
    hi: float,
    noise: float = 0.01,
    seed: int = 100,
    integer: bool = False,
) -> np.ndarray:
    """Queries = noisy re-draws of random database points (standard ANN
    benchmark protocol; the paper reserves data points as queries)."""
    g = _rng(seed)
    idx = g.choice(len(X), size=n_queries, replace=False)
    width = hi - lo
    Q = X[idx] + g.normal(0.0, noise * width, size=(n_queries, X.shape[1]))
    Q = np.clip(Q, lo, hi)
    if integer:
        Q = np.round(Q)
    return Q.astype(np.float64)


def vectors_df(spark: SparkSession, X: np.ndarray, *, n_partitions: int | None = None) -> DataFrame:
    """Wrap a vector matrix as the canonical ``(id: long, vec: array<double>)``
    DataFrame used by every index build job in this repo."""
    pdf = pd.DataFrame({"id": np.arange(len(X), dtype=np.int64), "vec": list(X)})
    df = spark.createDataFrame(pdf)
    if n_partitions:
        df = df.repartition(n_partitions, "id")
    return df
