"""HD-Index construction (Algo 1) as a distributed DataFrame build job.

Pipeline per the paper, in Spark:

1. choose m reference objects (Sec. 3.3) from a driver-side sample;
2. one pass over the data computing, via a pandas UDF against the broadcast
   reference matrix, each object's distances to all references (``rdist``);
3. per dimension partition P_i, a pandas UDF quantises the sub-vector and
   emits the Hilbert key (hex, fixed width) of curve order omega;
4. per tree, rows ``(id, hkey, rdist)`` are globally sorted by key and
   bucketed into leaves of exactly Omega slots (``rdbtree.assign_leaves``),
   range-partitioned so leaf windows prune partitions; leaf fences are
   collected and folded into the driver-side ``FenceHierarchy``.

The returned :class:`HDIndex` holds the tree DataFrames (cached, and
optionally persisted to Parquet — the disk-resident form), the fence
hierarchies, the reference vectors and their pairwise distances (needed by
the Ptolemaic filter's denominators), and the base ``(id, vec)`` DataFrame
used by the final exact re-ranking step of the query.
"""
from __future__ import annotations

import os
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, functions as F
from pyspark.sql.types import ArrayType, DoubleType, StringType

from repro.hilbert.curve import hilbert_keys, key_hex_width, quantize
from repro.refsel.selection import select
from repro.core.params import HDIndexParams
from repro.core.rdbtree import FenceHierarchy, assign_leaves, leaf_fences

__all__ = ["HDIndex", "build_hd_index", "load_hd_index_trees"]

_REF_SAMPLE_CAP = 4096  # driver-side sample size for reference selection


@dataclass
class HDIndex:
    """A built HD-Index: tau trees + reference metadata + base table."""

    params: HDIndexParams
    ref_vectors: np.ndarray  # (m, nu)
    ref_pairwise: np.ndarray  # (m, m) distances between references
    trees: list  # list[DataFrame] with (id, hkey, rdist, leaf_id, slot)
    hierarchies: list  # list[FenceHierarchy]
    base: DataFrame  # (id, vec)
    n: int
    parquet_dir: str | None = None
    build_stats: dict = field(default_factory=dict)

    @property
    def key_width(self) -> int:
        return key_hex_width(self.params.eta, self.params.omega)


def _euclidean_to_refs(vec_series: pd.Series, refs: np.ndarray) -> pd.Series:
    X = np.vstack(vec_series.to_numpy())
    # (n, m) distances via the stable expansion; refs is small (m ~ 10).
    d2 = (
        (X**2).sum(axis=1, keepdims=True)
        - 2.0 * X @ refs.T
        + (refs**2).sum(axis=1)[None, :]
    )
    d = np.sqrt(np.maximum(d2, 0.0))
    return pd.Series(list(d))


def build_hd_index(
    spark: SparkSession,
    data: DataFrame,
    params: HDIndexParams,
    *,
    parquet_dir: str | None = None,
    n_partitions: int | None = None,
) -> HDIndex:
    """Run Algo 1 over ``data`` — a DataFrame with ``id: long`` and
    ``vec: array<double>`` of length ``params.nu``.

    ``parquet_dir``: when given, each tree is written to
    ``{parquet_dir}/tree_{i}`` and re-read from disk, exercising the
    disk-resident path the paper targets; otherwise trees stay as cached
    in-memory DataFrames.
    """
    sc = spark.sparkContext
    data = data.select("id", "vec")

    # --- reference objects (Sec. 3.3) -----------------------------------
    n = data.count()
    frac = min(1.0, (_REF_SAMPLE_CAP * 1.3) / max(n, 1))
    sample_pdf = (
        data.sample(fraction=frac, seed=params.seed).limit(_REF_SAMPLE_CAP).toPandas()
        if frac < 1.0
        else data.toPandas()
    )
    sample = np.vstack(sample_pdf["vec"].to_numpy())
    ref_idx = select(sample, params.m, params.ref_method, f=params.ref_f, seed=params.seed)
    refs = sample[ref_idx].astype(np.float64)
    rr = np.sqrt(
        np.maximum(
            ((refs[:, None, :] - refs[None, :, :]) ** 2).sum(-1), 0.0
        )
    )

    b_refs = sc.broadcast(refs)

    @F.pandas_udf(ArrayType(DoubleType()))
    def rdist_udf(vec: pd.Series) -> pd.Series:
        return _euclidean_to_refs(vec, b_refs.value)

    with_rdist = data.withColumn("rdist", rdist_udf("vec"))

    # --- Hilbert keys per partition (Sec. 3.1) --------------------------
    lo, hi, omega = params.domain_lo, params.domain_hi, params.omega
    trees: list[DataFrame] = []
    hierarchies: list[FenceHierarchy] = []
    pad_eta = params.eta  # pad shorter partitions so all keys share a width

    base = data.persist()
    base.count()

    for i, dims in enumerate(params.partitions):
        dims_arr = np.asarray(dims, dtype=np.int64)
        b_dims = sc.broadcast(dims_arr)

        @F.pandas_udf(StringType())
        def hkey_udf(vec: pd.Series) -> pd.Series:
            X = np.vstack(vec.to_numpy())[:, b_dims.value]
            if X.shape[1] < pad_eta:  # short last partition: zero-pad dims
                X = np.hstack([X, np.zeros((X.shape[0], pad_eta - X.shape[1]))])
            cells = quantize(X, lo, hi, omega)
            return pd.Series(hilbert_keys(cells, omega))

        tree = with_rdist.select(
            "id", hkey_udf("vec").alias("hkey"), "rdist"
        )
        tree = assign_leaves(tree, "hkey", params.leaf_order, n_partitions=n_partitions)

        if parquet_dir is not None:
            path = os.path.join(parquet_dir, f"tree_{i}")
            tree.write.mode("overwrite").parquet(path)
            tree = spark.read.parquet(path)
        else:
            tree = tree.persist()

        fences = leaf_fences(tree)
        hierarchies.append(FenceHierarchy(fences, params.branching))
        trees.append(tree)

    return HDIndex(
        params=params,
        ref_vectors=refs,
        ref_pairwise=rr,
        trees=trees,
        hierarchies=hierarchies,
        base=base,
        n=n,
        parquet_dir=parquet_dir,
        build_stats={"n": n, "m": params.m, "tau": len(params.partitions)},
    )


def load_hd_index_trees(spark: SparkSession, parquet_dir: str, tau: int) -> list[DataFrame]:
    """Re-open the persisted tree DataFrames of a previously built index."""
    return [
        spark.read.parquet(os.path.join(parquet_dir, f"tree_{i}")) for i in range(tau)
    ]
