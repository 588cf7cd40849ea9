"""OPQ (Ge, He, Ke, Sun; CVPR 2013) — optimised product quantisation.

Product quantisation splits the (rotated) space into M sub-spaces, runs
k-means with ksub centroids in each, and stores per point only the M
centroid indices. OPQ additionally learns an orthonormal rotation R by
alternating (a) sub-space k-means on the rotated data and (b) the
orthogonal-Procrustes update R = U V^T from the SVD of X^T X_hat — the
non-parametric OPQ of the paper.

Training happens driver-side on (a sample of) the data — OPQ is an
in-memory technique in HD-Index's classification (Sec. 2.2.5) — while code
assignment and the exhaustive ADC (asymmetric distance) scan are Spark
jobs over the code table. With the paper's setting M=2 a point is encoded
in 2 bytes, which is why HD-Index's Table 5 reports MAPs thousands of
times worse for OPQ: that shape is reproduced, not a bug.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, functions as F
from pyspark.sql.types import ArrayType, DoubleType, LongType, StructField, StructType

from repro.baselines.kmeans import kmeans

__all__ = ["OPQIndex", "build_opq", "knn_opq"]

_TRAIN_CAP = 20_000


@dataclass
class OPQIndex:
    R: np.ndarray  # (nu, nu) orthonormal rotation
    codebooks: list  # M arrays of (ksub, d_m)
    splits: list  # M index arrays into rotated dims
    codes: DataFrame  # (id, code: array<long>)
    base: DataFrame
    n: int


def _sub_splits(nu: int, M: int) -> list[np.ndarray]:
    return [np.asarray(s) for s in np.array_split(np.arange(nu), M)]


def build_opq(
    spark: SparkSession,
    data: DataFrame,
    *,
    M: int = 2,
    ksub: int = 256,
    opq_iters: int = 5,
    kmeans_iters: int = 10,
    seed: int = 0,
) -> OPQIndex:
    n = data.count()
    frac = min(1.0, _TRAIN_CAP * 1.3 / max(n, 1))
    train_pdf = (
        data.sample(fraction=frac, seed=seed).limit(_TRAIN_CAP).toPandas()
        if frac < 1.0
        else data.toPandas()
    )
    X = np.vstack(train_pdf["vec"].to_numpy())
    nu = X.shape[1]
    ksub = min(ksub, len(X))
    splits = _sub_splits(nu, M)

    R = np.eye(nu)
    codebooks = [None] * M
    for it in range(opq_iters):
        Z = X @ R
        Xhat = np.empty_like(Z)
        for mi, dims in enumerate(splits):
            centers, labels = kmeans(
                Z[:, dims], ksub, iters=kmeans_iters, seed=seed + 17 * mi
            )
            codebooks[mi] = centers
            Xhat[:, dims] = centers[labels]
        if it < opq_iters - 1:
            # orthogonal Procrustes: R minimising ||X R - Xhat||_F
            U, _, Vt = np.linalg.svd(X.T @ Xhat)
            R = U @ Vt

    sc = spark.sparkContext
    b_R = sc.broadcast(R)
    b_books = sc.broadcast(codebooks)
    b_splits = sc.broadcast(splits)

    @F.pandas_udf(ArrayType(LongType()))
    def code_udf(vec: pd.Series) -> pd.Series:
        Xb = np.vstack(vec.to_numpy()) @ b_R.value
        cols = []
        for mi, dims in enumerate(b_splits.value):
            C = b_books.value[mi]
            sub = Xb[:, dims]
            d2 = (
                (sub**2).sum(1)[:, None]
                - 2.0 * sub @ C.T
                + (C**2).sum(1)[None, :]
            )
            cols.append(d2.argmin(1))
        return pd.Series(list(np.stack(cols, axis=1).astype(np.int64)))

    codes = data.select("id", code_udf("vec").alias("code")).persist()
    codes.count()
    return OPQIndex(R, codebooks, splits, codes, data.select("id", "vec"), n)


def knn_opq(index: OPQIndex, queries: np.ndarray, k: int) -> pd.DataFrame:
    """Exhaustive ADC scan: approximate distances from the per-query lookup
    tables, top-k by approximate distance, true distances reported for the
    selected ids (the evaluation convention for all methods here)."""
    queries = np.asarray(queries, dtype=np.float64)
    spark = index.codes.sparkSession
    sc = spark.sparkContext

    # per-query LUT: (Q, M, ksub) squared distances to every centroid
    Zq = queries @ index.R
    luts = np.stack(
        [
            np.stack(
                [
                    ((index.codebooks[mi] - Zq[qi, dims][None, :]) ** 2).sum(1)
                    for mi, dims in enumerate(index.splits)
                ]
            )
            for qi in range(len(queries))
        ]
    )
    b_lut = sc.broadcast(luts)

    schema = StructType(
        [
            StructField("qid", LongType()),
            StructField("id", LongType()),
            StructField("adist", DoubleType()),
        ]
    )

    def scan(batches):
        lut = b_lut.value  # (Q, M, ksub)
        Q = lut.shape[0]
        for pdf in batches:
            if pdf.empty:
                continue
            C = np.vstack(pdf["code"].to_numpy())  # (b, M)
            ids = pdf["id"].to_numpy()
            frames = []
            for qi in range(Q):
                ad = np.zeros(len(C))
                for mi in range(lut.shape[1]):
                    ad += lut[qi, mi][C[:, mi]]
                kk = min(k, len(ad))
                sel = np.argpartition(ad, kk - 1)[:kk]
                frames.append(
                    pd.DataFrame({"qid": qi, "id": ids[sel], "adist": ad[sel]})
                )
            yield pd.concat(frames, ignore_index=True)

    partials = index.codes.mapInPandas(scan, schema).toPandas()
    chosen = []
    for qid, grp in partials.groupby("qid"):
        chosen.append(grp.sort_values(["adist", "id"], kind="mergesort").head(k))
    chosen = pd.concat(chosen, ignore_index=True)

    # true distances of the chosen ids (small join)
    from repro.baselines.lsh_common import exact_check

    dists = exact_check(index.base, chosen[["qid", "id"]], queries)
    merged = chosen[["qid", "id", "adist"]].merge(dists, on=["qid", "id"])
    out = []
    for qid in range(len(queries)):
        g = merged[merged["qid"] == qid].sort_values(
            ["adist", "id"], kind="mergesort"
        ).head(k)
        out.append(
            pd.DataFrame(
                {
                    "qid": qid,
                    "rank": np.arange(1, len(g) + 1, dtype=np.int64),
                    "id": g["id"].to_numpy(),
                    "dist": g["dist"].to_numpy(),
                }
            )
        )
    return pd.concat(out, ignore_index=True)
