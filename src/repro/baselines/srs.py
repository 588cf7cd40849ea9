"""SRS (Sun, Wang, Qin, Zhang, Lin; PVLDB 2014) — tiny-index projection search.

SRS projects every point into an m'-dimensional space (m'=6 2-stable
Gaussian projections — the entire index is just n * 6 floats, the paper's
"tiny index" point), then answers a query by *incremental kNN in the
projected space*: points are examined in increasing projected distance;
each examined point gets an exact distance check; the scan stops after
t*n points (the examined-fraction budget) or when the early-termination
test holds — the projected distance of the next unexamined point is
already so large that, under the chi-squared distribution of
||proj(x-q)||^2 / d(x,q)^2, the chance of it beating the current k-th
exact neighbour within ratio c is below the threshold tau'.

Our realisation computes the projected distances with one Spark pass,
keeps the t*n-smallest per query (that is exactly the maximal scan
prefix), and replays the ordered scan with the stopping rule in a pandas
kernel — result-identical to the R-tree incremental search of the authors'
code (DESIGN.md deviation #5).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, functions as F
from pyspark.sql.types import ArrayType, DoubleType, LongType, StructField, StructType

__all__ = ["SRSIndex", "build_srs", "knn_srs"]

# chi^2 inverse CDF at the paper's early-termination threshold tau'=0.1809
# for m'=6 degrees of freedom (precomputed; no scipy in the container).
_CHI2_Q_TAU_M6 = 2.9046


@dataclass
class SRSIndex:
    A: np.ndarray  # (m', nu)
    projected: DataFrame  # (id, p: array<double>)
    base: DataFrame
    n: int
    m_proj: int


def build_srs(
    spark: SparkSession, data: DataFrame, *, m_proj: int = 6, seed: int = 2
) -> SRSIndex:
    rng = np.random.default_rng(seed)
    nu = len(data.select("vec").first()["vec"])
    A = rng.normal(0.0, 1.0, size=(m_proj, nu))
    b_A = spark.sparkContext.broadcast(A)

    @F.pandas_udf(ArrayType(DoubleType()))
    def proj_udf(vec: pd.Series) -> pd.Series:
        X = np.vstack(vec.to_numpy())
        return pd.Series(list(X @ b_A.value.T))

    projected = data.select("id", proj_udf("vec").alias("p")).persist()
    n = projected.count()
    return SRSIndex(A, projected, data.select("id", "vec"), n, m_proj)


def knn_srs(
    index: SRSIndex,
    queries: np.ndarray,
    k: int,
    *,
    t: float = 0.00242,
    c: float = 2.0,
    min_examined: int = 200,
) -> pd.DataFrame:
    """kANN via ordered projected scan with SRS-12 early termination.

    ``t`` is the paper's maximum examined fraction; a floor of
    ``min_examined`` points keeps tiny datasets meaningful (the authors set
    t for million-point datasets; t*n < k otherwise).
    """
    queries = np.asarray(queries, dtype=np.float64)
    spark = index.projected.sparkSession
    sc = spark.sparkContext
    budget = max(min_examined, int(np.ceil(t * index.n)), k)

    QP = queries @ index.A.T  # (Q, m')
    b_qp = sc.broadcast(QP)

    pd_schema = StructType(
        [
            StructField("qid", LongType()),
            StructField("id", LongType()),
            StructField("pdist", DoubleType()),
        ]
    )

    def proj_dists(batches):
        qp = b_qp.value
        for pdf in batches:
            if pdf.empty:
                continue
            P = np.vstack(pdf["p"].to_numpy())  # (b, m')
            d2 = (
                (P**2).sum(1)[:, None]
                - 2.0 * P @ qp.T
                + (qp**2).sum(1)[None, :]
            )  # (b, Q)
            d = np.sqrt(np.maximum(d2, 0.0))
            kk = min(budget + 1, d.shape[0])
            ids = pdf["id"].to_numpy()
            frames = []
            for qi in range(d.shape[1]):
                sel = np.argpartition(d[:, qi], kk - 1)[:kk]
                frames.append(
                    pd.DataFrame(
                        {"qid": qi, "id": ids[sel], "pdist": d[sel, qi]}
                    )
                )
            yield pd.concat(frames, ignore_index=True)

    partials = index.projected.mapInPandas(proj_dists, pd_schema)
    # keep the (budget+1)-smallest projected distances per query: budget
    # points may be examined, the +1 drives the early-termination test.
    prefix = []
    pp = partials.toPandas()
    for qid, grp in pp.groupby("qid"):
        prefix.append(
            grp.sort_values(["pdist", "id"], kind="mergesort").head(budget + 1)
        )
    prefix = pd.concat(prefix, ignore_index=True)

    # exact distances for the prefix
    b_q = sc.broadcast(queries)
    pairs_df = spark.createDataFrame(prefix[["qid", "id", "pdist"]])
    joined = index.base.join(F.broadcast(pairs_df), on="id").select(
        "qid", "id", "pdist", "vec"
    )

    res_schema = StructType(
        [
            StructField("qid", LongType()),
            StructField("id", LongType()),
            StructField("pdist", DoubleType()),
            StructField("dist", DoubleType()),
        ]
    )

    def exact(batches):
        Q = b_q.value
        for pdf in batches:
            if pdf.empty:
                continue
            X = np.vstack(pdf["vec"].to_numpy())
            qs = pdf["qid"].to_numpy()
            d = np.sqrt(np.maximum(((X - Q[qs]) ** 2).sum(-1), 0.0))
            yield pd.DataFrame(
                {
                    "qid": qs,
                    "id": pdf["id"].to_numpy(),
                    "pdist": pdf["pdist"].to_numpy(),
                    "dist": d,
                }
            )

    scanned = joined.mapInPandas(exact, res_schema).toPandas()

    out = []
    for qid in range(len(queries)):
        g = scanned[scanned["qid"] == qid].sort_values(
            ["pdist", "id"], kind="mergesort"
        )
        pdists = g["pdist"].to_numpy()
        dists = g["dist"].to_numpy()
        # replay the ordered scan with the SRS-12 stopping rule
        stop = min(budget, len(g))
        kth = np.inf
        heap_d: list[float] = []
        for i in range(len(g)):
            if i >= budget:
                stop = budget
                break
            heap_d.append(dists[i])
            if len(heap_d) >= k:
                kth = np.sort(np.asarray(heap_d))[k - 1]
                # early termination: next projected distance too large
                if i + 1 < len(pdists) and pdists[i + 1] ** 2 > (
                    _CHI2_Q_TAU_M6 * (c * kth) ** 2
                ):
                    stop = i + 1
                    break
        gg = g.head(stop).sort_values(["dist", "id"], kind="mergesort").head(k)
        out.append(
            pd.DataFrame(
                {
                    "qid": qid,
                    "rank": np.arange(1, len(gg) + 1, dtype=np.int64),
                    "id": gg["id"].to_numpy(),
                    "dist": gg["dist"].to_numpy(),
                }
            )
        )
    return pd.concat(out, ignore_index=True)
