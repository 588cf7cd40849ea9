"""Exact kNN by distributed linear scan — the ground-truth generator.

The paper uses linear scan both as the accuracy oracle (MAP/ratio ground
truth) and as the efficiency strawman iDistance degenerates to. Here it is a
single ``mapInPandas`` pass: each partition computes its local top-k per
query against the broadcast query matrix, and the driver merges the
per-partition heaps — O(n * nu) work, O(P * Q * k) merge.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import DoubleType, LongType, StructField, StructType

__all__ = ["knn_linear_scan", "bruteforce_topk"]

_PARTIAL_SCHEMA = StructType(
    [
        StructField("qid", LongType()),
        StructField("id", LongType()),
        StructField("dist", DoubleType()),
    ]
)


def bruteforce_topk(X: np.ndarray, queries: np.ndarray, k: int) -> pd.DataFrame:
    """NumPy reference implementation: (qid, rank, id, dist), rank 1-based.

    Ties on distance are broken by ascending id — the convention every
    method in this repo follows so exact methods are comparable row-for-row.
    """
    rows = []
    for qid, q in enumerate(np.asarray(queries, dtype=np.float64)):
        d = np.sqrt(np.maximum(((X - q[None, :]) ** 2).sum(-1), 0.0))
        order = np.lexsort((np.arange(len(X)), d))[:k]
        for r, i in enumerate(order, start=1):
            rows.append((qid, r, int(i), float(d[i])))
    return pd.DataFrame(rows, columns=["qid", "rank", "id", "dist"])


def knn_linear_scan(data: DataFrame, queries: np.ndarray, k: int) -> pd.DataFrame:
    """Exact kNN of every query against ``data`` (id, vec) via full scan.

    Returns (qid, rank, id, dist) with rank 1-based, ties broken by id.
    """
    queries = np.asarray(queries, dtype=np.float64)
    sc = data.sparkSession.sparkContext
    b_q = sc.broadcast(queries)

    def local_topk(batches):
        for pdf in batches:
            if pdf.empty:
                continue
            X = np.vstack(pdf["vec"].to_numpy())
            ids = pdf["id"].to_numpy()
            Q = b_q.value
            # (Q, b) distance block via the stable expansion
            d2 = (
                (Q**2).sum(1, keepdims=True)
                - 2.0 * Q @ X.T
                + (X**2).sum(1)[None, :]
            )
            d = np.sqrt(np.maximum(d2, 0.0))
            kk = min(k, d.shape[1])
            part = np.argpartition(d, kk - 1, axis=1)[:, :kk]
            out_q, out_i, out_d = [], [], []
            for qi in range(d.shape[0]):
                sel = part[qi]
                out_q.extend([qi] * len(sel))
                out_i.extend(ids[sel])
                out_d.extend(d[qi, sel])
            yield pd.DataFrame({"qid": out_q, "id": out_i, "dist": out_d})

    partials = data.select("id", "vec").mapInPandas(local_topk, _PARTIAL_SCHEMA).toPandas()
    out = []
    for qid, grp in partials.groupby("qid"):
        g = grp.sort_values(["dist", "id"], kind="mergesort").head(k)
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
    return (
        pd.concat(out, ignore_index=True)
        if out
        else pd.DataFrame(columns=["qid", "rank", "id", "dist"])
    )
