"""kANN querying over HD-Index (Algo 2) as a batched Spark dataflow.

For a batch of queries the three phases of the paper map onto:

1. **candidate retrieval** — on the driver, each (query, tree) pair walks the
   fence hierarchy (B+-tree descent) to a centre leaf and widens to the
   smallest leaf window guaranteed to contain the alpha nearest-by-key
   entries; the exploded ``(tree_id, qid, leaf_id)`` probe set is
   broadcast-joined against the union of tree DataFrames, so only the probed
   leaves are scanned — the DataFrame analogue of O(log n + alpha/Omega)
   page reads. Probing metadata is tiny, hence the explicit ``broadcast``
   hint (the session default disables broadcast joins; the paper's
   contribution is the pruning, not the join algorithm).
2. **filter funnel** — per (tree, query) group, ``applyInPandas`` ranks the
   window by absolute Hilbert-key distance, keeps alpha, then applies the
   triangular bound (Eq. 5) to keep beta and optionally the Ptolemaic bound
   (Eq. 6) to keep gamma — using only the leaf-resident reference distances,
   never the vectors, exactly the paper's I/O argument.
3. **exact re-rank** — the union of per-tree gamma-sets is deduplicated,
   equi-joined (shuffle path) with the base ``(id, vec)`` table, and a final
   grouped kernel computes true Euclidean distances and the top-k.

Returns a pandas DataFrame ``(qid, rank, id, dist)`` with rank 1-based.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    LongType,
    StructField,
    StructType,
)

from repro.hilbert.curve import hilbert_keys, quantize
from repro.core.build import HDIndex

__all__ = ["knn_query", "query_hilbert_keys", "triangular_bounds", "ptolemaic_bounds"]


def query_hilbert_keys(index: HDIndex, queries: np.ndarray) -> list[np.ndarray]:
    """Hilbert key (hex) of every query in every tree's sub-space."""
    p = index.params
    out = []
    for dims in p.partitions:
        sub = queries[:, np.asarray(dims, dtype=np.int64)]
        if sub.shape[1] < p.eta:
            sub = np.hstack([sub, np.zeros((sub.shape[0], p.eta - sub.shape[1]))])
        cells = quantize(sub, p.domain_lo, p.domain_hi, p.omega)
        out.append(hilbert_keys(cells, p.omega))
    return out


def triangular_bounds(q_rdist: np.ndarray, o_rdist: np.ndarray) -> np.ndarray:
    """Eq. (5): max_i |d(q, R_i) - d(o, R_i)| for each object row.

    ``q_rdist``: (m,) query-to-reference distances; ``o_rdist``: (n, m).
    """
    return np.abs(o_rdist - q_rdist[None, :]).max(axis=1)


def ptolemaic_bounds(
    q_rdist: np.ndarray, o_rdist: np.ndarray, ref_pairwise: np.ndarray
) -> np.ndarray:
    """Eq. (6): max over reference pairs (i, j) of
    |d(q,R_i) d(o,R_j) - d(q,R_j) d(o,R_i)| / d(R_i, R_j).

    Degenerate pairs (coincident references) are skipped. O(n * m^2) as in
    the paper's cost model.
    """
    m = len(q_rdist)
    best = np.zeros(o_rdist.shape[0])
    for i in range(m):
        for j in range(i + 1, m):
            denom = ref_pairwise[i, j]
            if denom <= 0:
                continue
            lb = np.abs(q_rdist[i] * o_rdist[:, j] - q_rdist[j] * o_rdist[:, i]) / denom
            np.maximum(best, lb, out=best)
    return best


def _probe_frame(index: HDIndex, qkeys_per_tree, alpha: int) -> pd.DataFrame:
    """Driver-side B+-tree descents: one row per (tree, qid, probed leaf)."""
    rows = []
    for t, (hier, qkeys) in enumerate(zip(index.hierarchies, qkeys_per_tree)):
        for qid, qk in enumerate(qkeys):
            centre = hier.lookup(qk)
            lo, hi = hier.window(centre, alpha)
            for leaf in range(lo, hi + 1):
                rows.append((t, qid, leaf))
    return pd.DataFrame(rows, columns=["tree_id", "qid", "leaf_id"])


def knn_query(
    index: HDIndex,
    queries: np.ndarray,
    k: int,
    *,
    alpha: int | None = None,
    beta: int | None = None,
    gamma: int | None = None,
    filters: str = "tri",
    return_stats: bool = False,
):
    """Answer kANN for a batch of queries (Algo 2).

    ``filters``: 'tri' (recommended — triangular only, beta unused),
    'both' (triangular to beta then Ptolemaic to gamma), or
    'none' (all alpha candidates go to the exact phase; with alpha >= n this
    makes the query exact, used as a correctness oracle in tests).
    """
    p = index.params
    alpha = alpha if alpha is not None else p.alpha
    beta = beta if beta is not None else p.effective_beta
    gamma = gamma if gamma is not None else p.effective_gamma
    if filters not in ("tri", "both", "none"):
        raise ValueError(f"unknown filter mode {filters!r}")
    queries = np.asarray(queries, dtype=np.float64)
    if queries.ndim != 2 or queries.shape[1] != p.nu:
        raise ValueError(f"queries must be (Q, {p.nu})")
    spark = index.base.sparkSession
    sc = spark.sparkContext

    qkeys_per_tree = query_hilbert_keys(index, queries)
    q_rdist = np.sqrt(
        np.maximum(
            ((queries[:, None, :] - index.ref_vectors[None, :, :]) ** 2).sum(-1), 0.0
        )
    )  # (Q, m)

    b_q = sc.broadcast(queries)
    b_qr = sc.broadcast(q_rdist)
    b_rr = sc.broadcast(index.ref_pairwise)
    b_qkeys = sc.broadcast([list(a) for a in qkeys_per_tree])

    probe_pdf = _probe_frame(index, qkeys_per_tree, alpha)
    probe_df = spark.createDataFrame(probe_pdf)

    tree_union = None
    for t, tree in enumerate(index.trees):
        tdf = tree.withColumn("tree_id", F.lit(t))
        tree_union = tdf if tree_union is None else tree_union.unionByName(tdf)

    window_df = tree_union.join(
        F.broadcast(probe_df), on=["tree_id", "leaf_id"], how="inner"
    ).select("tree_id", "qid", "id", "hkey", "rdist")

    cand_schema = StructType(
        [StructField("qid", LongType()), StructField("id", LongType())]
    )
    mode = filters

    def funnel(key, pdf):
        tree_id, qid = int(key[0]), int(key[1])
        qk = int(b_qkeys.value[tree_id][qid], 16)
        # Key distances are exact big ints (keys can exceed 64 bits by far);
        # argsort over an object array compares them without precision loss.
        keydist = np.array(
            [abs(int(h, 16) - qk) for h in pdf["hkey"]], dtype=object
        )
        order = np.argsort(keydist, kind="stable")[:alpha]
        sel = pdf.iloc[order]
        if mode != "none":
            o_rdist = np.vstack(sel["rdist"].to_numpy())
            qr = b_qr.value[qid]
            tri = triangular_bounds(qr, o_rdist)
            if mode == "tri":
                keep = np.argsort(tri, kind="stable")[:gamma]
                sel = sel.iloc[keep]
            else:
                keep_b = np.argsort(tri, kind="stable")[:beta]
                sel_b = sel.iloc[keep_b]
                pto = ptolemaic_bounds(
                    qr, o_rdist[keep_b], b_rr.value
                )
                keep_g = np.argsort(pto, kind="stable")[:gamma]
                sel = sel_b.iloc[keep_g]
        out = pd.DataFrame({"qid": qid, "id": sel["id"].to_numpy()})
        return out.astype({"qid": "int64", "id": "int64"})

    candidates = (
        window_df.groupBy("tree_id", "qid")
        .applyInPandas(funnel, schema=cand_schema)
        .dropDuplicates(["qid", "id"])
    )

    # --- exact re-rank over the candidate union C (kappa <= tau*gamma) ----
    joined = candidates.join(index.base, on="id", how="inner")

    res_schema = StructType(
        [
            StructField("qid", LongType()),
            StructField("rank", LongType()),
            StructField("id", LongType()),
            StructField("dist", DoubleType()),
        ]
    )

    def rerank(key, pdf):
        qid = int(key[0])
        q = b_q.value[qid]
        X = np.vstack(pdf["vec"].to_numpy())
        d = np.sqrt(np.maximum(((X - q[None, :]) ** 2).sum(-1), 0.0))
        order = np.lexsort((pdf["id"].to_numpy(), d))[:k]
        return pd.DataFrame(
            {
                "qid": qid,
                "rank": np.arange(1, len(order) + 1, dtype=np.int64),
                "id": pdf["id"].to_numpy()[order],
                "dist": d[order],
            }
        )

    result = (
        joined.groupBy("qid")
        .applyInPandas(rerank, schema=res_schema)
        .orderBy("qid", "rank")
        .toPandas()
    )

    if return_stats:
        kappa = (
            candidates.groupBy("qid").count().agg(F.avg("count")).collect()[0][0]
        )
        return result, {"mean_kappa": float(kappa), "alpha": alpha, "gamma": gamma}
    return result
