"""Borda-count aggregation (Eq. 7 / Appendix C) as a Spark aggregation.

Each query-image descriptor's kANN result list r(j, q) awards database image
i a score (k + 1 - l) for every of i's descriptors found at position l; the
scores summed over all of q's descriptor result lists are the Borda count
BC(i, q), and the top images by count are the image-level answer.

The aggregation is a join (result rows -> descriptor-to-image map) followed
by a groupBy sum — expressed in Spark SQL so it runs over arbitrarily large
result sets, and cross-checked against a DuckDB SQL oracle in tests.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession, functions as F

__all__ = ["borda_counts", "top_images"]


def borda_counts(
    spark: SparkSession,
    knn: pd.DataFrame,
    desc_image: np.ndarray,
    query_image: np.ndarray,
    k: int,
) -> pd.DataFrame:
    """Borda counts per (query image, database image).

    ``knn``: descriptor-level results (qid, rank, id, ...) with qid indexing
    query *descriptors*; ``desc_image[id]`` maps a database descriptor to its
    image; ``query_image[qid]`` maps a query descriptor to its query image.
    Returns a pandas frame (qimg, img, borda) sorted by (qimg, -borda, img).
    """
    res = spark.createDataFrame(knn[["qid", "rank", "id"]])
    dmap = spark.createDataFrame(
        pd.DataFrame(
            {
                "id": np.arange(len(desc_image), dtype=np.int64),
                "img": np.asarray(desc_image, dtype=np.int64),
            }
        )
    )
    qmap = spark.createDataFrame(
        pd.DataFrame(
            {
                "qid": np.arange(len(query_image), dtype=np.int64),
                "qimg": np.asarray(query_image, dtype=np.int64),
            }
        )
    )
    out = (
        res.join(F.broadcast(dmap), on="id")
        .join(F.broadcast(qmap), on="qid")
        .withColumn("score", F.lit(k + 1) - F.col("rank"))
        .groupBy("qimg", "img")
        .agg(F.sum("score").alias("borda"))
        .toPandas()
    )
    return out.sort_values(
        ["qimg", "borda", "img"], ascending=[True, False, True]
    ).reset_index(drop=True)


def top_images(bc: pd.DataFrame, k_img: int) -> list[list[int]]:
    """Per query image, the k_img database images with the largest Borda
    counts (ties broken by image id) — the image-level ranked answer."""
    out = []
    for qimg in sorted(bc["qimg"].unique()):
        g = bc[bc["qimg"] == qimg]
        out.append(g.head(k_img)["img"].tolist() if len(g) else [])
    return out
