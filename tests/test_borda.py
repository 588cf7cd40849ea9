"""Tests for Borda-count aggregation (Eq. 7) and the image collection."""
import numpy as np
import pandas as pd
import pytest

from repro.imagesearch.borda import borda_counts, top_images
from repro.imagesearch.dataset import make_image_collection
from repro.oracle import assert_equivalent


def test_borda_hand_example(spark):
    """One query image with 2 descriptor result lists, k=3.

    desc->image: ids 0,1 -> image A(0); ids 2,3 -> image B(1).
    r(1): [0, 2, 1] -> A: 3+1=4, B: 2
    r(2): [2, 3, 0] -> B: 3+2=5, A: 1
    totals: A=5, B=7.
    """
    knn = pd.DataFrame(
        {
            "qid": [0, 0, 0, 1, 1, 1],
            "rank": [1, 2, 3, 1, 2, 3],
            "id": [0, 2, 1, 2, 3, 0],
        }
    )
    bc = borda_counts(
        spark, knn, desc_image=np.array([0, 0, 1, 1]), query_image=np.array([0, 0]), k=3
    )
    got = {int(r["img"]): int(r["borda"]) for _, r in bc.iterrows()}
    assert got == {0: 5, 1: 7}
    assert top_images(bc, 2) == [[1, 0]]


def test_borda_matches_duckdb_oracle(spark):
    """The Spark groupBy aggregation equals the SQL formulation of Eq. 7."""
    rng = np.random.default_rng(0)
    n_desc, n_q, k = 40, 12, 5
    desc_image = rng.integers(0, 6, n_desc)
    query_image = rng.integers(0, 3, n_q)
    rows = []
    for q in range(n_q):
        ids = rng.choice(n_desc, k, replace=False)
        for r, i in enumerate(ids, 1):
            rows.append((q, r, int(i)))
    knn = pd.DataFrame(rows, columns=["qid", "rank", "id"])

    bc = borda_counts(spark, knn, desc_image, query_image, k)
    got = spark.createDataFrame(bc)
    dmap = pd.DataFrame({"id": range(n_desc), "img": desc_image})
    qmap = pd.DataFrame({"qid": range(n_q), "qimg": query_image})
    assert_equivalent(
        got,
        f"""
        SELECT q.qimg, d.img, CAST(sum({k} + 1 - r.rank) AS BIGINT) AS borda
        FROM knn r JOIN dmap d USING (id) JOIN qmap q USING (qid)
        GROUP BY q.qimg, d.img
        """,
        knn=knn,
        dmap=dmap,
        qmap=qmap,
    )


def test_top_images_tie_break(spark):
    knn = pd.DataFrame({"qid": [0, 0], "rank": [1, 2], "id": [0, 1]})
    # two images with equal counts -> smaller image id first
    bc = borda_counts(
        spark,
        pd.DataFrame({"qid": [0, 0], "rank": [1, 1], "id": [0, 1]}),
        desc_image=np.array([4, 2]),
        query_image=np.array([0]),
        k=1,
    )
    assert top_images(bc, 2) == [[2, 4]]


# --- image collection --------------------------------------------------------

def test_collection_shapes():
    col = make_image_collection(
        n_images=10, descs_per_image=5, nu=8, n_query_images=3, seed=1
    )
    assert col.X.shape == (50, 8)
    assert col.desc_image.shape == (50,)
    assert len(col.query_source) == 3
    assert col.queries.shape[0] == 15  # 3 query images x 5 descriptors
    assert set(col.query_image) == {0, 1, 2}


def test_collection_queries_near_their_source_image():
    col = make_image_collection(
        n_images=12, descs_per_image=6, nu=8, n_query_images=4, noise=0.01, seed=2
    )
    for qi, src in enumerate(col.query_source):
        qd = col.queries[col.query_image == qi]
        own = col.X[col.desc_image == src]
        other = col.X[col.desc_image != src]
        d_own = np.sqrt(((qd[:, None, :] - own[None, :, :]) ** 2).sum(-1)).min(1).mean()
        d_other = (
            np.sqrt(((qd[:, None, :] - other[None, :, :]) ** 2).sum(-1)).min(1).mean()
        )
        assert d_own < d_other


def test_collection_deterministic():
    a = make_image_collection(seed=5)
    b = make_image_collection(seed=5)
    assert np.array_equal(a.X, b.X) and np.array_equal(a.queries, b.queries)
