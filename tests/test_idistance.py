"""Tests for the iDistance baseline — it must be EXACT."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.idistance import build_idistance, knn_idistance
from repro.baselines.linear_scan import bruteforce_topk


@pytest.fixture(scope="module")
def idx(spark, tiny_df):
    return build_idistance(spark, tiny_df, n_centers=8, seed=0)


def test_build_invariants(idx, tiny_xq):
    X, _ = tiny_xq
    assert idx.centers.shape[1] == X.shape[1]
    assert idx.n == len(X)
    pdf = idx.keyed.select("id", "center_id", "cdist", "key").toPandas()
    # key decomposes back into (center, cdist)
    rec_center = np.floor(pdf["key"] / idx.key_stride)
    assert np.array_equal(rec_center.astype(int), pdf["center_id"])
    rec_d = pdf["key"] - pdf["center_id"] * idx.key_stride
    assert np.allclose(rec_d, pdf["cdist"], atol=1e-9)


def test_partition_key_ranges_disjoint(idx):
    pdf = idx.keyed.select("center_id", "key").toPandas()
    for c, grp in pdf.groupby("center_id"):
        assert grp["key"].min() >= c * idx.key_stride
        assert grp["key"].max() < (c + 0.5) * idx.key_stride


def test_cdist_is_distance_to_nearest_center(idx, tiny_xq):
    X, _ = tiny_xq
    pdf = idx.keyed.select("id", "cdist").toPandas().sample(40, random_state=0)
    d = np.sqrt(((X[:, None, :] - idx.centers[None, :, :]) ** 2).sum(-1))
    for _, row in pdf.iterrows():
        assert row["cdist"] == pytest.approx(d[int(row["id"])].min(), abs=1e-6)


def test_exactness_vs_bruteforce(idx, tiny_xq):
    """The defining property: iDistance answers are exact."""
    X, Q = tiny_xq
    got = knn_idistance(idx, Q, k=10)
    ref = bruteforce_topk(X, Q, k=10)
    pd.testing.assert_frame_equal(
        got.reset_index(drop=True), ref.reset_index(drop=True), check_dtype=False
    )


def test_exact_with_tiny_initial_radius(idx, tiny_xq):
    """Correctness must not depend on the radius schedule."""
    X, Q = tiny_xq
    got = knn_idistance(idx, Q[:3], k=5, r0=1e-4, dr=0.05)
    ref = bruteforce_topk(X, Q[:3], k=5)
    pd.testing.assert_frame_equal(
        got.reset_index(drop=True), ref.reset_index(drop=True), check_dtype=False
    )


def test_exact_when_query_is_database_point(idx, tiny_xq):
    X, _ = tiny_xq
    got = knn_idistance(idx, X[[42]], k=3)
    assert got.iloc[0]["id"] == 42 and got.iloc[0]["dist"] == pytest.approx(0.0)


def test_k_exceeds_n(idx, tiny_xq):
    X, Q = tiny_xq
    got = knn_idistance(idx, Q[:1], k=len(X) + 10)
    assert len(got) == len(X)
