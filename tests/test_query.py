"""End-to-end tests for the HD-Index kANN query pipeline (Algo 2)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.linear_scan import bruteforce_topk
from repro.core.query import knn_query, query_hilbert_keys
from repro.metrics import map_at_k, recall_at_k


def _lists(df):
    return [g.sort_values("rank")["id"].tolist() for _, g in df.groupby("qid")]


def test_exact_when_alpha_covers_all_and_no_filters(tiny_index, tiny_xq):
    """alpha >= n with filters off degenerates to exact kNN — equals brute
    force row-for-row. This is the correctness oracle for the whole
    retrieval/re-rank dataflow."""
    X, Q = tiny_xq
    got = knn_query(tiny_index, Q, k=10, alpha=len(X), filters="none")
    ref = bruteforce_topk(X, Q, k=10)
    pd.testing.assert_frame_equal(
        got.reset_index(drop=True), ref.reset_index(drop=True), check_dtype=False
    )


def test_default_pipeline_high_recall_on_clustered_data(tiny_index, tiny_xq, tiny_truth):
    X, Q = tiny_xq
    got = knn_query(tiny_index, Q, k=10, alpha=64, gamma=32)
    truth = _lists(tiny_truth)
    mine = _lists(got)
    m = map_at_k(mine, truth, 10)
    assert m > 0.7, f"MAP@10 too low: {m}"


def test_ptolemaic_filter_not_worse_than_triangular(tiny_index, tiny_xq, tiny_truth):
    """Sec. 5.2.5: tri+Ptolemaic MAP >= tri-only MAP under heavy reduction."""
    X, Q = tiny_xq
    truth = _lists(tiny_truth)
    tri = knn_query(tiny_index, Q, k=10, alpha=64, gamma=8, filters="tri")
    both = knn_query(tiny_index, Q, k=10, alpha=64, beta=64, gamma=8, filters="both")
    m_tri = map_at_k(_lists(tri), truth, 10)
    m_both = map_at_k(_lists(both), truth, 10)
    assert m_both >= m_tri - 0.05


def test_results_sorted_and_k_rows(tiny_index, tiny_xq):
    _, Q = tiny_xq
    got = knn_query(tiny_index, Q, k=7)
    for qid, grp in got.groupby("qid"):
        assert grp["rank"].tolist() == list(range(1, 8))
        d = grp.sort_values("rank")["dist"].to_numpy()
        assert (np.diff(d) >= -1e-12).all()
    assert set(got["qid"]) == set(range(len(Q)))


def test_distances_are_true_euclidean(tiny_index, tiny_xq):
    X, Q = tiny_xq
    got = knn_query(tiny_index, Q[:2], k=5)
    for _, row in got.iterrows():
        true = float(np.sqrt(((X[int(row["id"])] - Q[int(row["qid"])]) ** 2).sum()))
        assert row["dist"] == pytest.approx(true, abs=1e-9)


def test_self_query_found(tiny_index, tiny_xq):
    """A database point used as query must return itself first (its Hilbert
    key matches exactly, so it always survives candidate retrieval)."""
    X, _ = tiny_xq
    got = knn_query(tiny_index, X[[5, 123]], k=3, alpha=32, gamma=16)
    first = got[got["rank"] == 1].sort_values("qid")
    assert first["id"].tolist() == [5, 123]
    assert np.allclose(first["dist"], 0.0)


def test_kappa_bounds(tiny_index, tiny_xq):
    """gamma <= kappa <= tau * gamma (Sec. 4.2)."""
    _, Q = tiny_xq
    tau = tiny_index.params.tau
    _, stats = knn_query(
        tiny_index, Q, k=5, alpha=64, gamma=16, return_stats=True
    )
    assert 16 <= stats["mean_kappa"] <= tau * 16


def test_stats_alpha_gamma_echo(tiny_index, tiny_xq):
    _, Q = tiny_xq
    _, stats = knn_query(tiny_index, Q[:2], k=3, alpha=48, gamma=12, return_stats=True)
    assert stats["alpha"] == 48 and stats["gamma"] == 12


def test_query_validation(tiny_index):
    with pytest.raises(ValueError):
        knn_query(tiny_index, np.zeros((2, 3)), k=5)  # wrong dimensionality
    with pytest.raises(ValueError):
        knn_query(tiny_index, np.zeros((2, 16)), k=5, filters="banana")


def test_query_hilbert_keys_shape(tiny_index, tiny_xq):
    _, Q = tiny_xq
    keys = query_hilbert_keys(tiny_index, Q)
    assert len(keys) == tiny_index.params.tau
    assert all(len(kk) == len(Q) for kk in keys)


def test_increasing_alpha_improves_map(tiny_index, tiny_xq, tiny_truth):
    """Fig. 7 shape: MAP grows (weakly) with alpha."""
    _, Q = tiny_xq
    truth = _lists(tiny_truth)
    maps = []
    for alpha in (8, 64, 600):
        got = knn_query(tiny_index, Q, k=10, alpha=alpha, gamma=max(2, alpha // 4))
        maps.append(map_at_k(_lists(got), truth, 10))
    assert maps[0] <= maps[1] + 0.05
    assert maps[1] <= maps[2] + 0.05
    assert maps[2] > 0.9


def test_single_query_batch(tiny_index, tiny_xq):
    _, Q = tiny_xq
    got = knn_query(tiny_index, Q[:1], k=4)
    assert len(got) == 4
