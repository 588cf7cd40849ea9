"""Tests for the k-means substrate."""
import numpy as np
import pytest

from repro.baselines.kmeans import kmeans


def _blobs(seed=0, k=4, per=50, d=6, spread=0.05):
    rng = np.random.default_rng(seed)
    centers = rng.uniform(0, 1, (k, d))
    X = np.concatenate([c + rng.normal(0, spread, (per, d)) for c in centers])
    return X, centers


def test_shapes_and_label_range():
    X, _ = _blobs()
    C, lab = kmeans(X, 4, seed=0)
    assert C.shape == (4, X.shape[1])
    assert lab.shape == (len(X),)
    assert set(np.unique(lab)) <= set(range(4))


def test_recovers_separated_blobs():
    X, true = _blobs(seed=1, spread=0.02)
    C, lab = kmeans(X, 4, seed=0)
    # every true centre has a learned centre nearby
    for t in true:
        assert np.sqrt(((C - t) ** 2).sum(1)).min() < 0.1


def test_labels_are_nearest_center():
    X, _ = _blobs(seed=2)
    C, lab = kmeans(X, 4, seed=0)
    d2 = ((X[:, None, :] - C[None, :, :]) ** 2).sum(-1)
    assert np.array_equal(lab, d2.argmin(1))


def test_deterministic():
    X, _ = _blobs(seed=3)
    C1, l1 = kmeans(X, 5, seed=9)
    C2, l2 = kmeans(X, 5, seed=9)
    assert np.allclose(C1, C2) and np.array_equal(l1, l2)


def test_k_equals_n():
    X = np.random.default_rng(0).random((7, 3))
    C, lab = kmeans(X, 7, seed=0)
    assert len(np.unique(lab)) == 7  # every point its own cluster


def test_no_empty_clusters_on_duplicates():
    X = np.zeros((30, 4))
    X[:3] += 1.0
    C, lab = kmeans(X, 3, seed=0)
    assert C.shape == (3, 4)


def test_validation():
    X = np.zeros((5, 2))
    with pytest.raises(ValueError):
        kmeans(X, 0)
    with pytest.raises(ValueError):
        kmeans(X, 6)
