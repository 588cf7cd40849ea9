"""Tests for reference-object selection (repro.refsel.selection)."""
import numpy as np
import pytest

from repro.refsel.selection import (
    estimate_dmax,
    select,
    select_random,
    select_sss,
    select_sss_dyn,
)


@pytest.fixture(scope="module")
def cloud():
    rng = np.random.default_rng(42)
    centers = rng.normal(0, 10, size=(5, 8))
    X = np.concatenate([c + rng.normal(0, 1, size=(80, 8)) for c in centers])
    return X


def test_dmax_close_to_true_diameter(cloud):
    est = estimate_dmax(cloud, seed=0)
    d2 = ((cloud[:, None, :] - cloud[None, :, :]) ** 2).sum(-1)
    true = float(np.sqrt(d2.max()))
    assert est <= true + 1e-9
    assert est >= 0.8 * true  # farthest-point walk is a good heuristic here


def test_dmax_deterministic(cloud):
    assert estimate_dmax(cloud, seed=3) == estimate_dmax(cloud, seed=3)


def test_random_selection_distinct_and_seeded(cloud):
    a = select_random(cloud, 10, seed=1)
    b = select_random(cloud, 10, seed=1)
    c = select_random(cloud, 10, seed=2)
    assert len(set(a.tolist())) == 10
    assert np.array_equal(a, b)
    assert not np.array_equal(a, c)


def test_random_rejects_m_gt_n():
    with pytest.raises(ValueError):
        select_random(np.zeros((3, 2)), 5)


def test_sss_returns_m_distinct(cloud):
    idx = select_sss(cloud, 10, seed=0)
    assert len(idx) == 10
    assert len(set(idx.tolist())) == 10


def test_sss_pairwise_separation(cloud):
    """All chosen pivots (beyond the first) are > f*dmax apart — the SSS invariant."""
    f = 0.3
    dmax = estimate_dmax(cloud, seed=0)
    idx = select_sss(cloud, 6, f=f, seed=0, dmax=dmax)
    P = cloud[idx]
    d = np.sqrt(((P[:, None, :] - P[None, :, :]) ** 2).sum(-1))
    off = d[~np.eye(len(P), dtype=bool)]
    assert off.min() > f * dmax * 0.49  # allow the geometric relaxation fallback


def test_sss_relaxes_when_f_infeasible(cloud):
    """With f close to 1 almost nothing qualifies; selection must still return m."""
    idx = select_sss(cloud, 8, f=0.99, seed=0)
    assert len(set(idx.tolist())) == 8


def test_sss_on_duplicate_heavy_data():
    X = np.zeros((50, 4))
    X[0] = 1.0
    idx = select_sss(X, 5, seed=0)
    assert len(set(idx.tolist())) == 5


def test_sss_deterministic(cloud):
    assert np.array_equal(select_sss(cloud, 7, seed=9), select_sss(cloud, 7, seed=9))


def test_sss_dyn_returns_m_distinct(cloud):
    idx = select_sss_dyn(cloud, 8, seed=0, max_extra=32)
    assert len(idx) == 8
    assert len(set(idx.tolist())) == 8


def test_sss_dyn_not_worse_than_sss_on_probe_pairs(cloud):
    """SSS-Dyn optimises mean pairwise lower-bound contribution; its pivot set
    should be at least as good as plain SSS on that objective (paper: little
    or no improvement — but never a regression on its own objective)."""
    from repro.refsel.selection import _pair_contribution

    rng = np.random.default_rng(0)
    pairs = [(int(a), int(b)) for a, b in rng.integers(0, len(cloud), (64, 2)) if a != b]
    sss = select_sss(cloud, 6, seed=0)
    dyn = select_sss_dyn(cloud, 6, seed=0, max_extra=64)
    c_sss = _pair_contribution(cloud, list(sss), pairs).min()
    c_dyn = _pair_contribution(cloud, list(dyn), pairs).min()
    assert c_dyn >= c_sss * 0.95


def test_dispatch(cloud):
    for method in ("random", "sss", "sss_dyn"):
        assert len(select(cloud, 4, method, seed=0)) == 4
    with pytest.raises(ValueError):
        select(cloud, 4, "kmeans")
