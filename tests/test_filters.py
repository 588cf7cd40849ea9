"""Tests for the distance lower-bound filters (Eq. 5 triangular, Eq. 6
Ptolemaic) — pure NumPy, no Spark."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.query import ptolemaic_bounds, triangular_bounds


def _setup(seed, n=40, nu=8, m=5):
    rng = np.random.default_rng(seed)
    X = rng.normal(0, 1, (n, nu))
    q = rng.normal(0, 1, nu)
    R = rng.normal(0, 1, (m, nu))
    o_rdist = np.sqrt(((X[:, None, :] - R[None, :, :]) ** 2).sum(-1))
    q_rdist = np.sqrt(((R - q) ** 2).sum(-1))
    rr = np.sqrt(((R[:, None, :] - R[None, :, :]) ** 2).sum(-1))
    true = np.sqrt(((X - q) ** 2).sum(-1))
    return q_rdist, o_rdist, rr, true


@settings(max_examples=40, deadline=None)
@given(st.integers(min_value=0, max_value=10_000))
def test_triangular_is_lower_bound(seed):
    q_rdist, o_rdist, rr, true = _setup(seed)
    lb = triangular_bounds(q_rdist, o_rdist)
    assert np.all(lb <= true + 1e-9)


@settings(max_examples=40, deadline=None)
@given(st.integers(min_value=0, max_value=10_000))
def test_ptolemaic_is_lower_bound(seed):
    """Euclidean distance respects the Ptolemaic inequality (Sec. 4.2)."""
    q_rdist, o_rdist, rr, true = _setup(seed)
    lb = ptolemaic_bounds(q_rdist, o_rdist, rr)
    assert np.all(lb <= true + 1e-9)


def test_triangular_max_over_references():
    """Eq. 5 takes the max over individual reference bounds."""
    q_rdist = np.array([1.0, 5.0])
    o_rdist = np.array([[4.0, 6.0]])
    assert triangular_bounds(q_rdist, o_rdist)[0] == pytest.approx(3.0)


def test_ptolemaic_single_pair_formula():
    """Hand check of Eq. 6 on one pair."""
    q_rdist = np.array([3.0, 4.0])
    o_rdist = np.array([[2.0, 7.0]])
    rr = np.array([[0.0, 5.0], [5.0, 0.0]])
    # |3*7 - 4*2| / 5 = 13/5
    assert ptolemaic_bounds(q_rdist, o_rdist, rr)[0] == pytest.approx(13 / 5)


def test_ptolemaic_skips_degenerate_pairs():
    q_rdist = np.array([3.0, 4.0])
    o_rdist = np.array([[2.0, 7.0]])
    rr = np.zeros((2, 2))  # coincident references
    assert ptolemaic_bounds(q_rdist, o_rdist, rr)[0] == 0.0


def test_bounds_tight_when_query_is_reference():
    """If q coincides with a reference R_i, triangular bound with R_i is
    exactly d(o, q) — the filter becomes exact (paper: the closer a
    reference is to the query, the better the approximation)."""
    rng = np.random.default_rng(0)
    X = rng.normal(0, 1, (20, 6))
    R = np.vstack([X[0] * 0 + 2.0, rng.normal(0, 1, 6)])
    q = R[0].copy()
    o_rdist = np.sqrt(((X[:, None, :] - R[None, :, :]) ** 2).sum(-1))
    q_rdist = np.sqrt(((R - q) ** 2).sum(-1))
    true = np.sqrt(((X - q) ** 2).sum(-1))
    lb = triangular_bounds(q_rdist, o_rdist)
    assert np.allclose(lb, true)


def test_ptolemaic_not_worse_than_triangular_on_average():
    """Ptolemaic bounds are tighter in aggregate (the paper's rationale for
    applying them after the cheaper triangular filter)."""
    tri_sum = pto_sum = 0.0
    for seed in range(20):
        q_rdist, o_rdist, rr, _ = _setup(seed, m=6)
        tri_sum += triangular_bounds(q_rdist, o_rdist).mean()
        pto_sum += ptolemaic_bounds(q_rdist, o_rdist, rr).mean()
    assert pto_sum >= 0.95 * tri_sum


def test_bounds_zero_for_identical_point():
    """o == q: both bounds must be 0 (they lower-bound a 0 distance)."""
    rng = np.random.default_rng(1)
    q = rng.normal(0, 1, 5)
    R = rng.normal(0, 1, (4, 5))
    q_rdist = np.sqrt(((R - q) ** 2).sum(-1))
    o_rdist = q_rdist[None, :]
    rr = np.sqrt(((R[:, None, :] - R[None, :, :]) ** 2).sum(-1))
    assert triangular_bounds(q_rdist, o_rdist)[0] == pytest.approx(0.0)
    assert ptolemaic_bounds(q_rdist, o_rdist, rr)[0] == pytest.approx(0.0, abs=1e-9)


def test_filter_funnel_ordering_effect():
    """Keeping the gamma smallest lower bounds retains the true NN more often
    than a random gamma-subset — the pruning actually works."""
    rng = np.random.default_rng(2)
    hits_lb = hits_rand = 0
    for seed in range(30):
        q_rdist, o_rdist, rr, true = _setup(seed, n=60, m=6)
        nn = int(np.argmin(true))
        gamma = 10
        keep = np.argsort(triangular_bounds(q_rdist, o_rdist))[:gamma]
        rand = rng.choice(len(true), gamma, replace=False)
        hits_lb += nn in set(keep.tolist())
        hits_rand += nn in set(rand.tolist())
    assert hits_lb > hits_rand
