"""Tests for repro.metrics — includes the paper's worked Example 1."""
import numpy as np
import pytest

from repro.metrics import (
    approximation_ratio,
    average_precision_at_k,
    map_at_k,
    recall_at_k,
)


def test_paper_example1_ap_first_ordering():
    """A1 = {o4, o3, o2} against truth {o1, o2, o3}: AP = (0 + 1/2 + 2/3)/3."""
    ap = average_precision_at_k(["o4", "o3", "o2"], ["o1", "o2", "o3"], k=3)
    assert ap == pytest.approx((0 + 1 / 2 + 2 / 3) / 3)
    assert round(ap, 2) == 0.39


def test_paper_example1_ap_second_ordering():
    """A2 = {o3, o2, o4}: AP = (1 + 1 + 0)/3 = 0.67."""
    ap = average_precision_at_k(["o3", "o2", "o4"], ["o1", "o2", "o3"], k=3)
    assert ap == pytest.approx(2 / 3)


def test_paper_example1_map():
    m = map_at_k(
        [["o4", "o3", "o2"], ["o3", "o2", "o4"]],
        [["o1", "o2", "o3"], ["o1", "o2", "o3"]],
        k=3,
    )
    assert round(m, 2) == 0.53


def test_ap_perfect_retrieval():
    assert average_precision_at_k([1, 2, 3], [1, 2, 3], 3) == 1.0


def test_ap_perfect_set_wrong_order_less_than_one():
    ap = average_precision_at_k([3, 2, 1], [1, 2, 3], 3)
    assert ap == 1.0  # all relevant at every rank -> precision j/i = 1 each


def test_ap_rewards_early_hits():
    early = average_precision_at_k([1, 9, 8], [1, 2, 3], 3)
    late = average_precision_at_k([9, 8, 1], [1, 2, 3], 3)
    assert early > late


def test_ap_no_hits_zero():
    assert average_precision_at_k([7, 8, 9], [1, 2, 3], 3) == 0.0


def test_ap_truncates_to_k():
    # items past rank k are ignored on both sides
    assert average_precision_at_k([1, 2, 99, 98], [1, 2, 3, 4], 2) == 1.0


def test_ap_short_retrieved_list():
    # fewer than k retrieved: missing ranks contribute 0
    assert average_precision_at_k([1], [1, 2, 3], 3) == pytest.approx(1 / 3)


def test_ap_rejects_bad_k():
    with pytest.raises(ValueError):
        average_precision_at_k([1], [1], 0)


def test_map_requires_matching_lengths():
    with pytest.raises(ValueError):
        map_at_k([[1]], [[1], [2]], 1)
    with pytest.raises(ValueError):
        map_at_k([], [], 1)


def test_map_bounds():
    rng = np.random.default_rng(0)
    for _ in range(20):
        ret = rng.permutation(10)[:5].tolist()
        tru = rng.permutation(10)[:5].tolist()
        ap = average_precision_at_k(ret, tru, 5)
        assert 0.0 <= ap <= 1.0


def test_ratio_exact_is_one():
    assert approximation_ratio([1.0, 2.0, 3.0], [1.0, 2.0, 3.0], 3) == 1.0


def test_ratio_mean_of_rankwise_ratios():
    c = approximation_ratio([2.0, 2.0], [1.0, 2.0], 2)
    assert c == pytest.approx((2.0 + 1.0) / 2)


def test_ratio_zero_true_distance_handled():
    assert approximation_ratio([0.0, 2.0], [0.0, 1.0], 2) == pytest.approx((1 + 2) / 2)


def test_ratio_requires_k_values():
    with pytest.raises(ValueError):
        approximation_ratio([1.0], [1.0, 2.0], 2)


def test_ratio_at_least_one_for_exact_truth():
    """Retrieved distances can never beat true kNN distances."""
    true = [1.0, 2.0, 3.0]
    retr = [1.0, 2.5, 3.0]
    assert approximation_ratio(retr, true, 3) >= 1.0


def test_recall_at_k():
    assert recall_at_k([1, 2, 3], [2, 3, 4], 3) == pytest.approx(2 / 3)
    assert recall_at_k([1], [1], 1) == 1.0
