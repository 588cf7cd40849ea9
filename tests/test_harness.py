"""Tests for the experiment harnesses (Tables 2/3/5/6 runners)."""
import numpy as np
import pytest

from repro.harness.datasets import TABLE5_DATASETS, DatasetSpec, load_xq
from repro.harness.table2 import compute_table2, print_table2
from repro.harness.table3 import compute_table3, print_table3
from repro.harness.table5 import format_table5_row, hd_params_for, run_dataset


def test_table2_matches_paper_hk1_and_seven_hk2():
    rows = compute_table2()
    hk1_ok = sum(r["paper_hk1"] == r["ours_hk1"] for r in rows)
    hk2_ok = sum(r["paper_hk2"] == r["ours_hk2"] for r in rows)
    assert hk1_ok == 8
    assert hk2_ok == 7
    bad = [r for r in rows if r["paper_hk2"] != r["ours_hk2"]]
    assert bad[0]["object"] == "O2"  # the paper-inconsistent entry


def test_table2_prints(capsys):
    print_table2()
    out = capsys.readouterr().out
    assert "O1" in out and "HK1" in out


def test_table3_all_rows_exact():
    rows = compute_table3()
    assert all(r["paper_leaf_order"] == r["ours_leaf_order"] for r in rows)


def test_table3_multicurves_denser_never(capsys):
    """HD-Index leaves always hold more entries than Multicurves leaves."""
    for r in compute_table3():
        assert r["ours_leaf_order"] > r["multicurves_leaf_order"]
    print_table3()
    assert "SIFTn" in capsys.readouterr().out


# --- dataset registry --------------------------------------------------------

def test_registry_mirrors_table4_shapes():
    byname = {s.name: s for s in TABLE5_DATASETS}
    assert byname["sift10k"].nu == 128 and byname["sift10k"].paper_n == 10_000
    assert byname["sun"].nu == 512 and byname["sun"].tau == 16  # 500+ dims rule
    assert byname["enron"].nu == 1369
    assert byname["sift40k"].alpha == 8192  # "very large" alpha rule
    for s in TABLE5_DATASETS:
        assert s.gamma == max(1, s.alpha // 4)


@pytest.mark.parametrize("spec", TABLE5_DATASETS, ids=lambda s: s.name)
def test_registry_specs_generate(spec):
    if spec.n > 20_000:
        pytest.skip("large spec exercised by benchmarks")
    X, Q = load_xq(spec)
    assert X.shape == (spec.n, spec.nu)
    assert Q.shape == (spec.n_queries, spec.nu)
    assert X.min() >= spec.lo and X.max() <= spec.hi
    if spec.integer:
        assert np.array_equal(X, np.round(X))


def test_hd_params_for_caps_alpha_at_n():
    spec = DatasetSpec("t", "T", 16, 100, 100, 0, 1, False, 4, 2, 4, 4096)
    p = hd_params_for(spec)
    assert p.alpha == 100


# --- mini end-to-end comparative run ----------------------------------------

MINI = DatasetSpec(
    name="mini", paper_name="-", nu=16, n=400, paper_n=400, lo=0.0, hi=1.0,
    integer=False, n_queries=5, tau=4, omega=4, alpha=128, n_clusters=6, seed=9,
)


@pytest.fixture(scope="module")
def mini_run(spark):
    return run_dataset(spark, MINI, methods=["hdindex", "srs", "opq"], k=10)


def test_run_dataset_structure(mini_run):
    assert set(mini_run["results"]) == {"hdindex", "srs", "opq"}
    for r in mini_run["results"].values():
        assert r.build_s >= 0 and r.query_s > 0
        assert 0.0 <= r.map_k <= 1.0
        assert r.ratio >= 1.0 - 1e-9


def test_run_dataset_hdindex_quality(mini_run):
    assert mini_run["results"]["hdindex"].map_k > 0.75


def test_format_table5_row(mini_run):
    txt = format_table5_row(mini_run)
    assert "HD-Index" in txt and "vs srs" in txt and "MAP gain" in txt
