"""Integration tests for the heavier experiment harnesses: image search
(Table 6), the Sec. 5.2.1 partitioning study, and the Sec. 5.2 sweeps."""
import subprocess
import sys

import numpy as np
import pytest

from repro.core.params import HDIndexParams
from repro.harness.partitioning import random_partitioning_study
from repro.harness.sweeps import sweep_alpha, sweep_filters
from repro.harness.table6 import format_table6, run_image_search
from repro.imagesearch.dataset import make_image_collection
from repro.synth_data import make_queries, make_vectors, vectors_df


@pytest.fixture(scope="module")
def img_run(spark):
    col = make_image_collection(
        n_images=30, descs_per_image=16, nu=16, n_query_images=5, seed=3
    )
    return run_image_search(
        spark, methods=["hdindex", "srs"], k_desc=30, k_img=5, collection=col
    )


def test_image_search_hdindex_quality(img_run):
    """HD-Index ties for best image-retrieval quality (paper §5.5 reports
    MAP@5 = 0.6 for it on Yorck; we require at least that level)."""
    r = img_run["methods"]["hdindex"]
    assert r["map_img"] >= 0.6
    assert r["top1_is_source_image"] >= 0.8


def test_image_search_result_structure(img_run):
    for m, r in img_run["methods"].items():
        assert 0.0 <= r["map_img"] <= 1.0
        assert r["query_s"] > 0


def test_format_table6(img_run):
    txt = format_table6(img_run)
    assert "hdindex" in txt and "paper" in txt


def test_partitioning_study_small(spark):
    """Sec. 5.2.1 shape: random partitionings give MAP comparable to
    contiguous, with small spread."""
    X = make_vectors(n=500, nu=16, lo=0, hi=1, n_clusters=8, cluster_spread=0.05, seed=4)
    Q = make_queries(X, n_queries=6, lo=0, hi=1, seed=44)
    df = vectors_df(spark, X)
    p = HDIndexParams(
        nu=16, domain_lo=0, domain_hi=1, tau=4, omega=4, m=5, alpha=96, gamma=24
    )
    study = random_partitioning_study(spark, df, X, Q, p, n_trials=2, k=10)
    assert study["contiguous_map"] > 0.7
    assert abs(study["random_mean"] - study["contiguous_map"]) < 0.25
    assert study["random_std"] < 0.2


def test_sweep_alpha_monotone(tiny_index, tiny_xq):
    X, Q = tiny_xq
    rows = sweep_alpha(tiny_index, X, Q, alphas=(16, 128, 600), k=10)
    assert rows[0]["map"] <= rows[-1]["map"] + 0.05
    assert rows[-1]["map"] > 0.9


def test_sweep_filters_shapes(tiny_index, tiny_xq):
    X, Q = tiny_xq
    rows = sweep_filters(tiny_index, X, Q, alpha=128, k=10)
    assert {r["filters"] for r in rows} == {"tri", "both"}
    for r in rows:
        assert 0 <= r["map"] <= 1


def test_table2_job_runs_standalone():
    out = subprocess.run(
        [sys.executable, "jobs/table2_running_example.py"],
        capture_output=True, text=True, timeout=120,
    )
    assert out.returncode == 0
    assert "O1" in out.stdout


def test_table3_job_runs_standalone():
    out = subprocess.run(
        [sys.executable, "jobs/table3_leaf_orders.py"],
        capture_output=True, text=True, timeout=120,
    )
    assert out.returncode == 0
    assert "SIFTn" in out.stdout and "63" in out.stdout
