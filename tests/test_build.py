"""Tests for HD-Index construction (repro.core.build) — Algo 1 invariants."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.build import build_hd_index, load_hd_index_trees
from repro.core.params import HDIndexParams
from repro.hilbert.curve import hilbert_keys, key_hex_width, quantize
from repro.synth_data import make_vectors, vectors_df


def test_index_has_tau_trees(tiny_index, tiny_params):
    assert len(tiny_index.trees) == tiny_params.tau
    assert len(tiny_index.hierarchies) == tiny_params.tau


def test_every_tree_contains_every_object(tiny_index, tiny_df):
    n = tiny_df.count()
    for tree in tiny_index.trees:
        assert tree.count() == n
        assert tree.select("id").distinct().count() == n


def test_reference_metadata_shapes(tiny_index, tiny_params):
    m, nu = tiny_params.m, tiny_params.nu
    assert tiny_index.ref_vectors.shape == (m, nu)
    assert tiny_index.ref_pairwise.shape == (m, m)
    assert np.allclose(tiny_index.ref_pairwise, tiny_index.ref_pairwise.T)
    assert np.allclose(np.diag(tiny_index.ref_pairwise), 0.0)


def test_rdist_columns_match_numpy(tiny_index, tiny_xq):
    """Leaf-stored reference distances equal directly computed ones."""
    X, _ = tiny_xq
    pdf = tiny_index.trees[0].select("id", "rdist").toPandas()
    R = tiny_index.ref_vectors
    for _, row in pdf.sample(50, random_state=0).iterrows():
        expected = np.sqrt(((X[int(row["id"])] - R) ** 2).sum(-1))
        # rdist uses the (x^2 - 2xy + y^2) expansion, whose cancellation
        # error near zero is ~1e-8 — tolerance reflects that.
        assert np.allclose(np.asarray(row["rdist"]), expected, atol=1e-6)


def test_hilbert_keys_match_recomputation(tiny_index, tiny_xq, tiny_params):
    """Keys stored in tree i equal keys recomputed from partition i's dims."""
    X, _ = tiny_xq
    p = tiny_params
    for t in [0, p.tau - 1]:
        dims = np.asarray(p.partitions[t])
        pdf = tiny_index.trees[t].select("id", "hkey").toPandas()
        sub = X[:, dims]
        cells = quantize(sub, p.domain_lo, p.domain_hi, p.omega)
        keys = hilbert_keys(cells, p.omega)
        for _, row in pdf.sample(40, random_state=1).iterrows():
            assert row["hkey"] == keys[int(row["id"])]


def test_keys_have_fixed_width(tiny_index, tiny_params):
    w = key_hex_width(tiny_params.eta, tiny_params.omega)
    lens = (
        tiny_index.trees[0]
        .select(F.length("hkey").alias("l"))
        .distinct()
        .collect()
    )
    assert [r["l"] for r in lens] == [w]


def test_leaves_sorted_by_key(tiny_index):
    """Global (leaf_id, slot) order is key order."""
    pdf = (
        tiny_index.trees[0]
        .select("leaf_id", "slot", "hkey")
        .orderBy("leaf_id", "slot")
        .toPandas()
    )
    assert (pdf["hkey"].values == np.sort(pdf["hkey"].values)).all()


def test_leaf_capacity_is_eq4_order(tiny_index, tiny_params):
    counts = (
        tiny_index.trees[0].groupBy("leaf_id").count().orderBy("leaf_id").toPandas()
    )
    assert (counts["count"][:-1] == tiny_params.leaf_order).all()
    assert counts["count"].iloc[-1] <= tiny_params.leaf_order


def test_hierarchy_consistent_with_fences(tiny_index):
    for h in tiny_index.hierarchies:
        assert h.total_slots == tiny_index.n
        assert h.n_leaves == len(h.fences)


def test_build_stats(tiny_index, tiny_params):
    assert tiny_index.build_stats["n"] == tiny_index.n
    assert tiny_index.build_stats["tau"] == tiny_params.tau


def test_parquet_roundtrip(spark, tmp_path):
    """Disk-persisted trees equal the in-memory build row-for-row."""
    X = make_vectors(n=300, nu=8, lo=0, hi=1, n_clusters=4, seed=3)
    df = vectors_df(spark, X)
    p = HDIndexParams(nu=8, domain_lo=0, domain_hi=1, tau=2, omega=4, m=3, alpha=32)
    mem = build_hd_index(spark, df, p)
    disk = build_hd_index(spark, df, p, parquet_dir=str(tmp_path / "idx"))
    for t in range(p.tau):
        a = mem.trees[t].orderBy("id").toPandas()
        b = disk.trees[t].orderBy("id").toPandas()
        assert (a["hkey"].values == b["hkey"].values).all()
        assert (a["leaf_id"].values == b["leaf_id"].values).all()
    reloaded = load_hd_index_trees(spark, str(tmp_path / "idx"), p.tau)
    assert reloaded[0].count() == 300


def test_build_deterministic_in_seed(spark):
    X = make_vectors(n=200, nu=8, lo=0, hi=1, seed=5)
    df = vectors_df(spark, X)
    p = HDIndexParams(nu=8, domain_lo=0, domain_hi=1, tau=2, omega=4, m=3, alpha=32, seed=11)
    i1 = build_hd_index(spark, df, p)
    i2 = build_hd_index(spark, df, p)
    assert np.allclose(i1.ref_vectors, i2.ref_vectors)


def test_build_with_random_partitioning(spark):
    """Sec. 5.2.1: the index builds and covers all dims under random
    partitioning too."""
    X = make_vectors(n=200, nu=12, lo=0, hi=1, seed=6)
    df = vectors_df(spark, X)
    p = HDIndexParams(
        nu=12, domain_lo=0, domain_hi=1, tau=3, omega=4, m=3, alpha=32,
        partition_scheme="random", seed=2,
    )
    idx = build_hd_index(spark, df, p)
    flat = sorted(d for g in p.partitions for d in g)
    assert flat == list(range(12))
    assert len(idx.trees) == 3
