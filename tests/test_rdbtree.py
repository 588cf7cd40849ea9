"""Tests for the distributed RDB-tree machinery (leaf bucketing + fences)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.rdbtree import FenceHierarchy, assign_leaves, leaf_fences
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def keyed_df(spark):
    rng = np.random.default_rng(0)
    n = 500
    pdf = pd.DataFrame(
        {
            "id": np.arange(n, dtype=np.int64),
            "hkey": [f"{v:08x}" for v in rng.integers(0, 2**31, n)],
            "payload": rng.random(n),
        }
    )
    return spark.createDataFrame(pdf), pdf


def test_assign_leaves_matches_sql_oracle(keyed_df):
    """leaf_id/slot equal a row_number window bucketed Omega-at-a-time —
    checked against DuckDB running the equivalent SQL."""
    df, pdf = keyed_df
    omega = 37
    out = assign_leaves(df, "hkey", omega).select("id", "hkey", "leaf_id", "slot")
    sql = f"""
        SELECT id, hkey,
               CAST(FLOOR((rn - 1) / {omega}) AS BIGINT) AS leaf_id,
               CAST((rn - 1) % {omega} AS BIGINT) AS slot
        FROM (SELECT id, hkey,
                     row_number() OVER (ORDER BY hkey, id) AS rn
              FROM input)
    """
    assert_equivalent(out, sql, input=pdf[["id", "hkey"]])


@pytest.mark.parametrize("omega", [1, 7, 64, 1000])
def test_assign_leaves_counts(keyed_df, omega):
    df, pdf = keyed_df
    out = assign_leaves(df, "hkey", omega)
    counts = dict(
        out.groupBy("leaf_id").count().orderBy("leaf_id").collect()
    )
    n = len(pdf)
    full, rem = divmod(n, omega)
    expected = {i: omega for i in range(full)}
    if rem:
        expected[full] = rem
    assert {int(k): int(v) for k, v in counts.items()} == expected


def test_assign_leaves_preserves_all_rows_and_payload(keyed_df):
    df, pdf = keyed_df
    out = assign_leaves(df, "hkey", 50).toPandas()
    assert sorted(out["id"]) == sorted(pdf["id"])
    merged = out.merge(pdf, on="id", suffixes=("", "_orig"))
    assert np.allclose(merged["payload"], merged["payload_orig"])


def test_assign_leaves_key_ranges_disjoint(keyed_df):
    """Key ranges of consecutive leaves do not interleave."""
    df, _ = keyed_df
    out = assign_leaves(df, "hkey", 43)
    fences = leaf_fences(out)
    for i in range(len(fences) - 1):
        assert fences["max_key"][i] <= fences["min_key"][i + 1]


def test_assign_leaves_deterministic(keyed_df):
    df, _ = keyed_df
    a = assign_leaves(df, "hkey", 29).orderBy("id").toPandas()
    b = assign_leaves(df, "hkey", 29).orderBy("id").toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_assign_leaves_rejects_bad_order(keyed_df):
    df, _ = keyed_df
    with pytest.raises(ValueError):
        assign_leaves(df, "hkey", 0)


def test_leaf_fences_shape(keyed_df):
    df, pdf = keyed_df
    out = assign_leaves(df, "hkey", 100)
    fences = leaf_fences(out)
    assert list(fences.columns) == ["leaf_id", "min_key", "max_key", "count"]
    assert fences["count"].sum() == len(pdf)
    assert (fences["min_key"] <= fences["max_key"]).all()


# --- FenceHierarchy (pure driver-side) --------------------------------------

def _fences(n_leaves, omega=10, seed=0):
    rng = np.random.default_rng(seed)
    keys = np.sort(rng.integers(0, 2**31, n_leaves * omega))
    mins, maxs, counts = [], [], []
    for i in range(n_leaves):
        grp = keys[i * omega : (i + 1) * omega]
        mins.append(f"{grp[0]:08x}")
        maxs.append(f"{grp[-1]:08x}")
        counts.append(len(grp))
    return pd.DataFrame(
        {"leaf_id": range(n_leaves), "min_key": mins, "max_key": maxs, "count": counts}
    )


@pytest.mark.parametrize("n_leaves,branching", [(1, 4), (3, 4), (17, 4), (100, 3), (64, 64), (65, 2)])
def test_hierarchy_lookup_matches_bisect(n_leaves, branching):
    f = _fences(n_leaves)
    h = FenceHierarchy(f, branching)
    rng = np.random.default_rng(1)
    probes = [f"{v:08x}" for v in rng.integers(0, 2**31, 200)]
    probes += ["00000000", "ffffffff", f["min_key"][0], f["max_key"].iloc[-1]]
    for p in probes:
        assert h.lookup(p) == h.lookup_bisect(p), p


def test_hierarchy_height_logarithmic():
    h = FenceHierarchy(_fences(1000), branching=10)
    assert h.height == 3  # 1000 -> 100 -> 10 -> 1


def test_hierarchy_single_leaf():
    h = FenceHierarchy(_fences(1), branching=4)
    assert h.height == 0
    assert h.lookup("00000000") == 0


def test_hierarchy_window_slot_guarantee():
    """window(leaf, alpha) holds >= alpha slots each side of the centre leaf
    (or reaches the end of the tree)."""
    h = FenceHierarchy(_fences(50, omega=10), branching=4)
    for leaf in [0, 7, 25, 49]:
        for alpha in [1, 5, 35, 120, 10_000]:
            lo, hi = h.window(leaf, alpha)
            assert lo <= leaf <= hi
            before = h.cum[leaf] - h.cum[lo]
            after = h.cum[hi + 1] - h.cum[leaf + 1]
            assert before >= min(alpha, h.cum[leaf])
            assert after >= min(alpha, h.total_slots - h.cum[leaf + 1])


def test_hierarchy_window_whole_tree_when_alpha_huge():
    h = FenceHierarchy(_fences(10), branching=4)
    assert h.window(4, 10**9) == (0, 9)


def test_hierarchy_validation():
    f = _fences(5)
    with pytest.raises(ValueError):
        FenceHierarchy(f, branching=1)
    with pytest.raises(ValueError):
        FenceHierarchy(f.iloc[0:0], branching=4)
    bad = f.copy()
    bad["leaf_id"] = [0, 2, 3, 4, 5]
    with pytest.raises(ValueError):
        FenceHierarchy(bad, branching=4)
