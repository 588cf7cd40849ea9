"""Shared fixtures for the test suite: tiny clustered datasets and a built
HD-Index, session-scoped so the Spark-side build cost is paid once."""
import numpy as np
import pytest

from repro.synth_data import make_queries, make_vectors, vectors_df
from repro.core.params import HDIndexParams
from repro.core.build import build_hd_index


TINY = dict(n=600, nu=16, lo=0.0, hi=1.0)


@pytest.fixture(scope="session")
def tiny_xq():
    """(X, Q): a 600x16 clustered cloud and 8 near-duplicate queries."""
    X = make_vectors(
        n=TINY["n"], nu=TINY["nu"], lo=TINY["lo"], hi=TINY["hi"],
        n_clusters=8, cluster_spread=0.04, seed=7,
    )
    Q = make_queries(X, n_queries=8, lo=TINY["lo"], hi=TINY["hi"], noise=0.01, seed=99)
    return X, Q


@pytest.fixture(scope="session")
def tiny_df(spark, tiny_xq):
    X, _ = tiny_xq
    df = vectors_df(spark, X, n_partitions=4)
    df = df.persist()
    df.count()
    return df


@pytest.fixture(scope="session")
def tiny_params():
    return HDIndexParams(
        nu=TINY["nu"], domain_lo=TINY["lo"], domain_hi=TINY["hi"],
        tau=4, omega=4, m=5, alpha=64, gamma=16, seed=0,
    )


@pytest.fixture(scope="session")
def tiny_index(spark, tiny_df, tiny_params):
    return build_hd_index(spark, tiny_df, tiny_params)


@pytest.fixture(scope="session")
def tiny_truth(tiny_xq):
    from repro.baselines.linear_scan import bruteforce_topk

    X, Q = tiny_xq
    return bruteforce_topk(X, Q, k=10)
