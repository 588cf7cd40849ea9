"""Tests for the HNSW baseline (driver-side graph)."""
import numpy as np
import pytest

from repro.baselines.hnsw import HNSW, knn_hnsw
from repro.baselines.linear_scan import bruteforce_topk
from repro.metrics import map_at_k, recall_at_k


@pytest.fixture(scope="module")
def graph(tiny_xq):
    X, _ = tiny_xq
    return HNSW(X, M=8, ef_construction=64, seed=0)


def test_every_point_in_layer_zero(graph, tiny_xq):
    X, _ = tiny_xq
    assert set(graph.graph[0].keys()) == set(range(len(X)))


def test_degree_bounds(graph):
    for lev, adj in enumerate(graph.graph):
        cap = graph.Mmax0 if lev == 0 else graph.Mmax
        for node, neigh in adj.items():
            assert len(neigh) <= cap, (lev, node)
            assert node not in neigh  # no self loops


def test_level_distribution_geometric(graph, tiny_xq):
    X, _ = tiny_xq
    levels = graph.levels
    assert (levels >= 0).all()
    # P(level >= 1) = 1/M: for n=600, M=8 expect ~75 +- wide slack
    frac = (levels >= 1).mean()
    assert 0.02 < frac < 0.35
    assert graph.max_level == levels.max()


def test_entry_point_at_max_level(graph):
    assert graph.levels[graph.entry] == graph.max_level


def test_neighbors_are_valid_nodes(graph, tiny_xq):
    X, _ = tiny_xq
    for adj in graph.graph:
        for node, neigh in adj.items():
            assert all(0 <= v < len(X) for v in neigh)


def test_recall_high_on_clustered_data(graph, tiny_xq, tiny_truth):
    X, Q = tiny_xq
    got = knn_hnsw(graph, Q, k=10, ef=100)
    truth = [g.sort_values("rank")["id"].tolist() for _, g in tiny_truth.groupby("qid")]
    mine = [g.sort_values("rank")["id"].tolist() for _, g in got.groupby("qid")]
    m = map_at_k(mine, truth, 10)
    assert m > 0.85, m


def test_self_query_rank_one(graph, tiny_xq):
    X, _ = tiny_xq
    got = knn_hnsw(graph, X[[77]], k=3)
    assert got.iloc[0]["id"] == 77
    assert got.iloc[0]["dist"] == pytest.approx(0.0)


def test_distances_are_euclidean(graph, tiny_xq):
    X, Q = tiny_xq
    got = knn_hnsw(graph, Q[:2], k=5)
    for _, row in got.iterrows():
        true = np.sqrt(((X[int(row["id"])] - Q[int(row["qid"])]) ** 2).sum())
        assert row["dist"] == pytest.approx(true, abs=1e-9)


def test_larger_ef_not_worse(graph, tiny_xq, tiny_truth):
    _, Q = tiny_xq
    truth = [g.sort_values("rank")["id"].tolist() for _, g in tiny_truth.groupby("qid")]

    def mr(ef):
        got = knn_hnsw(graph, Q, k=10, ef=ef)
        recs = [
            recall_at_k(
                got[got["qid"] == q].sort_values("rank")["id"].tolist(), truth[q], 10
            )
            for q in range(len(Q))
        ]
        return float(np.mean(recs))

    assert mr(128) >= mr(16) - 0.05


def test_deterministic_given_seed(tiny_xq):
    X, _ = tiny_xq
    g1 = HNSW(X[:200], M=6, ef_construction=32, seed=4)
    g2 = HNSW(X[:200], M=6, ef_construction=32, seed=4)
    assert np.array_equal(g1.levels, g2.levels)
    assert g1.graph[0] == g2.graph[0]


def test_single_point_graph():
    g = HNSW(np.zeros((1, 4)), M=4, ef_construction=8, seed=0)
    ids, dists = g.query(np.zeros(4), k=3)
    assert ids.tolist() == [0]
