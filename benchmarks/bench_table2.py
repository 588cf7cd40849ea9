"""Benchmarks for Table 2's substrate: Hilbert-key computation.

The running example itself is microscopic; the meaningful numbers are the
batch key-encoding throughputs at the paper's real configurations (SIFT:
eta=16/omega=8; Audio: eta=24/omega=32; SUN: eta=64/omega=32)."""
import numpy as np
import pytest

from repro.harness.table2 import compute_table2
from repro.hilbert.curve import hilbert_keys


def test_bench_table2_running_example(benchmark):
    rows = benchmark(compute_table2)
    assert sum(r["paper_hk1"] == r["ours_hk1"] for r in rows) == 8


@pytest.mark.parametrize(
    "name,eta,omega",
    [("sift", 16, 8), ("audio", 24, 32), ("sun", 64, 32)],
)
def test_bench_hilbert_encode_10k(benchmark, name, eta, omega):
    rng = np.random.default_rng(0)
    coords = rng.integers(0, 1 << min(omega, 16), size=(10_000, eta)).astype(np.uint64)
    keys = benchmark(hilbert_keys, coords, omega)
    assert len(keys) == 10_000
