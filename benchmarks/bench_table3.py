"""Benchmark for Table 3: Eq. (4) leaf-order computation for all six dataset
configurations (trivially fast — included so every table has a bench
target that regenerates its numbers)."""
from repro.harness.table3 import compute_table3


def test_bench_table3_leaf_orders(benchmark):
    rows = benchmark(compute_table3)
    assert all(r["paper_leaf_order"] == r["ours_leaf_order"] for r in rows)
