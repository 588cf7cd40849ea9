#!/usr/bin/env python
"""Build an HD-Index over a registered dataset and persist it to Parquet.

Usage: spark-submit jobs/build_hd_index.py --dataset sift10k --out /tmp/hdidx
"""
import argparse
import sys
import time

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.core.build import build_hd_index  # noqa: E402
from repro.harness.datasets import TABLE5_DATASETS, load_xq  # noqa: E402
from repro.harness.table5 import hd_params_for  # noqa: E402
from repro.synth_data import vectors_df  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", required=True)
    ap.add_argument("--out", required=True)
    args = ap.parse_args()
    spec = next(s for s in TABLE5_DATASETS if s.name == args.dataset)
    spark = get_spark(f"build-hdindex-{spec.name}")
    X, _ = load_xq(spec)
    t0 = time.perf_counter()
    idx = build_hd_index(spark, vectors_df(spark, X), hd_params_for(spec), parquet_dir=args.out)
    print(
        f"built HD-Index for {spec.name}: n={idx.n}, tau={len(idx.trees)}, "
        f"leaf order {idx.params.leaf_order}, {time.perf_counter()-t0:.1f}s -> {args.out}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
