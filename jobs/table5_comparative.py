#!/usr/bin/env python
"""Reproduce Table 5 (the main comparative study) on the scaled synthetic
stand-ins for the paper's datasets.

Usage:
    spark-submit jobs/table5_comparative.py [--datasets sift10k,audio,...]
        [--methods hdindex,c2lsh,...] [--k 100] [--json out.json]

Prints one Table-5-shaped block per dataset (HD-Index absolutes + gains over
each competitor) and optionally dumps the raw numbers as JSON for
EXPERIMENTS.md.
"""
import argparse
import json
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.harness.datasets import TABLE5_DATASETS  # noqa: E402
from repro.harness.table5 import ALL_METHODS, format_table5_row, run_dataset  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", default=",".join(s.name for s in TABLE5_DATASETS))
    ap.add_argument("--methods", default=",".join(ALL_METHODS))
    ap.add_argument("--k", type=int, default=100)
    ap.add_argument("--json", default=None)
    args = ap.parse_args()

    wanted = set(args.datasets.split(","))
    methods = args.methods.split(",")
    spark = get_spark("table5")
    dump = []
    for spec in TABLE5_DATASETS:
        if spec.name not in wanted:
            continue
        run = run_dataset(spark, spec, methods=methods, k=args.k)
        print(format_table5_row(run), flush=True)
        dump.append(
            {
                "dataset": spec.name,
                "k": args.k,
                "results": {
                    m: vars(r) for m, r in run["results"].items()
                },
            }
        )
    if args.json:
        with open(args.json, "w") as f:
            json.dump(dump, f, indent=2)
    spark.stop()


if __name__ == "__main__":
    main()
