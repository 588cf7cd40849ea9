#!/usr/bin/env python
"""Reproduce Table 6 / Sec. 5.5 (image search with Borda-count aggregation).

Usage: spark-submit jobs/table6_image_search.py [--methods hdindex,qalsh,srs,c2lsh]
"""
import argparse
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.harness.table6 import IMG_METHODS, format_table6, run_image_search  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--methods", default=",".join(IMG_METHODS))
    args = ap.parse_args()
    spark = get_spark("table6")
    run = run_image_search(spark, methods=args.methods.split(","))
    print(format_table6(run), flush=True)
    spark.stop()


if __name__ == "__main__":
    main()
