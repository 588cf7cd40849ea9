#!/usr/bin/env python
"""Reproduce Table 2 (the running example's Hilbert-key ranks).

Usage: python jobs/table2_running_example.py   (no Spark needed)
"""
from repro.harness.table2 import print_table2

if __name__ == "__main__":
    print_table2()
