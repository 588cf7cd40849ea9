#!/usr/bin/env python
"""Reproduce Table 3 (RDB-tree leaf orders from Eq. 4, B = 4 KB).

Usage: python jobs/table3_leaf_orders.py   (no Spark needed)
"""
from repro.harness.table3 import print_table3

if __name__ == "__main__":
    print_table3()
