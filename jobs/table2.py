#!/usr/bin/env python
"""Regenerate the paper's Table 2 (SSSP updates per vertex).

Usage:
    python jobs/table2.py [--scale 2e-4] [--graphs PK OK ...]
or via spark-submit:
    spark-submit jobs/table2.py --scale 2e-4
"""
from __future__ import annotations

import argparse

from repro.session import get_spark
from repro.tables.table2 import TABLE2_GRAPHS, format_table2, run_table2


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=2e-4, help="fraction of paper |V|")
    ap.add_argument("--graphs", nargs="*", default=None, choices=TABLE2_GRAPHS)
    args = ap.parse_args()
    spark = get_spark("table2")
    try:
        measured = run_table2(spark, scale=args.scale, graphs=args.graphs)
        print(format_table2(measured))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
