#!/usr/bin/env python
"""Regenerate the paper's Table 5 (8-node runtime, 3 systems x 5 apps x 7 graphs).

Usage:
    python jobs/table5.py [--scale 2e-4] [--graphs PK OK ...] [--apps SSSP PR ...]
or via spark-submit:
    spark-submit jobs/table5.py
"""
from __future__ import annotations

import argparse

from repro.apps import APPS
from repro.session import get_spark
from repro.tables.table5 import TABLE5_GRAPHS, format_table5, run_table5


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=2e-4, help="fraction of paper |V|")
    ap.add_argument("--graphs", nargs="*", default=None, choices=TABLE5_GRAPHS)
    ap.add_argument("--apps", nargs="*", default=None, choices=list(APPS))
    args = ap.parse_args()
    spark = get_spark("table5")
    try:
        res = run_table5(spark, scale=args.scale, graphs=args.graphs, apps=args.apps)
        print(format_table5(res))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
