#!/usr/bin/env python
"""Reproduce Table 3 + Experiments 2-3: PGCube errors and run times.

Usage: spark-submit jobs/table3_errors.py [--sf 1.0]
"""
import argparse

from repro.jobs_util import get_session, print_table
from repro.tables.table3 import table3


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--datasets", nargs="*", default=None)
    args = ap.parse_args()
    spark = get_session("table3")
    df = table3(spark, sf=args.sf, datasets=args.datasets)
    print_table(
        "Table 3: #wrong aggregates (PGCube* / PGCube^d) + Fig 9 times + Fig 10 ratios",
        df,
    )
    spark.stop()


if __name__ == "__main__":
    main()
