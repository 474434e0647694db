#!/usr/bin/env python
"""Reproduce Table 2 (+ Experiment 1): dataset profiles & derivations.

Usage: spark-submit jobs/table2_datasets.py [--sf 1.0] [--scores]
"""
import argparse

from repro.jobs_util import get_session, print_table
from repro.tables.table2 import table2


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--scores", action="store_true",
                    help="also evaluate best interestingness woD vs wD (Exp. 1)")
    ap.add_argument("--datasets", nargs="*", default=None)
    args = ap.parse_args()
    spark = get_session("table2")
    df = table2(spark, sf=args.sf, datasets=args.datasets, with_scores=args.scores)
    print_table("Table 2: datasets, properties, derivations, #aggregates", df)
    spark.stop()


if __name__ == "__main__":
    main()
