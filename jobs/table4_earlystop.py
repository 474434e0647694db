#!/usr/bin/env python
"""Reproduce Table 4 / Experiment 4: early-stop effectiveness.

Usage: spark-submit jobs/table4_earlystop.py [--sf 1.0]
"""
import argparse

from repro.jobs_util import get_session, print_table
from repro.tables.table4 import table4


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--datasets", nargs="*", default=None)
    ap.add_argument("--ks", nargs="*", type=int, default=[3, 5, 10])
    args = ap.parse_args()
    spark = get_session("table4")
    df = table4(spark, sf=args.sf, datasets=args.datasets, ks=tuple(args.ks))
    print_table("Table 4: MVDCube vs MVDCube+early-stop (time, pruned%, acc%)", df)
    spark.stop()


if __name__ == "__main__":
    main()
