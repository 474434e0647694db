#!/usr/bin/env python
"""Reproduce Experiment 5 (Figure 11): pipeline step breakdown.

Usage: spark-submit jobs/exp5_pipeline.py [--facts 20000]
"""
import argparse

from repro.jobs_util import get_session, print_table
from repro.tables.experiment5 import experiment5


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--facts", type=int, default=20_000)
    args = ap.parse_args()
    spark = get_session("exp5")
    df = experiment5(spark, n_facts=args.facts)
    print_table("Experiment 5: online pipeline step times (s) per configuration", df)
    spark.stop()


if __name__ == "__main__":
    main()
