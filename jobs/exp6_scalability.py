#!/usr/bin/env python
"""Reproduce Experiment 6 (Figure 12): scalability sweeps.

Usage: spark-submit jobs/exp6_scalability.py [--base-facts 50000]
"""
import argparse

from repro.jobs_util import get_session, print_table
from repro.tables.experiment6 import experiment6


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--base-facts", type=int, default=50_000)
    args = ap.parse_args()
    spark = get_session("exp6")
    df = experiment6(spark, base_facts=args.base_facts)
    print_table(
        "Experiment 6: evaluation time (s) — PGCube* vs MVDCube vs MVDCube+ES", df
    )
    spark.stop()


if __name__ == "__main__":
    main()
