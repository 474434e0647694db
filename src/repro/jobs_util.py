"""Shared glue for the spark-submit entrypoints under jobs/."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    """The jobs' SparkSession: same settings as the pytest fixture.

    Under spark-submit, master/memory come from the submit command;
    standalone runs fall back to local[*].
    """
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def print_table(title: str, df: pd.DataFrame) -> None:
    """Print one reproduction table in a stable, diffable format."""
    print(f"\n== {title} ==")
    with pd.option_context(
        "display.width", 200, "display.max_columns", 50, "display.float_format",
        lambda v: f"{v:.2f}",
    ):
        print(df.to_string(index=False))
