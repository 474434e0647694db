"""Experiment 5 (Figure 11, R8): online-pipeline step breakdown.

Runs the full online pipeline of Spade (MVDCube, no early-stop) on the
12 synthetic-benchmark configurations of Section 6.5 — |CFS| facts,
3 dimensions, M in {3, 5, 10} measures, uniform (100:100:100) or
decreasing (100:5:2) dimension cardinalities, sparsity in {0.1, 0.5} —
and reports per-step wall-clock times. The paper uses |CFS|=1M; we
scale to laptop size (default 20k) and compare step *shares*.
"""
from __future__ import annotations

from dataclasses import replace

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import spade
from repro.core.config import SpadeConfig
from repro.datagen.benchmark import build_benchmark

STEPS = (
    "cfs_selection",
    "online_attribute_analysis",
    "aggregate_enumeration",
    "aggregate_evaluation",
    "topk",
)

CONFIGS = [
    (dist, s, m)
    for dist in ("u", "d")  # uniform 100:100:100 | decreasing 100:5:2
    for s in (0.1, 0.5)
    for m in (3, 5, 10)
]


def _dims(dist: str) -> tuple[int, ...]:
    return (100, 100, 100) if dist == "u" else (100, 5, 2)


def run_config(
    spark: SparkSession,
    *,
    dist: str,
    sparsity: float,
    n_measures: int,
    n_facts: int = 20_000,
    config: SpadeConfig | None = None,
) -> dict[str, float]:
    """One bar of Figure 11: per-step times for one configuration."""
    config = config or SpadeConfig(
        max_measures_per_lattice=None, max_lattices_per_cfs=None
    )
    store = build_benchmark(
        spark,
        n_facts=n_facts,
        dim_cards=_dims(dist),
        n_measures=n_measures,
        sparsity=sparsity,
    )
    res = spade.run(spark, store, config, evaluator="mvdcube", k=10)
    out = {step: res.times.get(step, 0.0) for step in STEPS}
    out["total"] = sum(out.values())
    out["n_aggregates"] = float(len(res.arm))
    store.unpersist()
    return out


def experiment5(
    spark: SparkSession,
    *,
    n_facts: int = 20_000,
    configs: list[tuple[str, float, int]] | None = None,
) -> pd.DataFrame:
    """All configured bars of Figure 11 as rows of a pandas frame."""
    rows = []
    for dist, s, m in configs or CONFIGS:
        times = run_config(
            spark, dist=dist, sparsity=s, n_measures=m, n_facts=n_facts
        )
        rows.append({"config": f"{dist}|{s}|{m}", **times})
    return pd.DataFrame(rows)
