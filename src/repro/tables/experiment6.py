"""Experiment 6 (Figure 12, R9): scalability in |CFS|, M, and N.

Base configuration (scaled from the paper's |CFS|=5M, 3 dims, 15
measures): uniform 100-value dimensions, sparsity 0.1. We vary one
knob at a time and time Aggregate Evaluation through PGCube*, MVDCube,
and MVDCube + early-stop (PGCube* is correct on these single-valued
graphs, as the paper requires).
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import spade
from repro.core.config import SpadeConfig
from repro.datagen.benchmark import build_benchmark


def _eval_times(spark, analyses, config, k=10) -> dict[str, float]:
    out = {}
    t0 = time.perf_counter()
    spade.evaluate_analyses(spark, analyses, config, evaluator="pgcube*", k=k)
    out["pgcube_star_s"] = time.perf_counter() - t0
    t0 = time.perf_counter()
    spade.evaluate_analyses(spark, analyses, config, evaluator="mvdcube", k=k)
    out["mvdcube_s"] = time.perf_counter() - t0
    t0 = time.perf_counter()
    spade.evaluate_analyses(
        spark, analyses, config, evaluator="mvdcube", early_stop=True, k=k
    )
    out["mvdcube_es_s"] = time.perf_counter() - t0
    return out


def run_point(
    spark: SparkSession,
    *,
    n_facts: int,
    n_dims: int,
    n_measures: int,
    sparsity: float = 0.1,
    config: SpadeConfig | None = None,
) -> dict[str, float]:
    """One point of Figure 12: three evaluator timings."""
    config = config or SpadeConfig(
        max_measures_per_lattice=None, max_lattices_per_cfs=None
    )
    store = build_benchmark(
        spark,
        n_facts=n_facts,
        dim_cards=tuple([100] * n_dims),
        n_measures=n_measures,
        sparsity=sparsity,
    )
    off = spade.offline_phase(store, config)
    analyses = spade.analyze_and_enumerate(off, config, {})
    out = _eval_times(spark, analyses, config)
    store.unpersist()
    return out


def experiment6(
    spark: SparkSession,
    *,
    base_facts: int = 50_000,
    base_measures: int = 15,
    base_dims: int = 3,
    facts_sweep: tuple[int, ...] = (10_000, 25_000, 50_000),
    measures_sweep: tuple[int, ...] = (5, 10, 15),
    dims_sweep: tuple[int, ...] = (1, 2, 3),
) -> pd.DataFrame:
    """The three sweeps of Figure 12 as rows of a pandas frame."""
    rows = []
    for nf in facts_sweep:
        rows.append(
            {"sweep": "facts", "x": nf,
             **run_point(spark, n_facts=nf, n_dims=base_dims, n_measures=base_measures)}
        )
    for m in measures_sweep:
        rows.append(
            {"sweep": "measures", "x": m,
             **run_point(spark, n_facts=base_facts, n_dims=base_dims, n_measures=m)}
        )
    for n in dims_sweep:
        rows.append(
            {"sweep": "dims", "x": n,
             **run_point(spark, n_facts=base_facts, n_dims=n, n_measures=base_measures)}
        )
    return pd.DataFrame(rows)
