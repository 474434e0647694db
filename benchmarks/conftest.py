"""Shared prepared pipelines for the benchmark suite.

Benchmarks time *Aggregate Evaluation* (the paper's compared step);
graph generation, offline analysis, and enumeration happen once here.
"""
from __future__ import annotations

import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "16")

import pytest

from repro.core import spade
from repro.core.config import SpadeConfig
from repro.datagen import real_graphs
from repro.datagen.benchmark import build_benchmark

BENCH_CONFIG = SpadeConfig(
    min_cfs_size=10,
    max_cfss=3,
    max_lattices_per_cfs=3,
    max_measures_per_lattice=3,
    funcs=("count", "sum", "avg"),
)


@pytest.fixture(scope="session")
def ceos_prepared(spark):
    """Analyzed CEOs analog (multi-valued; Table 3/4 benchmarks)."""
    store = real_graphs.build(spark, "CEOs", sf=0.3)
    off = spade.offline_phase(store, BENCH_CONFIG)
    analyses = spade.analyze_and_enumerate(off, BENCH_CONFIG, {})
    yield analyses, BENCH_CONFIG
    store.unpersist()


@pytest.fixture(scope="session")
def synthetic_prepared(spark):
    """Analyzed synthetic benchmark graph (Experiment 6 base, scaled)."""
    config = SpadeConfig(
        max_measures_per_lattice=None,
        max_lattices_per_cfs=None,
        funcs=("count", "sum", "avg"),
    )
    store = build_benchmark(
        spark, n_facts=20_000, dim_cards=(100, 100, 100), n_measures=5,
        sparsity=0.1,
    )
    off = spade.offline_phase(store, config)
    analyses = spade.analyze_and_enumerate(off, config, {})
    yield analyses, config
    store.unpersist()
