"""Table 4 / Experiment 4 (R6-R7): early-stop effectiveness.

For each dataset analog and k in {3, 5, 10}: evaluation time of
MVDCube alone vs MVDCube + early-stop, the time gain, the fraction of
aggregates pruned, and the top-k accuracy
``|T_k^{w/o} ∩ T_k^{w}| / |T_k^{w/o}|`` (the paper's metric, after
[43]). Sample size 60 in 2 batches, as in Section 6.4.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import spade
from repro.core.config import SpadeConfig
from repro.datagen import real_graphs


@dataclass
class Table4Row:
    """One (dataset, k) cell group of Table 4."""

    dataset: str
    k: int
    t_mvd_ms: float
    t_mvd_es_ms: float
    gain_pct: float
    pruned_pct: float
    accuracy_pct: float


def earlystop_effectiveness(
    spark: SparkSession,
    name: str,
    *,
    sf: float = 1.0,
    ks: tuple[int, ...] = (3, 5, 10),
    config: SpadeConfig | None = None,
    h: str = "variance",
    store=None,
) -> list[Table4Row]:
    """Experiment 4 on one dataset analog (analysis runs once; the two
    timed runs cover Aggregate Evaluation + Top-k only, as the paper's
    Table 4 reports evaluation time)."""
    config = config or SpadeConfig()
    own_store = store is None
    if store is None:
        store = real_graphs.build(spark, name, sf=sf)
    off = spade.offline_phase(store, config)
    analyses = spade.analyze_and_enumerate(off, config, {})
    rows = []
    for k in ks:
        t0 = time.perf_counter()
        base = spade.evaluate_analyses(spark, analyses, config, k=k, h=h)
        t_mvd = (time.perf_counter() - t0) * 1000
        t0 = time.perf_counter()
        es = spade.evaluate_analyses(
            spark, analyses, config, k=k, h=h, early_stop=True
        )
        t_es = (time.perf_counter() - t0) * 1000
        n_total = len(es.es.survivors) + len(es.es.pruned) if es.es else 0
        pruned_pct = 100.0 * len(es.es.pruned) / n_total if n_total else 0.0
        base_keys = {r.key for r in base.topk}
        es_keys = {r.key for r in es.topk}
        acc = 100.0 * len(base_keys & es_keys) / max(1, len(base_keys))
        rows.append(
            Table4Row(
                dataset=name,
                k=k,
                t_mvd_ms=t_mvd,
                t_mvd_es_ms=t_es,
                gain_pct=100.0 * (t_mvd - t_es) / max(t_mvd, 1e-9),
                pruned_pct=pruned_pct,
                accuracy_pct=acc,
            )
        )
    if own_store:
        store.unpersist()
    return rows


def table4(
    spark: SparkSession,
    *,
    sf: float = 1.0,
    datasets: list[str] | None = None,
    ks: tuple[int, ...] = (3, 5, 10),
    config: SpadeConfig | None = None,
) -> pd.DataFrame:
    """The full Table 4 as a pandas frame."""
    rows = []
    for d in datasets or real_graphs.all_datasets():
        rows.extend(earlystop_effectiveness(spark, d, sf=sf, ks=ks, config=config))
    return pd.DataFrame([r.__dict__ for r in rows])
