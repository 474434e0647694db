"""Benchmark for Table 4 (R6): MVDCube with and without early-stop.

The paper reports 10-43% evaluation-time gains with up to ~70-96% of
aggregates pruned. Compare `test_mvdcube_plain` vs
`test_mvdcube_early_stop`; EXPERIMENTS.md records paper vs measured.
"""
from repro.core import spade


def test_mvdcube_plain(benchmark, spark, ceos_prepared):
    analyses, config = ceos_prepared
    res = benchmark.pedantic(
        lambda: spade.evaluate_analyses(spark, analyses, config, k=5),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert len(res.arm) > 0


def test_mvdcube_early_stop(benchmark, spark, ceos_prepared):
    analyses, config = ceos_prepared
    res = benchmark.pedantic(
        lambda: spade.evaluate_analyses(
            spark, analyses, config, k=5, early_stop=True
        ),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert res.es is not None
