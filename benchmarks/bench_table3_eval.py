"""Benchmark for Table 3 / Figure 9 (R2-R3): MVDCube vs PGCube.

The paper reports MVDCube 20-80% faster than PGCube* and 30-83% faster
than PGCube^d on graphs with many aggregates. Compare the three
`test_eval_*` means; EXPERIMENTS.md records paper vs measured.
"""
from repro.core import spade


def _run(spark, prepared, evaluator):
    analyses, config = prepared
    return spade.evaluate_analyses(spark, analyses, config, evaluator=evaluator, k=10)


def test_eval_mvdcube(benchmark, spark, ceos_prepared):
    res = benchmark.pedantic(
        lambda: _run(spark, ceos_prepared, "mvdcube"), rounds=3, iterations=1,
        warmup_rounds=1,
    )
    assert len(res.arm) > 0


def test_eval_pgcube_star(benchmark, spark, ceos_prepared):
    res = benchmark.pedantic(
        lambda: _run(spark, ceos_prepared, "pgcube*"), rounds=3, iterations=1,
        warmup_rounds=1,
    )
    assert len(res.arm) > 0


def test_eval_pgcube_distinct(benchmark, spark, ceos_prepared):
    res = benchmark.pedantic(
        lambda: _run(spark, ceos_prepared, "pgcubed"), rounds=3, iterations=1,
        warmup_rounds=1,
    )
    assert len(res.arm) > 0
