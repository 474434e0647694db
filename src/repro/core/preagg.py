"""Pre-aggregated measures (offline phase; Sections 3 and 4.3).

For each (CF, measure) pair we store the aggregated values the paper
pre-computes offline: ``cnt``, ``sum``, ``min``, ``max`` of the
measure's values on that fact (``avg`` is derived as sum/cnt at query
time). These per-CF pre-aggregates make group-level aggregation correct
for facts with multiple measure values, and are *shared across all
lattices of a CFS* (Measure Loading): one wide cached DataFrame

    (cf, m0_cnt, m0_sum, m0_min, m0_max, m1_cnt, ...)

indexed by measure *position* so arbitrary attribute names (e.g.
``company/area``) never leak into column names.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import reduce

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.attributes import Attribute


@dataclass(frozen=True)
class PreAggregatedMeasures:
    """The wide per-CF measure frame plus the name <-> position map."""

    df: DataFrame  # (cf, m{i}_{cnt|sum|min|max} ...)
    measures: tuple[str, ...]  # measure attribute names, by position

    def index_of(self, measure: str) -> int:
        return self.measures.index(measure)

    def columns_for(self, measure: str) -> dict[str, str]:
        i = self.index_of(measure)
        return {f: f"m{i}_{f}" for f in ("cnt", "sum", "min", "max")}

    def unpersist(self) -> None:
        self.df.unpersist()


def preaggregate(measure_attrs: list[Attribute]) -> PreAggregatedMeasures:
    """Build the wide pre-aggregated measure frame for a measure set.

    Values are cast to double; non-castable values are dropped (the
    enumeration rules only admit numeric measures, so this only guards
    against stray dirty values).
    """
    assert measure_attrs, "need at least one measure"
    frames = []
    for i, attr in enumerate(measure_attrs):
        v = F.col("o").try_cast("double")  # ANSI-safe: dirty values -> NULL
        per_cf = (
            attr.df.select(F.col("s").alias("cf"), v.alias("v"))
            .filter(F.col("v").isNotNull())
            .groupBy("cf")
            .agg(
                F.count("v").alias(f"m{i}_cnt"),
                F.sum("v").alias(f"m{i}_sum"),
                F.min("v").alias(f"m{i}_min"),
                F.max("v").alias(f"m{i}_max"),
            )
        )
        frames.append(per_cf)
    wide = reduce(lambda a, b: a.join(b, "cf", "outer"), frames)
    return PreAggregatedMeasures(
        df=wide.cache(), measures=tuple(a.name for a in measure_attrs)
    )
