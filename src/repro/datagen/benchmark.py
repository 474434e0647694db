"""The paper's synthetic scalability benchmark (Section 6.5).

Graphs with |CFS| facts, N dimensions, M measures; every property is
numeric-valued; each dimension ``D_i`` takes at most ``|D_i|`` distinct
values (<= 100, so all are "good dimensions"); fact placement in the
multidimensional space follows a sparsity coefficient ``s`` in [0, 1]
as in [1]: only ~``s * prod(|D_i|)`` cells are occupied, facts being
assigned uniformly among the occupied cells. Each fact has exactly one
value per dimension, so PGCube is correct on these graphs — exactly
the setting the paper needs for Experiments 5 and 6.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.rdf.triples import RDF_TYPE, TripleStore, triples_from_pandas


def benchmark_pandas(
    *,
    n_facts: int,
    dim_cards: tuple[int, ...],
    n_measures: int,
    sparsity: float = 0.1,
    seed: int = 7,
) -> pd.DataFrame:
    """Triples of one benchmark graph as a pandas (s, p, o) frame."""
    assert 0.0 < sparsity <= 1.0
    assert all(1 <= c <= 100 for c in dim_cards)
    rng = np.random.default_rng(seed)
    ids = np.array([f"Fact{i}" for i in range(n_facts)], dtype=object)
    total_cells = int(np.prod(dim_cards))
    n_occupied = max(1, min(total_cells, int(round(sparsity * total_cells))))
    occupied = rng.choice(total_cells, size=n_occupied, replace=False)
    cells = occupied[rng.integers(0, n_occupied, size=n_facts)]

    frames = [pd.DataFrame({"s": ids, "p": RDF_TYPE, "o": "Fact"})]
    # Decode the linear cell index into one value per dimension.
    remainder = cells
    for i, card in enumerate(dim_cards):
        vals = remainder % card
        remainder = remainder // card
        frames.append(
            pd.DataFrame({"s": ids, "p": f"d{i}", "o": [f"v{v}" for v in vals]})
        )
    for j in range(n_measures):
        vals = rng.uniform(0, 1000, size=n_facts).round(2)
        frames.append(
            pd.DataFrame({"s": ids, "p": f"m{j}", "o": [str(v) for v in vals]})
        )
    return pd.concat(frames, ignore_index=True)


def build_benchmark(
    spark: SparkSession,
    *,
    n_facts: int,
    dim_cards: tuple[int, ...],
    n_measures: int,
    sparsity: float = 0.1,
    seed: int = 7,
) -> TripleStore:
    """Generate one benchmark TripleStore (see module docstring)."""
    pdf = benchmark_pandas(
        n_facts=n_facts,
        dim_cards=dim_cards,
        n_measures=n_measures,
        sparsity=sparsity,
        seed=seed,
    )
    name = "bench-" + ":".join(str(c) for c in dim_cards)
    return TripleStore(triples_from_pandas(spark, pdf), name=name)
