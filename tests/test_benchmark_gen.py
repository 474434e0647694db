"""Unit tests for the Section 6.5 synthetic benchmark generator."""
import numpy as np
import pandas as pd
import pytest

from repro.datagen.benchmark import benchmark_pandas
from repro.rdf.triples import RDF_TYPE


def _gen(**kw):
    base = dict(n_facts=500, dim_cards=(10, 5, 2), n_measures=3, sparsity=0.5)
    base.update(kw)
    return benchmark_pandas(**base)


def test_triple_count():
    pdf = _gen()
    # type + 3 dims + 3 measures per fact.
    assert len(pdf) == 500 * (1 + 3 + 3)


def test_single_valued_dimensions():
    pdf = _gen()
    for i in range(3):
        per_s = pdf[pdf["p"] == f"d{i}"].groupby("s").size()
        assert per_s.max() == 1, "benchmark facts must be single-valued (PGCube-correct)"


def test_dimension_cardinality_bounds():
    pdf = _gen()
    for i, card in enumerate((10, 5, 2)):
        assert pdf[pdf["p"] == f"d{i}"]["o"].nunique() <= card


def test_sparsity_controls_occupied_cells():
    dense = _gen(sparsity=1.0, n_facts=5000)
    sparse = _gen(sparsity=0.1, n_facts=5000)

    def cells(pdf):
        dims = [
            pdf[pdf["p"] == f"d{i}"].set_index("s")["o"] for i in range(3)
        ]
        return pd.concat(dims, axis=1).apply(tuple, axis=1).nunique()

    assert cells(sparse) <= int(0.1 * 100) + 1
    assert cells(dense) > cells(sparse)


def test_measures_numeric():
    pdf = _gen()
    vals = pdf[pdf["p"] == "m0"]["o"].astype(float)
    assert ((vals >= 0) & (vals <= 1000)).all()


def test_all_facts_typed():
    pdf = _gen()
    assert (pdf["p"] == RDF_TYPE).sum() == 500


def test_deterministic_in_seed():
    pd.testing.assert_frame_equal(_gen(seed=9), _gen(seed=9))
    assert not _gen(seed=9).equals(_gen(seed=10))


def test_full_support():
    pdf = _gen()
    for p in ("d0", "d1", "d2", "m0", "m1", "m2"):
        assert pdf[pdf["p"] == p]["s"].nunique() == 500
