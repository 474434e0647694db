"""Unit tests for the synthetic RDF graph generator and dataset specs."""
import numpy as np
import pandas as pd
import pytest

from repro.datagen import real_graphs
from repro.datagen.generator import LANG_WORDS, generate_pandas, node_ids
from repro.datagen.schema import GraphSpec, NodeClassSpec, PropertySpec
from repro.rdf.triples import RDF_TYPE


def _spec(prop: PropertySpec, count: int = 50, extra_classes=()) -> GraphSpec:
    return GraphSpec(
        "t",
        classes=(NodeClassSpec("N", count, (prop,)),) + tuple(extra_classes),
        seed=7,
    )


def _prop_rows(pdf: pd.DataFrame, prop: str) -> pd.DataFrame:
    return pdf[pdf["p"] == prop]


def test_deterministic():
    spec = _spec(PropertySpec("c", "categorical", cardinality=5))
    a, b = generate_pandas(spec), generate_pandas(spec)
    pd.testing.assert_frame_equal(a, b)


def test_type_triples_emitted():
    spec = _spec(PropertySpec("c", "categorical"))
    pdf = generate_pandas(spec)
    types = _prop_rows(pdf, RDF_TYPE)
    assert len(types) == 50 and set(types["o"]) == {"N"}


def test_untyped_class():
    spec = GraphSpec(
        "t", (NodeClassSpec("N", 10, (PropertySpec("c", "categorical"),), typed=False),)
    )
    pdf = generate_pandas(spec)
    assert (pdf["p"] == RDF_TYPE).sum() == 0


def test_support_fraction():
    spec = _spec(PropertySpec("c", "categorical", support=0.5), count=100)
    pdf = generate_pandas(spec)
    assert _prop_rows(pdf, "c")["s"].nunique() == 50


def test_single_valued_by_default():
    spec = _spec(PropertySpec("c", "categorical", cardinality=10))
    rows = _prop_rows(generate_pandas(spec), "c")
    assert rows.groupby("s").size().max() == 1


def test_multi_valued_counts_in_range():
    spec = _spec(PropertySpec("c", "categorical", cardinality=10, multi=(2, 4)))
    per_s = _prop_rows(generate_pandas(spec), "c").groupby("s").size()
    assert per_s.min() >= 2 and per_s.max() <= 4


def test_multi_values_distinct_per_subject():
    spec = _spec(PropertySpec("c", "categorical", cardinality=10, multi=(3, 3)))
    rows = _prop_rows(generate_pandas(spec), "c")
    assert rows.groupby("s")["o"].nunique().min() == 3


def test_categorical_cardinality_bound():
    spec = _spec(PropertySpec("c", "categorical", cardinality=4), count=200)
    assert _prop_rows(generate_pandas(spec), "c")["o"].nunique() <= 4


def test_numeric_range_and_outliers():
    spec = _spec(
        PropertySpec("m", "numeric", value_range=(0, 10), outliers=2,
                     outlier_factor=50)
    )
    vals = _prop_rows(generate_pandas(spec), "m")["o"].astype(float)
    n_out = (vals > 10).sum()
    assert n_out == 2 and vals.max() > 400


def test_numeric_integer_flag():
    spec = _spec(PropertySpec("m", "numeric", integer=True, value_range=(0, 9)))
    vals = _prop_rows(generate_pandas(spec), "m")["o"]
    assert all(v == str(int(float(v))) for v in vals)


def test_ref_targets_exist():
    target = NodeClassSpec("C", 20, (PropertySpec("a", "categorical"),))
    spec = GraphSpec(
        "t",
        (
            NodeClassSpec("N", 30, (PropertySpec("r", "ref", target="C"),)),
            target,
        ),
        seed=3,
    )
    pdf = generate_pandas(spec)
    refs = set(_prop_rows(pdf, "r")["o"])
    assert refs <= set(node_ids(target))


def test_text_uses_language_pools():
    spec = _spec(PropertySpec("t", "text", languages=("fr",)))
    texts = _prop_rows(generate_pandas(spec), "t")["o"]
    fr_words = set(LANG_WORDS["fr"])
    assert all(set(t.split()) <= fr_words for t in texts)


def test_no_duplicate_triples():
    spec = _spec(PropertySpec("c", "categorical", cardinality=3, multi=(1, 2)))
    pdf = generate_pandas(spec)
    assert not pdf.duplicated().any()


@pytest.mark.parametrize("name", real_graphs.all_datasets())
def test_real_graph_specs_generate(name):
    pdf = generate_pandas(real_graphs.SPEC_FACTORIES[name](0.05))
    assert len(pdf) > 50
    assert set(pdf.columns) == {"s", "p", "o"}


def test_airline_has_no_multivalued_or_text_or_ref():
    spec = real_graphs.airline_spec(0.1)
    for cls in spec.classes:
        for prop in cls.properties:
            assert prop.multi == (1, 1)
            assert prop.kind in ("categorical", "numeric")


def test_ceos_is_multivalued_and_linked():
    spec = real_graphs.ceos_spec(0.1)
    ceo = spec.class_spec("CEO")
    kinds = {p.kind for p in ceo.properties}
    assert "ref" in kinds and "text" in kinds
    assert any(p.multi[1] > 1 for p in ceo.properties)
