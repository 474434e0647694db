"""Unit tests for RDFS saturation (implicit-triple materialization)."""
import pytest

from repro.rdf.saturation import saturate
from repro.rdf.triples import RDF_TYPE, triples_from_rows


def _triples(df):
    return {(r["s"], r["p"], r["o"]) for r in df.collect()}


def test_subclass_rule(spark):
    df = triples_from_rows(
        spark,
        [("n", RDF_TYPE, "CEO"), ("CEO", "rdfs:subClassOf", "BusinessPerson")],
    )
    got = _triples(saturate(df))
    assert ("n", RDF_TYPE, "BusinessPerson") in got


def test_subclass_transitive(spark):
    df = triples_from_rows(
        spark,
        [
            ("n", RDF_TYPE, "A"),
            ("A", "rdfs:subClassOf", "B"),
            ("B", "rdfs:subClassOf", "C"),
        ],
    )
    got = _triples(saturate(df))
    assert ("n", RDF_TYPE, "B") in got and ("n", RDF_TYPE, "C") in got


def test_subproperty_rule(spark):
    df = triples_from_rows(
        spark,
        [("n", "manages", "c"), ("manages", "rdfs:subPropertyOf", "worksWith")],
    )
    got = _triples(saturate(df))
    assert ("n", "worksWith", "c") in got


def test_domain_rule(spark):
    df = triples_from_rows(
        spark, [("n", "manages", "c"), ("manages", "rdfs:domain", "CEO")]
    )
    assert ("n", RDF_TYPE, "CEO") in _triples(saturate(df))


def test_range_rule(spark):
    df = triples_from_rows(
        spark, [("n", "manages", "c"), ("manages", "rdfs:range", "Company")]
    )
    assert ("c", RDF_TYPE, "Company") in _triples(saturate(df))


def test_domain_then_subclass_chain(spark):
    # Domain-derived type must itself propagate through subClassOf.
    df = triples_from_rows(
        spark,
        [
            ("n", "manages", "c"),
            ("manages", "rdfs:domain", "CEO"),
            ("CEO", "rdfs:subClassOf", "Person"),
        ],
    )
    got = _triples(saturate(df))
    assert ("n", RDF_TYPE, "Person") in got


def test_fixpoint_no_schema(spark):
    rows = [("a", "p", "b"), ("b", "q", "c")]
    df = triples_from_rows(spark, rows)
    assert _triples(saturate(df)) == set(rows)


def test_idempotent(spark):
    df = triples_from_rows(
        spark,
        [("n", RDF_TYPE, "A"), ("A", "rdfs:subClassOf", "B")],
    )
    once = saturate(df)
    twice = saturate(once)
    assert _triples(once) == _triples(twice)


def test_schema_triples_preserved(spark):
    df = triples_from_rows(spark, [("A", "rdfs:subClassOf", "B")])
    assert ("A", "rdfs:subClassOf", "B") in _triples(saturate(df))


def test_no_spurious_derivations(spark):
    df = triples_from_rows(
        spark,
        [("n", RDF_TYPE, "A"), ("A", "rdfs:subClassOf", "B"), ("m", RDF_TYPE, "C")],
    )
    got = _triples(saturate(df))
    assert ("m", RDF_TYPE, "B") not in got
