"""RDFS saturation: materialize implicit triples before analysis.

The paper (Section 2) assumes the graph is saturated w.r.t. its
ontology prior to analysis, citing [23] (Goasdoué et al., EDBT 2013).
We implement the four core RDFS entailment rules used there, iterated
to a fixpoint with DataFrame joins:

* ``rdfs:subClassOf``    — (s type C1), (C1 subClassOf C2)  => (s type C2)
* ``rdfs:subPropertyOf`` — (s p1 o), (p1 subPropertyOf p2)  => (s p2 o)
* ``rdfs:domain``        — (s p o), (p domain C)            => (s type C)
* ``rdfs:range``         — (s p o), (p range C)             => (o type C)

Schema triples (whose property is one of the four above) are kept in
the output but are excluded from fact-level analysis because their
subjects are classes/properties, not candidate facts. Transitivity of
subClassOf/subPropertyOf is obtained by the fixpoint itself.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.rdf.triples import RDF_TYPE

RDFS_SUBCLASS = "rdfs:subClassOf"
RDFS_SUBPROPERTY = "rdfs:subPropertyOf"
RDFS_DOMAIN = "rdfs:domain"
RDFS_RANGE = "rdfs:range"
SCHEMA_PROPERTIES = (RDFS_SUBCLASS, RDFS_SUBPROPERTY, RDFS_DOMAIN, RDFS_RANGE)


def _schema_pairs(triples: DataFrame, prop: str) -> DataFrame:
    return (
        triples.filter(F.col("p") == prop)
        .select(F.col("s").alias("a"), F.col("o").alias("b"))
        .distinct()
    )


def _one_round(triples: DataFrame) -> DataFrame:
    """One application of all four rules; returns candidate new triples."""
    sub_class = _schema_pairs(triples, RDFS_SUBCLASS)
    sub_prop = _schema_pairs(triples, RDFS_SUBPROPERTY)
    domain = _schema_pairs(triples, RDFS_DOMAIN)
    rng = _schema_pairs(triples, RDFS_RANGE)
    facts = triples.filter(~F.col("p").isin(list(SCHEMA_PROPERTIES)))

    by_subclass = (
        facts.filter(F.col("p") == RDF_TYPE)
        .join(sub_class, facts["o"] == sub_class["a"])
        .select("s", F.lit(RDF_TYPE).alias("p"), F.col("b").alias("o"))
    )
    by_subprop = (
        facts.join(sub_prop, facts["p"] == sub_prop["a"])
        .select("s", F.col("b").alias("p"), "o")
    )
    by_domain = (
        facts.filter(F.col("p") != RDF_TYPE)
        .join(domain, facts["p"] == domain["a"])
        .select("s", F.lit(RDF_TYPE).alias("p"), F.col("b").alias("o"))
    )
    by_range = (
        facts.filter(F.col("p") != RDF_TYPE)
        .join(rng, facts["p"] == rng["a"])
        .select(F.col("o").alias("s"), F.lit(RDF_TYPE).alias("p"), F.col("b").alias("o"))
    )
    return by_subclass.unionByName(by_subprop).unionByName(by_domain).unionByName(by_range)


def saturate(triples: DataFrame, *, max_rounds: int = 10) -> DataFrame:
    """Saturate the graph; returns the closed triple frame (distinct).

    Iterates rule application until no new triples appear (the paper's
    finite-saturation assumption) or ``max_rounds`` is hit. Each round
    localizes its result with a count so the lineage does not grow
    unboundedly.
    """
    current = triples.distinct().cache()
    n = current.count()
    for _ in range(max_rounds):
        grown = current.unionByName(_one_round(current)).distinct().cache()
        m = grown.count()
        current.unpersist()
        current = grown
        if m == n:
            break
        n = m
    return current
