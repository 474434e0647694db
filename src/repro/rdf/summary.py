"""Structural summary of an RDF graph (RDFQuotient substrate).

The paper's offline phase builds a structural summary with RDFQuotient
[22]: a quotient graph whose node groups are equivalence classes of RDF
nodes. We implement the *characteristic-set* quotient — two nodes are
equivalent iff they have exactly the same set of outgoing properties —
which is the property-cliques-free core of RDFQuotient's "strong"
equivalence and exactly what Spade consumes from the summary:

* the set of all properties in the graph,
* groups of nodes "considered equivalent" (summary-based CFSs),
* per-group property sets (used to expedite attribute enumeration).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.rdf.triples import RDF_TYPE, TripleStore


@dataclass(frozen=True)
class SummaryClass:
    """One equivalence class of the structural summary."""

    class_id: int
    properties: frozenset[str]  # outgoing property set (rdf:type excluded)
    size: int  # number of member nodes


class StructuralSummary:
    """Characteristic-set summary: node groups by outgoing property set."""

    def __init__(self, store: TripleStore):
        self._store = store
        # (s, cs) where cs is the sorted concatenation of outgoing props.
        cs = (
            store.triples.filter(F.col("p") != RDF_TYPE)
            .groupBy("s")
            .agg(F.sort_array(F.collect_set("p")).alias("props"))
            .withColumn("cs", F.concat_ws("\x1f", F.col("props")))
        )
        self._node_cs = cs.select("s", "cs").cache()
        sizes = (
            cs.groupBy("cs")
            .agg(F.count("*").alias("size"), F.first("props").alias("props"))
            .collect()
        )
        # Deterministic class ids: order by descending size then cs text.
        ordered = sorted(sizes, key=lambda r: (-r["size"], r["cs"]))
        self.classes: list[SummaryClass] = [
            SummaryClass(i, frozenset(r["props"]), r["size"])
            for i, r in enumerate(ordered)
        ]
        self._cs_by_id = {c.class_id: "\x1f".join(sorted(c.properties)) for c in self.classes}

    def num_classes(self) -> int:
        return len(self.classes)

    def members(self, class_id: int) -> DataFrame:
        """Single-column frame ``cf`` with the members of one class."""
        cs = self._cs_by_id[class_id]
        return (
            self._node_cs.filter(F.col("cs") == cs)
            .select(F.col("s").alias("cf"))
        )

    def all_properties(self) -> frozenset[str]:
        """Union of the property sets of all classes."""
        out: set[str] = set()
        for c in self.classes:
            out |= c.properties
        return frozenset(out)

    def unpersist(self) -> None:
        self._node_cs.unpersist()
