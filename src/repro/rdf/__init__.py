"""RDF substrate: triple store, RDFS saturation, structural summary."""
from repro.rdf.triples import TRIPLE_SCHEMA, TripleStore, triples_from_pandas

__all__ = ["TRIPLE_SCHEMA", "TripleStore", "triples_from_pandas"]
