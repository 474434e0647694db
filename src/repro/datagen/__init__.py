"""Synthetic RDF graph generators (dataset substrate; see DESIGN.md)."""
from repro.datagen.schema import GraphSpec, NodeClassSpec, PropertySpec
from repro.datagen.generator import generate

__all__ = ["GraphSpec", "NodeClassSpec", "PropertySpec", "generate"]
