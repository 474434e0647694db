"""Declarative schema for synthetic RDF graph generation.

A ``GraphSpec`` lists node classes; each class has a node count and a
set of ``PropertySpec``s. The generator (`generator.py`) turns a spec
into a deterministic triple set. The knobs mirror the graph
characteristics the paper's experiments depend on (DESIGN.md):
support (heterogeneity / missing values), multi-valuedness (drives
Lemma-1 errors), value kinds (categorical / numeric / text / ref —
drive derivations), cardinality (dimension eligibility), and planted
numeric outliers (drive interestingness).
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class PropertySpec:
    """One RDF property of a node class.

    kind:
      * ``categorical`` — values from a closed set of ``cardinality``
        labels (``<prefix><i>``);
      * ``numeric``     — floats uniform in ``value_range`` (rounded to
        2 decimals; integers if ``integer``), with ``outliers`` nodes
        planted at ``outlier_factor`` times the range top;
      * ``text``        — sentences built from per-language word pools
        (`generator.LANG_WORDS`), enabling kw()/lang() derivations;
      * ``ref``         — URIs of nodes of the ``target`` class,
        enabling path derivations.
    """

    name: str
    kind: str  # categorical | numeric | text | ref
    support: float = 1.0  # fraction of class nodes having >=1 value
    multi: tuple[int, int] = (1, 1)  # values per having node (min, max)
    cardinality: int = 10  # categorical: number of distinct labels
    value_range: tuple[float, float] = (0.0, 100.0)  # numeric
    integer: bool = False
    outliers: int = 0
    outlier_factor: float = 20.0
    languages: tuple[str, ...] = ("en",)
    target: str | None = None  # ref: class name
    prefix: str | None = None  # categorical label prefix (default: name)

    def __post_init__(self) -> None:
        assert self.kind in ("categorical", "numeric", "text", "ref"), self.kind
        assert 0.0 <= self.support <= 1.0
        assert 1 <= self.multi[0] <= self.multi[1]
        if self.kind == "ref":
            assert self.target, f"ref property {self.name} needs a target class"


@dataclass(frozen=True)
class NodeClassSpec:
    """A class of RDF nodes: ``count`` nodes typed ``name`` (if typed)."""

    name: str
    count: int
    properties: tuple[PropertySpec, ...] = field(default_factory=tuple)
    typed: bool = True


@dataclass(frozen=True)
class GraphSpec:
    """A full synthetic graph: a named list of node classes."""

    name: str
    classes: tuple[NodeClassSpec, ...]
    seed: int = 0

    def class_spec(self, name: str) -> NodeClassSpec:
        for c in self.classes:
            if c.name == name:
                return c
        raise KeyError(name)
