"""Candidate Fact Set Selection (Section 3, Step 1).

Three strategies, as in the paper:
  (i)   type-based     — all nodes of each rdf:type;
  (ii)  property-based — all nodes having a user-specified set of
                         outgoing properties;
  (iii) summary-based  — each equivalence class of the structural
                         summary (RDFQuotient substrate).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame

from repro.core.config import SpadeConfig
from repro.rdf.summary import StructuralSummary
from repro.rdf.triples import TripleStore


@dataclass(frozen=True)
class CandidateFactSet:
    """A named set of candidate facts (single-column frame ``cf``)."""

    name: str
    df: DataFrame
    size: int
    source: str  # type | property | summary


def select_cfss(
    store: TripleStore,
    summary: StructuralSummary | None,
    config: SpadeConfig,
) -> list[CandidateFactSet]:
    """Enumerate all CFSs; the analyzed subset is capped downstream.

    Returned sorted by decreasing size (ties by name) so callers that
    cap at ``config.max_cfss`` analyze the largest populations first,
    mirroring the paper's preference for well-supported fact sets.
    """
    out: list[CandidateFactSet] = []
    for t in store.types():
        df = store.nodes_of_type(t).cache()
        out.append(CandidateFactSet(f"type:{t}", df, df.count(), "type"))
    for props in config.property_cfss:
        df = store.subjects_with_properties(list(props)).cache()
        out.append(
            CandidateFactSet("props:" + "+".join(props), df, df.count(), "property")
        )
    if summary is not None:
        for cls in summary.classes:
            if cls.size < config.min_cfs_size:
                continue
            df = summary.members(cls.class_id).cache()
            out.append(
                CandidateFactSet(f"summary:{cls.class_id}", df, cls.size, "summary")
            )
    return sorted(out, key=lambda c: (-c.size, c.name))


def analyzable(cfss: list[CandidateFactSet], config: SpadeConfig) -> list[CandidateFactSet]:
    """The CFSs actually analyzed: large enough, capped in number."""
    big = [c for c in cfss if c.size >= config.min_cfs_size]
    return big[: config.max_cfss] if config.max_cfss else big
