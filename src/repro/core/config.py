"""Configuration knobs of the Spade pipeline.

Defaults follow the paper where it states values (N <= 4 lattice dims;
dimensions must be frequent with bounded distinct counts; early-stop
sample size 60 in 2 batches, Section 6.4) and are otherwise sized for
laptop-scale graphs.
"""
from __future__ import annotations

from dataclasses import dataclass, field

#: Aggregate functions Ω = {count, min, max, sum, avg} (Section 2).
ALL_FUNCS = ("count", "min", "max", "sum", "avg")

#: The pseudo-measure for fact counting: count(*) counts distinct CFs.
COUNT_STAR = "*"


@dataclass
class SpadeConfig:
    """All knobs of the pipeline, grouped by step."""

    # -- Step 1: CFS selection ---------------------------------------------
    min_cfs_size: int = 20  # CFSs smaller than this are not analyzed
    max_cfss: int | None = 8  # analyze at most this many CFSs (largest first)

    # -- Steps 2-3: attribute analysis + aggregate enumeration -------------
    min_support_frac: float = 0.5  # dims & measures must cover >= this frac of CFS
    max_dim_distinct: int = 100  # "at most 100 values" => good dimension (§6.5)
    max_dim_distinct_frac: float = 0.5  # and <= this fraction of |CFS| (§3 rule ii)
    max_lattice_dims: int = 3  # N ∈ {1,2,3,4} in the paper; 3 keeps 2^N small
    mfs_min_support_frac: float = 0.5  # maximal-frequent-set threshold
    funcs: tuple[str, ...] = ("count", "sum", "avg", "min", "max")
    max_measures_per_lattice: int | None = 6
    max_lattices_per_cfs: int | None = 6

    # -- derivations (offline attribute analysis) --------------------------
    enable_derivations: bool = True
    text_frac_threshold: float = 0.5  # values containing spaces => text property
    ref_frac_threshold: float = 0.8  # objects that are graph nodes => ref property
    max_paths: int = 40  # cap on length-1 path derivations (by support)
    kw_min_len: int = 4  # minimum keyword length for kw() derivation
    multi_count_threshold: int = 1  # #multi-valued subjects to enable count()

    # -- Step 4: early-stop (Section 5; values from §6.4) ------------------
    es_sample_size: int = 60
    es_batches: int = 2
    es_alpha: float = 0.05
    es_patience: int = 2

    seed: int = 0

    # user-specified property sets for property-based CFSs (Step 1 (ii))
    property_cfss: tuple[tuple[str, ...], ...] = field(default_factory=tuple)
