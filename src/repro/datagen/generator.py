"""Deterministic RDF triple generation from a ``GraphSpec``.

Triples are built vectorized in pandas/numpy and loaded into one Spark
DataFrame; generation is deterministic in ``GraphSpec.seed`` so the
DuckDB oracle and repeated runs see identical input.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datagen.schema import GraphSpec, NodeClassSpec, PropertySpec
from repro.rdf.triples import RDF_TYPE, TripleStore, triples_from_pandas

# Word pools per language. The first words are stopwords the language
# tagger keys on (`derived.LANG_STOPWORDS`); the longer words become
# extractable keywords.
LANG_WORDS: dict[str, list[str]] = {
    "en": (
        "the and of with for from this that".split()
        + "petroleum production finance energy shipping aviation mining research".split()
    ),
    "fr": (
        "le la et de avec pour dans une".split()
        + "petrole production finance energie transport aviation recherche industrie".split()
    ),
}


def node_ids(cls: NodeClassSpec) -> np.ndarray:
    """URIs of a class's nodes: ``<ClassName><i>``."""
    return np.array([f"{cls.name}{i}" for i in range(cls.count)], dtype=object)


def _value_pool(prop: PropertySpec, spec: GraphSpec) -> np.ndarray:
    """The closed value universe for categorical / ref properties."""
    if prop.kind == "categorical":
        prefix = prop.prefix if prop.prefix is not None else prop.name
        return np.array([f"{prefix}_{i}" for i in range(prop.cardinality)], dtype=object)
    if prop.kind == "ref":
        return node_ids(spec.class_spec(prop.target))
    raise ValueError(prop.kind)


def _text_value(rng: np.random.Generator, lang: str) -> str:
    words = LANG_WORDS[lang]
    n = int(rng.integers(5, 10))
    return " ".join(rng.choice(words, size=n))


def _gen_property(
    rng: np.random.Generator,
    spec: GraphSpec,
    cls: NodeClassSpec,
    prop: PropertySpec,
) -> tuple[list[str], list[str]]:
    """Generate (subjects, objects) for one property of one class."""
    ids = node_ids(cls)
    n_have = int(round(prop.support * cls.count))
    if n_have == 0:
        return [], []
    have = rng.choice(ids, size=n_have, replace=False)
    subjects: list[str] = []
    objects: list[str] = []
    lo, hi = prop.multi
    counts = rng.integers(lo, hi + 1, size=n_have)
    if prop.kind in ("categorical", "ref"):
        pool = _value_pool(prop, spec)
        for s, k in zip(have, counts):
            k = min(int(k), len(pool))
            vals = rng.choice(pool, size=k, replace=False)
            subjects.extend([s] * k)
            objects.extend(vals.tolist())
    elif prop.kind == "numeric":
        vlo, vhi = prop.value_range
        for i, (s, k) in enumerate(zip(have, counts)):
            vals = rng.uniform(vlo, vhi, size=int(k))
            # Planted outliers: the first `outliers` having nodes get
            # values scaled far beyond the range top, so the aggregates
            # over this measure deviate strongly from uniform.
            if i < prop.outliers:
                vals = vals + (vhi - vlo) * prop.outlier_factor
            if prop.integer:
                vals = np.floor(vals)
                objects.extend(str(int(v)) for v in vals)
            else:
                objects.extend(str(round(float(v), 2)) for v in vals)
            subjects.extend([s] * int(k))
    elif prop.kind == "text":
        for s, k in zip(have, counts):
            for _ in range(int(k)):
                lang = prop.languages[int(rng.integers(0, len(prop.languages)))]
                subjects.append(s)
                objects.append(_text_value(rng, lang))
    else:  # pragma: no cover - schema validates kinds
        raise ValueError(prop.kind)
    return subjects, objects


def generate_pandas(spec: GraphSpec) -> pd.DataFrame:
    """Generate the triple set of a GraphSpec as a pandas (s, p, o) frame."""
    rng = np.random.default_rng(spec.seed)
    frames: list[pd.DataFrame] = []
    for cls in spec.classes:
        ids = node_ids(cls)
        if cls.typed:
            frames.append(pd.DataFrame({"s": ids, "p": RDF_TYPE, "o": cls.name}))
        for prop in cls.properties:
            s, o = _gen_property(rng, spec, cls, prop)
            if s:
                frames.append(pd.DataFrame({"s": s, "p": prop.name, "o": o}))
    out = pd.concat(frames, ignore_index=True)
    return out.drop_duplicates(ignore_index=True)


def generate(spark: SparkSession, spec: GraphSpec) -> TripleStore:
    """Generate a TripleStore for a GraphSpec."""
    return TripleStore(triples_from_pandas(spark, generate_pandas(spec)), name=spec.name)
