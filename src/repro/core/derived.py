"""Derived Property Enumeration (Section 3, offline phase).

From the offline per-property statistics we decide, per direct
property, which derivations to generate:

* ``count(a)``  — number of values of a multi-valued property ``a``;
* ``kw(a)``     — keywords occurring in the values of a text property;
* ``lang(a)``   — language of a text property (stopword tagger);
* ``a/b``       — length-1 paths: value of ``b`` on the nodes referred
                  to by ``a`` (``a`` must be a *ref* property).

Each derived property is an ordinary ``Attribute`` whose ``df`` is a
lazy DataFrame over the cached triple frame; statistics are computed
by the same Offline/Online Attribute Analysis as direct properties.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import functions as F

from repro.core.attributes import Attribute, AttributeStats
from repro.core.config import SpadeConfig
from repro.rdf.triples import TripleStore

#: Stopword lists keyed by language tag — the tagger assigns the
#: language with the most stopword hits (ties broken in key order).
LANG_STOPWORDS: dict[str, tuple[str, ...]] = {
    "en": ("the", "and", "of", "with", "for", "from", "this", "that"),
    "fr": ("le", "la", "et", "de", "avec", "pour", "dans", "une"),
}

#: Words never emitted as keywords (union of all language stopwords).
_ALL_STOPWORDS = tuple(w for ws in LANG_STOPWORDS.values() for w in ws)


@dataclass(frozen=True)
class DerivationCounts:
    """How many derived properties of each kind were generated —
    the #DP columns of the paper's Table 2."""

    kw: int = 0
    lang: int = 0
    count: int = 0
    path: int = 0

    @property
    def total(self) -> int:
        return self.kw + self.lang + self.count + self.path


def direct_attributes(store: TripleStore) -> list[Attribute]:
    """One Attribute per direct property of the graph (P in Table 2)."""
    return [
        Attribute(name=p, df=store.property_table(p), kind="direct")
        for p in store.properties()
    ]


def count_attribute(store: TripleStore, prop: str) -> Attribute:
    """count(a): per-subject number of values of ``a`` (as a string)."""
    df = (
        store.property_table(prop)
        .groupBy("s")
        .agg(F.count("o").cast("string").alias("o"))
    )
    return Attribute(
        name=f"count({prop})", df=df, kind="count", derived_from=frozenset([prop])
    )


def _tokens(col):
    return F.split(F.lower(col), r"[^a-z]+")


def kw_attribute(store: TripleStore, prop: str, *, min_len: int = 4) -> Attribute:
    """kw(a): keywords (long non-stopword tokens) of a text property."""
    df = (
        store.property_table(prop)
        .select("s", F.explode(_tokens(F.col("o"))).alias("o"))
        .filter(F.length("o") >= min_len)
        .filter(~F.col("o").isin(list(_ALL_STOPWORDS)))
        .distinct()
    )
    return Attribute(
        name=f"kw({prop})", df=df, kind="kw", derived_from=frozenset([prop])
    )


def lang_attribute(store: TripleStore, prop: str) -> Attribute:
    """lang(a): per-value language via stopword hits, at most one tag
    per value; a subject may still be multi-tagged across values."""
    toks = _tokens(F.col("o"))
    hit_cols = {
        lang: F.size(F.array_intersect(toks, F.array(*[F.lit(w) for w in words])))
        for lang, words in LANG_STOPWORDS.items()
    }
    # argmax over languages with a when-chain (key order breaks ties).
    langs = list(hit_cols)
    expr = F.lit(None).cast("string")
    for lang in reversed(langs):
        cond = hit_cols[lang] > 0
        for other in langs:
            if langs.index(other) < langs.index(lang):
                cond = cond & (hit_cols[lang] > hit_cols[other])
            elif other != lang:
                cond = cond & (hit_cols[lang] >= hit_cols[other])
        expr = F.when(cond, F.lit(lang)).otherwise(expr)
    df = (
        store.property_table(prop)
        .select("s", expr.alias("o"))
        .filter(F.col("o").isNotNull())
        .distinct()
    )
    return Attribute(
        name=f"lang({prop})", df=df, kind="lang", derived_from=frozenset([prop])
    )


def path_attribute(store: TripleStore, ref_prop: str, target_prop: str) -> Attribute:
    """a/b: follow ref property ``a`` then read property ``b``."""
    ta = store.property_table(ref_prop).select("s", F.col("o").alias("mid"))
    tb = store.property_table(target_prop).select(
        F.col("s").alias("mid"), F.col("o").alias("o")
    )
    df = ta.join(tb, "mid").select("s", "o").distinct()
    return Attribute(
        name=f"{ref_prop}/{target_prop}",
        df=df,
        kind="path",
        derived_from=frozenset([ref_prop, target_prop]),
    )


def enumerate_path_pairs(store: TripleStore, ref_props: list[str]) -> list[tuple[str, str, int]]:
    """(a, b, support) for every length-1 path a/b with a in ref_props,
    b a non-type property of a's target nodes. One Spark job."""
    if not ref_props:
        return []
    t = store.triples.filter(F.col("p") != "rdf:type")
    ta = t.filter(F.col("p").isin(ref_props)).select(
        F.col("p").alias("pa"), "s", F.col("o").alias("mid")
    )
    tb = t.select(F.col("s").alias("mid"), F.col("p").alias("pb"))
    pairs = (
        ta.join(tb, "mid")
        .groupBy("pa", "pb")
        .agg(F.countDistinct("s").alias("support"))
        .collect()
    )
    return sorted(
        ((r["pa"], r["pb"], r["support"]) for r in pairs),
        key=lambda x: (-x[2], x[0], x[1]),
    )


def derive_attributes(
    store: TripleStore,
    offline_stats: dict[str, AttributeStats],
    config: SpadeConfig,
) -> tuple[list[Attribute], DerivationCounts]:
    """Generate all derived attributes per the offline decision rules."""
    if not config.enable_derivations:
        return [], DerivationCounts()
    counts = {"kw": 0, "lang": 0, "count": 0, "path": 0}
    out: list[Attribute] = []
    ref_props: list[str] = []
    for prop, st in sorted(offline_stats.items()):
        if st.multi_count >= config.multi_count_threshold:
            out.append(count_attribute(store, prop))
            counts["count"] += 1
        is_text = (not st.is_numeric) and st.text_frac >= config.text_frac_threshold
        if is_text:
            out.append(kw_attribute(store, prop, min_len=config.kw_min_len))
            out.append(lang_attribute(store, prop))
            counts["kw"] += 1
            counts["lang"] += 1
        if st.ref_frac >= config.ref_frac_threshold and not st.is_numeric:
            ref_props.append(prop)
    for pa, pb, _support in enumerate_path_pairs(store, ref_props)[: config.max_paths]:
        # Only expand paths whose endpoint is not itself a ref/text blob:
        # length-1 paths to categorical/numeric values (paper's Table 2
        # counts length-1 paths as "the most numerous").
        end_stats = offline_stats.get(pb)
        if end_stats is None or end_stats.ref_frac >= config.ref_frac_threshold:
            continue
        out.append(path_attribute(store, pa, pb))
        counts["path"] += 1
    return out, DerivationCounts(**counts)
