"""Synthetic analogs of the paper's six real RDF graphs (Table 2).

The real graphs (Airline, CEOs, DBLP, Foodista, NASA, Nobel) are not
available offline; each generator below is a scaled-down synthetic
equivalent preserving the characteristics the experiments depend on —
see DESIGN.md § "Dataset substitutions". ``sf`` linearly scales node
counts (sf=1.0 ≈ a few thousand facts, laptop scale).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.datagen.generator import generate
from repro.datagen.schema import GraphSpec, NodeClassSpec, PropertySpec
from repro.rdf.triples import TripleStore


def _n(base: int, sf: float) -> int:
    return max(5, int(round(base * sf)))


def airline_spec(sf: float = 1.0, seed: int = 101) -> GraphSpec:
    """Airline [24]: originally relational — one CFS, fixed single-valued
    numeric-heavy schema; *no* derivations apply (Table 2's woD == wD)."""
    return GraphSpec(
        "Airline",
        classes=(
            NodeClassSpec(
                "Flight",
                count=_n(2000, sf),
                properties=(
                    PropertySpec("carrier", "categorical", cardinality=18),
                    PropertySpec("month", "categorical", cardinality=12),
                    PropertySpec("dayOfWeek", "categorical", cardinality=7),
                    PropertySpec("origin", "categorical", cardinality=40),
                    PropertySpec("depDelay", "numeric", value_range=(0, 180), outliers=3),
                    PropertySpec("arrDelay", "numeric", value_range=(0, 200), outliers=3),
                    PropertySpec("carrierDelay", "numeric", value_range=(0, 90)),
                    PropertySpec("distance", "numeric", value_range=(100, 3000)),
                    PropertySpec("taxiIn", "numeric", value_range=(1, 40)),
                    PropertySpec("taxiOut", "numeric", value_range=(1, 40)),
                ),
            ),
        ),
        seed=seed,
    )


def ceos_spec(sf: float = 1.0, seed: int = 102) -> GraphSpec:
    """CEOs [37]: heterogeneous, heavily multi-valued (nationality,
    company), text bios, ref links enabling paths (company/area,
    politicalConnection/role); planted net-worth outliers (Dos Santos)."""
    return GraphSpec(
        "CEOs",
        classes=(
            NodeClassSpec(
                "CEO",
                count=_n(300, sf),
                properties=(
                    PropertySpec("nationality", "categorical", cardinality=15,
                                 support=0.9, multi=(1, 4)),
                    PropertySpec("gender", "categorical", cardinality=2, support=0.7),
                    PropertySpec("occupation", "categorical", cardinality=8,
                                 support=0.8, multi=(1, 2)),
                    PropertySpec("age", "numeric", support=0.8, value_range=(30, 80),
                                 integer=True),
                    PropertySpec("netWorth", "numeric", support=0.8,
                                 value_range=(1, 100), outliers=2, outlier_factor=30),
                    PropertySpec("company", "ref", target="Company", multi=(1, 3)),
                    PropertySpec("politicalConnection", "ref", target="Politician",
                                 support=0.5, multi=(1, 2)),
                    PropertySpec("bio", "text", support=0.6, languages=("en", "fr")),
                ),
            ),
            NodeClassSpec(
                "Company",
                count=_n(350, sf),
                properties=(
                    PropertySpec("area", "categorical", cardinality=12),
                    PropertySpec("headquarters", "categorical", cardinality=20),
                    PropertySpec("revenue", "numeric", value_range=(1, 500),
                                 support=0.8, outliers=1, outlier_factor=25),
                    PropertySpec("description", "text", support=0.7,
                                 languages=("en", "fr")),
                ),
            ),
            NodeClassSpec(
                "Politician",
                count=_n(120, sf),
                properties=(
                    PropertySpec("role", "categorical", cardinality=6),
                    PropertySpec("country", "categorical", cardinality=15),
                ),
            ),
        ),
        seed=seed,
    )


def dblp_spec(sf: float = 1.0, seed: int = 103) -> GraphSpec:
    """DBLP [21]: one dominant CFS; `year` is the only good direct
    dimension; titles are text (kw/lang derivations); authors are
    high-cardinality refs."""
    return GraphSpec(
        "DBLP",
        classes=(
            NodeClassSpec(
                "Paper",
                count=_n(1500, sf),
                properties=(
                    PropertySpec("year", "categorical", cardinality=40, prefix="y"),
                    PropertySpec("title", "text", languages=("en",)),
                    PropertySpec("pages", "numeric", support=0.8,
                                 value_range=(4, 40), integer=True),
                    PropertySpec("author", "ref", target="Author", multi=(1, 4)),
                ),
            ),
            NodeClassSpec(
                "Author",
                count=_n(700, sf),
                properties=(
                    PropertySpec("affiliationCountry", "categorical", cardinality=30),
                ),
            ),
        ),
        seed=seed,
    )


def foodista_spec(sf: float = 1.0, seed: int = 104) -> GraphSpec:
    """Foodista [18]: no good *direct* dimensions on any CFS (the paper
    finds 0 MDAs without derivations); derivations (ingredient counts,
    title language, paths to ingredient names) create the space."""
    return GraphSpec(
        "Foodista",
        classes=(
            NodeClassSpec(
                "Recipe",
                count=_n(400, sf),
                properties=(
                    PropertySpec("title", "text", languages=("en", "fr")),
                    PropertySpec("instructions", "text", support=0.9,
                                 languages=("en", "fr")),
                    PropertySpec("ingredient", "ref", target="Ingredient",
                                 multi=(2, 8)),
                    PropertySpec("cookTime", "numeric", support=0.9,
                                 value_range=(5, 240), integer=True),
                    PropertySpec("servings", "numeric", support=0.8,
                                 value_range=(1, 12), integer=True),
                ),
            ),
            NodeClassSpec(
                "Ingredient",
                count=_n(150, sf),
                properties=(
                    PropertySpec("label", "text", languages=("en",)),
                ),
            ),
        ),
        seed=seed,
    )


def nasa_spec(sf: float = 1.0, seed: int = 105) -> GraphSpec:
    """NASA [17]: launches linked to spacecraft — path derivations
    (spacecraft/agency, spacecraft/discipline) drive the insights;
    moderate multi-valued share (disciplines)."""
    return GraphSpec(
        "NASA",
        classes=(
            NodeClassSpec(
                "Launch",
                count=_n(600, sf),
                properties=(
                    PropertySpec("launchsite", "categorical", cardinality=20,
                                 support=0.9),
                    PropertySpec("launchpad", "categorical", cardinality=60,
                                 support=0.6),
                    PropertySpec("spacecraft", "ref", target="Spacecraft",
                                 multi=(1, 2)),
                ),
            ),
            NodeClassSpec(
                "Spacecraft",
                count=_n(300, sf),
                properties=(
                    PropertySpec("agency", "categorical", cardinality=8),
                    PropertySpec("discipline", "categorical", cardinality=12,
                                 support=0.8, multi=(1, 3)),
                    PropertySpec("mass", "numeric", support=0.7,
                                 value_range=(100, 5000), outliers=3,
                                 outlier_factor=15),
                    PropertySpec("description", "text", support=0.5,
                                 languages=("en",)),
                ),
            ),
            NodeClassSpec(
                "MissionRole",
                count=_n(80, sf),
                properties=(
                    PropertySpec("roleType", "categorical", cardinality=6),
                ),
            ),
        ),
        seed=seed,
    )


def nobel_spec(sf: float = 1.0, seed: int = 106) -> GraphSpec:
    """Nobel [12]: many CFSs, heavily multi-valued (affiliations,
    prizes) — the highest Lemma-1 error counts and the most aggressive
    early-stop pruning in the paper."""
    return GraphSpec(
        "Nobel",
        classes=(
            NodeClassSpec(
                "Laureate",
                count=_n(400, sf),
                properties=(
                    PropertySpec("gender", "categorical", cardinality=2, support=0.95),
                    PropertySpec("bornCountry", "categorical", cardinality=25,
                                 support=0.9),
                    PropertySpec("diedCountry", "categorical", cardinality=25,
                                 support=0.5),
                    PropertySpec("affiliation", "ref", target="University",
                                 support=0.7, multi=(1, 3)),
                    PropertySpec("prize", "ref", target="Prize", multi=(1, 2)),
                    PropertySpec("motivation", "text", support=0.8,
                                 languages=("en",)),
                    PropertySpec("share", "numeric", value_range=(1, 4),
                                 integer=True),
                    PropertySpec("age", "numeric", support=0.9,
                                 value_range=(35, 90), integer=True, outliers=2,
                                 outlier_factor=2),
                ),
            ),
            NodeClassSpec(
                "University",
                count=_n(120, sf),
                properties=(
                    PropertySpec("uniCountry", "categorical", cardinality=20),
                    PropertySpec("city", "categorical", cardinality=40),
                ),
            ),
            NodeClassSpec(
                "Prize",
                count=_n(150, sf),
                properties=(
                    PropertySpec("category", "categorical", cardinality=6),
                    PropertySpec("prizeYear", "categorical", cardinality=60,
                                 prefix="y"),
                    PropertySpec("amount", "numeric", value_range=(100, 1000),
                                 support=0.9),
                ),
            ),
        ),
        seed=seed,
    )


SPEC_FACTORIES = {
    "Airline": airline_spec,
    "CEOs": ceos_spec,
    "DBLP": dblp_spec,
    "Foodista": foodista_spec,
    "NASA": nasa_spec,
    "Nobel": nobel_spec,
}


def build(spark: SparkSession, name: str, *, sf: float = 1.0) -> TripleStore:
    """Generate the named dataset analog at the given scale factor."""
    return generate(spark, SPEC_FACTORIES[name](sf))


def all_datasets() -> list[str]:
    """Dataset names in the paper's Table 2 order."""
    return list(SPEC_FACTORIES)
