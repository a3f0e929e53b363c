"""Data model of the reproduction: ontology + extended-triples schema.

The paper (§2.1, Table 1) represents the KG as *extended triples*: a flat
relational encoding of RDF triples where composite (one-hop) relationships
are triplicated inline via ``(r_id, r_predicate)`` so that frequent one-hop
lookups need no self-join.  Every fact carries provenance (``sources``),
``locale`` and per-source ``trust`` metadata.

Two namespaces exist during construction:

* **source namespace** — subjects look like ``"src0:123"`` (a provider-local
  entity id); objects may be unresolved string literals.
* **KG namespace** — subjects look like ``"kg:src0:123"``; entity-valued
  objects are resolved KG ids (Object Resolution, §2.3).
"""
from __future__ import annotations

from pyspark.sql import types as T

# --------------------------------------------------------------------------
# Ontology (in-house open-domain ontology stand-in, see DESIGN.md §3)
# --------------------------------------------------------------------------

#: predicate that stores the entity type on every entity
TYPE_PRED = "type"
#: predicate that stores the canonical display name
NAME_PRED = "name"
#: predicate that stores additional aliases
ALIAS_PRED = "alias"
#: volatile predicate (churns every tick; fused via partition overwrite §2.4)
VOLATILE_PREDS = frozenset({"popularity"})
#: provenance predicate recording the linking decision (§2.3 step 5)
SAME_AS_PRED = "same_as"

#: KG-ontology predicates per entity type.  ``ref:`` marks entity-valued
#: predicates whose objects go through Object Resolution; plain entries are
#: literal-valued.  Composite relations (one-hop ``r_predicate`` groups) are
#: declared separately in :data:`COMPOSITE_RELS`.
ONTOLOGY: dict[str, list[str]] = {
    "person": ["birthdate", "occupation", "ref:birthplace", "ref:spouse"],
    "artist": ["genre", "record_label", "birthdate", "ref:birthplace"],
    "song": ["genre", "release_year", "duration", "ref:by_artist"],
    "album": ["release_year", "record_label", "ref:by_artist"],
    "movie": ["genre", "release_year", "full_title", "ref:directed_by"],
    "city": ["country", "timezone"],
    "team": ["sport", "ref:home_city"],
    "org": ["org_type", "ref:in_city"],
}

#: composite relationships: predicate -> list of r_predicates (Fig 2:
#: ``educated_at`` with school/degree/year).  The first r_predicate is the
#: "anchor" used when judging relationship-node similarity during fusion.
COMPOSITE_RELS: dict[str, dict[str, list[str]]] = {
    "person": {"educated_at": ["school", "degree", "year"]},
    "artist": {"educated_at": ["school", "degree", "year"]},
    "movie": {"awarded": ["award", "category", "year"]},
}

#: entity types whose mentions are people (share the nickname alias space)
PERSON_TYPES = frozenset({"person", "artist"})

#: which literal predicate is expected to be single-valued (functional) —
#: conflicting values across sources are scored by truth discovery (§2.3).
FUNCTIONAL_PREDS = frozenset(
    {"birthdate", "release_year", "duration", "country", "timezone",
     "sport", "org_type", "full_title"}
)


#: entity type each ref-predicate's object must have — the ontology
#: constraint NERD's type hints exploit during Object Resolution (Fig 14b).
REF_TARGET_TYPE: dict[str, str] = {
    "birthplace": "city", "spouse": "person", "by_artist": "artist",
    "directed_by": "person", "home_city": "city", "in_city": "city",
    "school": "org",
}


def ref_predicates(etype: str) -> list[str]:
    """Entity-valued predicates of ``etype`` (objects need resolution)."""
    return [p[4:] for p in ONTOLOGY.get(etype, []) if p.startswith("ref:")]


def literal_predicates(etype: str) -> list[str]:
    """Literal-valued predicates of ``etype``."""
    return [p for p in ONTOLOGY.get(etype, []) if not p.startswith("ref:")]


def all_predicates(etype: str) -> list[str]:
    """Every non-composite ontology predicate of ``etype`` (no ref: prefix)."""
    return literal_predicates(etype) + ref_predicates(etype)


# --------------------------------------------------------------------------
# Extended-triples schemas
# --------------------------------------------------------------------------

#: Source payload: one provenance source per row, pre-fusion (Table 1 rows
#: before the sources/trust arrays are merged).
SOURCE_TRIPLE_SCHEMA = T.StructType(
    [
        T.StructField("subject", T.StringType(), False),
        T.StructField("predicate", T.StringType(), False),
        T.StructField("r_id", T.StringType(), True),
        T.StructField("r_predicate", T.StringType(), True),
        T.StructField("obj", T.StringType(), False),
        T.StructField("locale", T.StringType(), True),
        T.StructField("source", T.StringType(), False),
        T.StructField("trust", T.DoubleType(), False),
    ]
)

#: Fused KG: provenance is an array of sources with aligned trust scores and
#: an aggregated correctness confidence (§2.1, §2.3 Fusion).
KG_TRIPLE_SCHEMA = T.StructType(
    [
        T.StructField("subject", T.StringType(), False),
        T.StructField("predicate", T.StringType(), False),
        T.StructField("r_id", T.StringType(), True),
        T.StructField("r_predicate", T.StringType(), True),
        T.StructField("obj", T.StringType(), False),
        T.StructField("locale", T.StringType(), True),
        T.StructField("sources", T.ArrayType(T.StringType()), False),
        T.StructField("trust", T.ArrayType(T.DoubleType()), False),
        T.StructField("confidence", T.DoubleType(), False),
    ]
)

#: key that identifies one fact for fusion's outer-join path (§2.3): a fact
#: is the same fact iff subject/predicate/r-slot/object/locale all agree.
FACT_KEY = ["subject", "predicate", "r_id", "r_predicate", "obj", "locale"]

DEFAULT_LOCALE = "en"


def kg_id(source_subject: str) -> str:
    """Deterministic KG id minted for a new entity.

    New KG entities take the id of their linkage-cluster representative
    (lexicographically smallest source subject), prefixed with ``kg:``.
    Deterministic minting keeps incremental runs reproducible without a
    driver-side id counter.
    """
    return f"kg:{source_subject}"


def is_kg_id(subject: str) -> bool:
    """True iff ``subject`` already lives in the KG namespace."""
    return subject.startswith("kg:")
