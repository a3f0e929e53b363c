"""Legacy view computation (Fig 8 baseline).

The paper compares the Graph Engine's analytics store against "a legacy
implementation of the views as custom Spark jobs" over plain RDF triples.
The legacy jobs assemble each schematized entity view column-by-column:
one join per predicate against the triple table, and — because plain
triples do not inline one-hop relationships — *two* chained joins per
composite column (entity → relationship node → relationship fact).  The
optimized path (``engine.views.schematized_entity_view``) produces the
identical view with a single grouped aggregation over extended triples;
E1 measures the contrast per entity type.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F

from repro.core import schema as S


def plain_triples(extended: DataFrame) -> DataFrame:
    """Normalize extended triples back to plain RDF ``(subject, predicate,
    obj)`` rows: composite facts become an entity→r_id edge plus the
    relationship node's own facts (the representation a legacy triple-store
    pipeline consumes)."""
    simple = extended.filter(F.col("r_id").isNull()).select(
        "subject", "predicate", "obj"
    )
    rel_edges = (
        extended.filter(F.col("r_id").isNotNull())
        .select("subject", "predicate", F.col("r_id").alias("obj"))
        .distinct()
    )
    rel_facts = extended.filter(F.col("r_id").isNotNull()).select(
        F.col("r_id").alias("subject"),
        F.col("r_predicate").alias("predicate"),
        "obj",
    )
    return simple.unionByName(rel_edges).unionByName(rel_facts)


def legacy_schematized_entity_view(
    triples: DataFrame, etype: str, *, predicates: list[str] | None = None
) -> DataFrame:
    """Per-predicate self-join assembly of one entity type's wide view.

    Semantically identical to the optimized view (tests assert equality);
    the cost model differs: k simple predicates → k shuffling joins,
    each composite column → two chained joins through the relationship
    node, which is exactly why these "join-heavy view definitions" gain
    the most from the analytics store in Fig 8.
    """
    preds = predicates or S.all_predicates(etype)
    comp = S.COMPOSITE_RELS.get(etype, {})

    base = (
        triples.filter(
            (F.col("predicate") == S.TYPE_PRED) & (F.col("obj") == etype)
        )
        .select("subject")
        .distinct()
    )

    def attr(df: DataFrame, pred: str, out_col: str) -> DataFrame:
        vals = (
            triples.filter(F.col("predicate") == pred)
            .groupBy("subject")
            .agg(F.min("obj").alias(out_col))
        )
        return df.join(vals, "subject", "left")

    out = attr(base, S.NAME_PRED, "name")
    for p in preds:
        out = attr(out, p, p)
    for cpred, rpreds in comp.items():
        # hop 1: entity -> relationship node ids
        hop = triples.filter(F.col("predicate") == cpred).select(
            "subject", F.col("obj").alias("r_node")
        )
        # hop 2 (per r_predicate): relationship node -> value, aggregated
        # back to the entity — two chained joins per composite column
        for rp in rpreds:
            vals = triples.filter(F.col("predicate") == rp).select(
                F.col("subject").alias("r_node"), F.col("obj").alias("val")
            )
            col = (
                hop.join(vals, "r_node")
                .groupBy("subject")
                .agg(F.min("val").alias(f"{cpred}.{rp}"))
            )
            out = out.join(col, "subject", "left")
    return out
