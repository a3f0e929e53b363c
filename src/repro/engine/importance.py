"""Entity importance (§3.3): structural importance over the KG.

Four structural signals — in-degree, out-degree, number of identities
(distinct sources contributing facts), and PageRank — are each normalized
and aggregated into one importance score.  Computed entirely with
DataFrame transformations; PageRank iterates with eager local checkpoints
(bounded lineage).  Registered as an engine view and maintained with the
graph (see ``engine.views``).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F


def entity_edges(kg_triples: DataFrame) -> DataFrame:
    """(src, dst) entity-reference edges: facts whose object is a KG id."""
    return (
        kg_triples.filter(F.col("obj").startswith("kg:"))
        .select(F.col("subject").alias("src"), F.col("obj").alias("dst"))
        .filter(F.col("src") != F.col("dst"))
        .distinct()
    )


def degree_features(kg_triples: DataFrame) -> DataFrame:
    """(subject, out_degree, in_degree, n_identities) for every entity."""
    edges = entity_edges(kg_triples)
    subjects = kg_triples.select("subject").distinct()
    out_deg = edges.groupBy("src").agg(F.count("*").alias("out_degree"))
    in_deg = edges.groupBy("dst").agg(F.count("*").alias("in_degree"))
    idents = (
        kg_triples.select("subject", F.explode("sources").alias("source"))
        .distinct()
        .groupBy("subject")
        .agg(F.count("*").alias("n_identities"))
    )
    return (
        subjects.join(out_deg, subjects.subject == out_deg.src, "left")
        .drop("src")
        .join(in_deg, subjects.subject == in_deg.dst, "left")
        .drop("dst")
        .join(idents, "subject", "left")
        .fillna(0, subset=["out_degree", "in_degree", "n_identities"])
    )


def pagerank(
    kg_triples: DataFrame, *, iters: int = 8, damping: float = 0.85
) -> DataFrame:
    """(subject, pagerank) by power iteration over entity-reference edges."""
    edges = entity_edges(kg_triples).localCheckpoint(eager=True)
    nodes = (
        kg_triples.select("subject").distinct().localCheckpoint(eager=True)
    )
    n = nodes.count() or 1
    out_deg = edges.groupBy("src").agg(F.count("*").alias("deg"))
    ranks = nodes.withColumn("rank", F.lit(1.0 / n))
    for _ in range(iters):
        contribs = (
            edges.join(ranks, edges.src == ranks.subject)
            .join(out_deg, "src")
            .select(F.col("dst").alias("subject"), (F.col("rank") / F.col("deg")).alias("c"))
            .groupBy("subject")
            .agg(F.sum("c").alias("inflow"))
        )
        ranks = (
            nodes.join(contribs, "subject", "left")
            .select(
                "subject",
                (
                    F.lit((1.0 - damping) / n)
                    + F.lit(damping) * F.coalesce("inflow", F.lit(0.0))
                ).alias("rank"),
            )
            .localCheckpoint(eager=True)
        )
    return ranks.withColumnRenamed("rank", "pagerank")


def importance_view(kg_triples: DataFrame, *, pr_iters: int = 6) -> DataFrame:
    """(subject, out_degree, in_degree, n_identities, pagerank, importance).

    Each signal is max-normalized to [0, 1]; the aggregate is their mean —
    degree alone would bias entities from fact-rich sources (§3.3), so
    identities and PageRank balance it.
    """
    feats = degree_features(kg_triples).join(
        pagerank(kg_triples, iters=pr_iters), "subject", "left"
    ).fillna(0.0, subset=["pagerank"])
    metrics = ["out_degree", "in_degree", "n_identities", "pagerank"]
    maxes = feats.agg(
        *[F.max(m).alias(m) for m in metrics]
    ).collect()[0]
    score = None
    for m in metrics:
        term = F.col(m) / F.lit(float(maxes[m]) or 1.0)
        score = term if score is None else score + term
    return feats.withColumn("importance", score / F.lit(float(len(metrics))))
