"""Blocking and candidate-pair generation (§2.3 Linking steps 3–4).

Entities are scattered into buckets by lightweight functions over their
surface forms (name tokens and a 4-char prefix); only pairs sharing a
bucket are compared, cutting the quadratic record-linkage cost.  Oversized
buckets (stop-word-like tokens) are dropped, the standard guard from the
blocking literature the paper cites.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F

#: tokens shorter than this never form a block key
_MIN_TOKEN_LEN = 3


def block_keys(records: DataFrame) -> DataFrame:
    """(subject, etype, block_key) — token keys ∪ name-prefix keys.

    ``records`` must carry ``subject``, ``etype`` and ``aliases``
    (array of surface forms).  Keys are namespaced by entity type so
    cross-type collisions never generate pairs (per-type pipelines, §2.3).
    """
    surface = records.select(
        "subject", "etype", F.explode("aliases").alias("surface")
    ).withColumn("norm", F.lower(F.trim(F.col("surface"))))
    tokens = (
        surface.select(
            "subject", "etype", F.explode(F.split("norm", r"\s+")).alias("tok")
        )
        .filter(F.length("tok") >= _MIN_TOKEN_LEN)
        .select(
            "subject",
            "etype",
            F.concat_ws("|", "etype", F.lit("tok"), "tok").alias("block_key"),
        )
    )
    prefixes = surface.select(
        "subject",
        "etype",
        F.concat_ws(
            "|", "etype", F.lit("pfx"), F.substring("norm", 1, 4)
        ).alias("block_key"),
    )
    # scale-robust keys: single-token blocks blow past the size cap once
    # the corpus grows (popular given names / surnames), so exact-name and
    # last-token+first-initial keys keep true duplicates co-bucketed
    fullname = surface.select(
        "subject",
        "etype",
        F.concat_ws("|", "etype", F.lit("name"), "norm").alias("block_key"),
    )
    toks = F.split("norm", r"\s+")
    last_first = surface.select(
        "subject",
        "etype",
        F.concat_ws(
            "|",
            "etype",
            F.lit("lf"),
            F.element_at(toks, -1),
            F.substring(F.element_at(toks, 1), 1, 1),
        ).alias("block_key"),
    )
    return (
        tokens.unionByName(prefixes)
        .unionByName(fullname)
        .unionByName(last_first)
        .distinct()
    )


def candidate_pairs(
    records: DataFrame, *, max_block_size: int = 60
) -> DataFrame:
    """Distinct unordered pairs (a, b), a < b, sharing a surviving block."""
    keys = block_keys(records)
    sizes = keys.groupBy("block_key").count()
    keep = sizes.filter(F.col("count") <= max_block_size).select("block_key")
    keys = keys.join(keep, "block_key", "left_semi")
    left = keys.select("block_key", F.col("subject").alias("a"))
    right = keys.select("block_key", F.col("subject").alias("b"))
    return (
        left.join(right, "block_key")
        .filter(F.col("a") < F.col("b"))
        .select("a", "b")
        .distinct()
    )
