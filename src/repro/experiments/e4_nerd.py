"""E4 — Fig 14(a): NERD vs the deployed alternative on text annotation.

Paper numbers (relative improvements of NERD over the alternative, per
confidence threshold): recall ≈ +70% at confidence 0.9, diminishing at
lower thresholds; precision up to +3.4% at thresholds ≥ 0.8.

The alternative relies on entity priors learned from training data and no
relational KG context — strong on head entities, weak on tails.  The
corpus over-samples tail members of ambiguous name families and includes a
NIL slice, so the head/tail contrast the paper measures is present.

Batch annotation runs through Spark (``annotate_batch``), mirroring the
elastic batch deployment of Fig 10; the sweep itself evaluates the shared
prediction set at every threshold.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import SparkSession, types as T

from repro.experiments.common import table
from repro.kgdata.corpus import Mention, annotation_corpus
from repro.kgdata.universe import make_universe
from repro.ml.nerd import (
    BASELINE_CONFIG,
    NERD_CONFIG,
    NERDIndex,
    ScorerConfig,
    view_from_universe,
)
from repro.sparktune import tune

PAPER = {
    "recall_improvement_at_0.9": 70.0,
    "precision_improvement_max_pct": 3.4,
    "note": "relative improvements vs deployed ED solution, Fig 14(a)",
}

THRESHOLDS = (0.5, 0.6, 0.7, 0.8, 0.9)

_PRED_SCHEMA = T.StructType(
    [
        T.StructField("mention_id", T.LongType()),
        T.StructField("entity_id", T.StringType()),
        T.StructField("confidence", T.DoubleType()),
    ]
)


def annotate_batch(
    spark: SparkSession,
    mentions: list[Mention],
    index: NERDIndex,
    config: ScorerConfig,
    *,
    use_hint: bool = False,
) -> list[tuple[int, str | None, float]]:
    """Batch NERD deployment (Fig 10): Spark partitions the corpus and each
    task disambiguates against a broadcast NERD index."""
    pdf = pd.DataFrame(
        {
            "mention_id": [m.mention_id for m in mentions],
            "text": [m.text for m in mentions],
            "context": [m.context for m in mentions],
            "type_hint": [m.type_hint if use_hint else None for m in mentions],
        }
    )
    bidx = spark.sparkContext.broadcast(index)

    def work(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        idx = bidx.value
        for b in batches:
            rows = []
            for r in b.itertuples(index=False):
                p = idx.disambiguate(
                    r.text, r.context, type_hint=r.type_hint, config=config
                )
                rows.append((int(r.mention_id), p.entity_id, float(p.confidence)))
            yield pd.DataFrame(rows, columns=["mention_id", "entity_id", "confidence"])

    out = (
        spark.createDataFrame(pdf)
        .repartition(8)
        .mapInPandas(work, schema=_PRED_SCHEMA)
        .collect()
    )
    return [(r.mention_id, r.entity_id, r.confidence) for r in out]


def precision_recall(
    mentions: list[Mention],
    preds: list[tuple[int, str | None, float]],
    thresholds=THRESHOLDS,
) -> dict[float, dict[str, float]]:
    by_id = {m.mention_id: m for m in mentions}
    n_linkable = sum(1 for m in mentions if m.true_eid >= 0)
    out = {}
    for tau in thresholds:
        accepted = [
            (by_id[mid], eid) for mid, eid, conf in preds
            if eid is not None and conf >= tau
        ]
        correct = sum(1 for m, eid in accepted if str(m.true_eid) == eid)
        out[tau] = {
            "precision": round(correct / len(accepted), 4) if accepted else float("nan"),
            "recall": round(correct / n_linkable, 4),
            "accepted": len(accepted),
        }
    return out


def run(
    spark: SparkSession | None,
    *,
    n_entities: int = 800,
    n_mentions: int = 1500,
    seed: int = 7,
) -> dict:
    uni = make_universe(n_entities=n_entities, seed=seed)
    index = NERDIndex(view_from_universe(uni))
    corpus = annotation_corpus(uni, n=n_mentions, seed=11)

    if spark is not None:
        tune(spark)
        nerd_preds = annotate_batch(spark, corpus, index, NERD_CONFIG)
        base_preds = annotate_batch(spark, corpus, index, BASELINE_CONFIG)
    else:  # pure-driver path (unit tests)
        nerd_preds = [
            (m.mention_id, p.entity_id, p.confidence)
            for m in corpus
            for p in [index.disambiguate(m.text, m.context, config=NERD_CONFIG)]
        ]
        base_preds = [
            (m.mention_id, p.entity_id, p.confidence)
            for m in corpus
            for p in [index.disambiguate(m.text, m.context, config=BASELINE_CONFIG)]
        ]

    nerd = precision_recall(corpus, nerd_preds)
    base = precision_recall(corpus, base_preds)
    sweep = []
    for tau in THRESHOLDS:
        rec_gain = (
            100.0 * (nerd[tau]["recall"] - base[tau]["recall"]) / base[tau]["recall"]
            if base[tau]["recall"]
            else float("inf")
        )
        prec_gain = (
            100.0 * (nerd[tau]["precision"] - base[tau]["precision"]) / base[tau]["precision"]
            if base[tau]["precision"] == base[tau]["precision"] and base[tau]["precision"]
            else float("nan")
        )
        sweep.append(
            {
                "threshold": tau,
                "nerd": nerd[tau],
                "baseline": base[tau],
                "recall_improvement_pct": round(rec_gain, 1),
                "precision_improvement_pct": round(prec_gain, 1),
            }
        )
    return {"paper": PAPER, "sweep": sweep, "n_mentions": n_mentions}


def format_rows(result: dict) -> str:
    rows = [
        [
            s["threshold"],
            s["baseline"]["precision"], s["baseline"]["recall"],
            s["nerd"]["precision"], s["nerd"]["recall"],
            f'{s["precision_improvement_pct"]}%', f'{s["recall_improvement_pct"]}%',
        ]
        for s in result["sweep"]
    ]
    body = table(
        ["conf", "base_P", "base_R", "nerd_P", "nerd_R", "dP", "dR"], rows
    )
    return (
        "E4 (Fig 14a) — NERD vs deployed alternative, text annotation\n"
        f"{body}\n"
        "(paper: recall ~+70% at conf 0.9, diminishing lower; precision up "
        "to +3.4% at conf >= 0.8)\n"
    )
