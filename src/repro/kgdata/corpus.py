"""Mention corpora for the NERD experiments (Fig 14a/14b).

Two workloads:

* :func:`annotation_corpus` — free-text mentions with surrounding context
  (the "We visited Hanover and Dartmouth" situation, §5.2).  Tail entities
  in ambiguous name families are over-sampled so the head-vs-tail contrast
  the paper measures is actually present in the data; a slice of
  out-of-KG mentions exercises the rejection mechanism.
* :func:`obr_corpus` — structured ``<subject, predicate: mention>`` payloads
  for Object Resolution, where the ontology supplies an *entity-type hint*
  for the object (the Fig 14b "NERD + type hints" variant).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core import schema as S
from repro.kgdata.sources import _typo
from repro.kgdata.universe import Universe, _SYLLABLES

_FILLER = [
    "visited", "downtown", "after", "spending", "time", "at", "the", "near",
    "famous", "new", "latest", "story", "about", "with", "review", "history",
]

#: entity type each ref-predicate's object must have (ontology constraint)
REF_TARGET_TYPE = S.REF_TARGET_TYPE


@dataclass
class Mention:
    """One disambiguation task instance."""

    mention_id: int
    text: str                 # surface form of the mention
    context: str              # surrounding tokens (free text or record fields)
    true_eid: int             # -1 when no KG entity is correct (reject)
    is_tail: bool             # truth is the unpopular member of a name family
    type_hint: str | None     # ontology type constraint (OBR only)


def _context_for(uni: Universe, eid: int, g: np.random.Generator, n_nbr: int = 3) -> str:
    """Neighbour names + filler — the discriminative signal NERD exploits."""
    nbrs = uni.neighbors_of(eid)
    g.shuffle(nbrs := list(nbrs))
    toks: list[str] = []
    for n in nbrs[:n_nbr]:
        toks.append(uni.name_of(n))
    # composite-relationship objects (e.g. the school name) also appear
    e_rels = uni.rels[uni.rels.eid == eid]
    if len(e_rels):
        toks.append(str(e_rels.obj.iloc[0]))
    filler = list(g.choice(_FILLER, size=4))
    toks = toks + filler
    g.shuffle(toks)
    return " ".join(toks)


def annotation_corpus(
    uni: Universe, *, n: int = 1500, tail_frac: float = 0.35,
    nil_frac: float = 0.08, seed: int = 11,
) -> list[Mention]:
    """Free-text mention corpus with head/tail balance and NIL slice."""
    g = np.random.default_rng(seed)
    heads = [f[0] for f in uni.ambiguous_families]
    tails = [e for f in uni.ambiguous_families for e in f[1:]]
    all_eids = uni.entities.eid.to_numpy()
    pops = uni.entities.popularity.to_numpy()
    p = pops / pops.sum()

    out: list[Mention] = []
    for i in range(n):
        r = g.random()
        if r < nil_frac:
            fake = "".join(g.choice(_SYLLABLES, size=3)).capitalize()
            out.append(Mention(i, fake, " ".join(g.choice(_FILLER, size=6)), -1, False, None))
            continue
        if r < nil_frac + tail_frac and tails:
            eid = int(tails[int(g.integers(len(tails)))])
            is_tail = True
        else:
            eid = int(g.choice(all_eids, p=p))
            is_tail = eid in set(tails)
        al = uni.aliases_of(eid)
        text = al[int(g.integers(len(al)))]
        if g.random() < 0.1:
            text = _typo(g, text)
        out.append(Mention(i, text, _context_for(uni, eid, g), eid, is_tail, None))
    _ = heads  # heads are implicitly sampled via popularity weighting
    return out


def obr_corpus(
    uni: Universe, *, n: int = 1200, tail_boost: float = 4.0, seed: int = 13
) -> list[Mention]:
    """Structured object-resolution tasks drawn from real KG ref-facts.

    Each task is an attribute value (an entity *name*) seen in the context
    of its subject record; ``type_hint`` is the predicate's ontology target
    type.  Tasks whose object sits in an ambiguous family are over-sampled
    by ``tail_boost`` so type-hint precision effects are measurable.
    """
    g = np.random.default_rng(seed)
    refs = uni.attrs[uni.attrs.obj_eid.notna()].reset_index(drop=True)
    fam_members = {e for f in uni.ambiguous_families for e in f}
    w = np.where(refs.obj_eid.astype(int).isin(fam_members), tail_boost, 1.0)
    w = w / w.sum()
    idx = g.choice(len(refs), size=min(n, max(1, len(refs))), p=w)

    tails = {e for f in uni.ambiguous_families for e in f[1:]}
    out: list[Mention] = []
    for i, j in enumerate(idx):
        row = refs.iloc[int(j)]
        subj, pred, obj_eid = int(row.eid), str(row.predicate), int(row.obj_eid)
        al = uni.aliases_of(obj_eid)
        text = al[int(g.integers(len(al)))]
        if g.random() < 0.08:
            text = _typo(g, text)
        # record context: subject name, predicate, subject's other values
        subj_attrs = uni.attrs[uni.attrs.eid == subj]
        ctx_vals = [uni.name_of(subj)] + [str(v) for v in subj_attrs.obj.tolist()[:3]]
        ctx = " ".join([pred] + ctx_vals)
        out.append(
            Mention(i, text, ctx, obj_eid, obj_eid in tails, REF_TARGET_TYPE.get(pred))
        )
    return out
