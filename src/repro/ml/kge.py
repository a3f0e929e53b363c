"""Knowledge-graph embeddings (§5.3): TransE and DistMult trained with
numpy minibatch SGD, plus the Vector DB store and the three fact tasks the
paper unifies over embeddings — fact ranking, fact verification, and
missing-fact imputation.

Training data comes from the engine's ``embedding_input`` view (entity
relationship facts only, metadata filtered).  The paper's Marius
external-memory multi-GPU training is hardware-gated; models here are tiny
by design (see DESIGN.md §3) and the scoring/serving interfaces are the
same: ``f(θ_s, θ_p)`` against all entity vectors via the vector store.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class TripleSet:
    """Integer-encoded facts with id dictionaries."""

    heads: np.ndarray
    rels: np.ndarray
    tails: np.ndarray
    ent_ids: dict[str, int]
    rel_ids: dict[str, int]

    @classmethod
    def from_facts(cls, facts: list[tuple[str, str, str]]) -> "TripleSet":
        ents = sorted({h for h, _, _ in facts} | {t for _, _, t in facts})
        rels = sorted({r for _, r, _ in facts})
        e = {x: i for i, x in enumerate(ents)}
        r = {x: i for i, x in enumerate(rels)}
        return cls(
            heads=np.array([e[h] for h, _, _ in facts], dtype=np.int64),
            rels=np.array([r[p] for _, p, _ in facts], dtype=np.int64),
            tails=np.array([e[t] for _, _, t in facts], dtype=np.int64),
            ent_ids=e,
            rel_ids=r,
        )

    def __len__(self) -> int:
        return len(self.heads)


class KGEModel:
    """Shared trainer for TransE / DistMult (margin ranking loss, negative
    sampling by tail corruption)."""

    def __init__(
        self,
        triples: TripleSet,
        *,
        model: str = "transe",
        dim: int = 32,
        margin: float = 1.0,
        lr: float = 0.05,
        seed: int = 0,
    ):
        if model not in ("transe", "distmult"):
            raise ValueError(f"unknown KGE model {model!r}")
        self.t = triples
        self.model = model
        self.dim, self.margin, self.lr = dim, margin, lr
        g = np.random.default_rng(seed)
        n_e, n_r = len(triples.ent_ids), len(triples.rel_ids)
        self.E = g.normal(0, 1.0 / np.sqrt(dim), (max(n_e, 1), dim))
        self.R = g.normal(0, 1.0 / np.sqrt(dim), (max(n_r, 1), dim))
        self._rng = g

    # -- scoring: higher = more plausible ---------------------------------
    def score(self, h: np.ndarray, r: np.ndarray, t: np.ndarray) -> np.ndarray:
        eh, er, et = self.E[h], self.R[r], self.E[t]
        if self.model == "transe":
            return -np.linalg.norm(eh + er - et, axis=-1)
        return np.sum(eh * er * et, axis=-1)

    def fit(self, *, epochs: int = 60, batch: int = 256) -> "KGEModel":
        n = len(self.t)
        n_e = self.E.shape[0]
        for _ in range(epochs):
            order = self._rng.permutation(n)
            for s in range(0, n, batch):
                idx = order[s : s + batch]
                h, r, t = self.t.heads[idx], self.t.rels[idx], self.t.tails[idx]
                t_neg = self._rng.integers(0, n_e, size=len(idx))
                pos, neg = self.score(h, r, t), self.score(h, r, t_neg)
                viol = self.margin - pos + neg > 0
                if not viol.any():
                    continue
                h, r, t, t_neg = h[viol], r[viol], t[viol], t_neg[viol]
                eh, er, et, en = self.E[h], self.R[r], self.E[t], self.E[t_neg]
                if self.model == "transe":
                    d_pos = eh + er - et
                    npos = np.linalg.norm(d_pos, axis=1, keepdims=True) + 1e-9
                    g_pos = d_pos / npos  # ∂(−‖·‖)/∂… up to sign below
                    d_neg = eh + er - en
                    nneg = np.linalg.norm(d_neg, axis=1, keepdims=True) + 1e-9
                    g_neg = d_neg / nneg
                    # loss = margin + ‖pos‖ − ‖neg‖  → descend
                    gh = g_pos - g_neg
                    gr = g_pos - g_neg
                    gt = -g_pos
                    gn = g_neg
                else:  # distmult: loss = margin − <h,r,t> + <h,r,t'>
                    gh = -er * et + er * en
                    gr = -eh * et + eh * en
                    gt = -eh * er
                    gn = eh * er
                np.add.at(self.E, h, -self.lr * gh)
                np.add.at(self.R, r, -self.lr * gr)
                np.add.at(self.E, t, -self.lr * gt)
                np.add.at(self.E, t_neg, -self.lr * gn)
            # unit-ball projection stabilizes TransE
            norms = np.linalg.norm(self.E, axis=1, keepdims=True)
            np.divide(self.E, np.maximum(norms, 1.0), out=self.E)
        return self

    # -- the three unified fact tasks (§5.3) --------------------------------
    def fact_score(self, h: str, r: str, t: str) -> float:
        """Plausibility score of one (s, p, o) fact."""
        return float(
            self.score(
                np.array([self.t.ent_ids[h]]),
                np.array([self.t.rel_ids[r]]),
                np.array([self.t.ent_ids[t]]),
            )[0]
        )

    def rank_objects(self, h: str, r: str, candidates: list[str]) -> list[tuple[str, float]]:
        """Fact ranking: order candidate objects of (s, p) by importance."""
        hi = np.full(len(candidates), self.t.ent_ids[h])
        ri = np.full(len(candidates), self.t.rel_ids[r])
        ti = np.array([self.t.ent_ids[c] for c in candidates])
        scores = self.score(hi, ri, ti)
        return sorted(zip(candidates, scores.tolist()), key=lambda x: -x[1])

    def impute_tail(self, h: str, r: str, *, k: int = 10) -> list[str]:
        """Missing-fact imputation: top-k candidate objects via similarity
        search over all entity embeddings (the Vector DB path)."""
        hi = np.full(self.E.shape[0], self.t.ent_ids[h])
        ri = np.full(self.E.shape[0], self.t.rel_ids[r])
        scores = self.score(hi, ri, np.arange(self.E.shape[0]))
        inv = {v: k_ for k_, v in self.t.ent_ids.items()}
        top = np.argsort(-scores)[:k]
        return [inv[int(i)] for i in top]

    def verification_auc(
        self, true_facts: list[tuple[str, str, str]], *, n_corrupt: int = 1, seed: int = 1
    ) -> float:
        """Fact verification quality: AUC separating true facts from
        tail-corrupted ones (corrupted facts are the audit candidates)."""
        g = np.random.default_rng(seed)
        ents = list(self.t.ent_ids)
        pos, neg = [], []
        for h, r, t in true_facts:
            pos.append(self.fact_score(h, r, t))
            for _ in range(n_corrupt):
                t2 = ents[int(g.integers(len(ents)))]
                if t2 != t:
                    neg.append(self.fact_score(h, r, t2))
        pos_a, neg_a = np.array(pos), np.array(neg)
        if not len(pos_a) or not len(neg_a):
            return float("nan")
        wins = (pos_a[:, None] > neg_a[None, :]).sum() + 0.5 * (
            pos_a[:, None] == neg_a[None, :]
        ).sum()
        return float(wins / (len(pos_a) * len(neg_a)))


class VectorStore:
    """The Vector DB of the Graph Engine (Fig 6/7): entity embeddings with
    nearest-neighbour search and attribute (type) filters."""

    def __init__(self, ids: list[str], vectors: np.ndarray, types: dict[str, str] | None = None):
        assert len(ids) == len(vectors)
        self.ids = list(ids)
        norms = np.linalg.norm(vectors, axis=1, keepdims=True)
        self.V = vectors / np.maximum(norms, 1e-12)
        self.types = types or {}

    @classmethod
    def from_model(cls, model: KGEModel, types: dict[str, str] | None = None) -> "VectorStore":
        inv = sorted(model.t.ent_ids, key=model.t.ent_ids.get)
        return cls(inv, model.E.copy(), types)

    def filter_by_type(self, etype: str) -> "VectorStore":
        """Attribute-filtered subset (the "people embeddings" of Fig 7)."""
        keep = [i for i, e in enumerate(self.ids) if self.types.get(e) == etype]
        return VectorStore(
            [self.ids[i] for i in keep], self.V[keep],
            {self.ids[i]: etype for i in keep},
        )

    def nearest(self, query: np.ndarray, *, k: int = 5) -> list[tuple[str, float]]:
        q = query / max(np.linalg.norm(query), 1e-12)
        sims = self.V @ q
        top = np.argsort(-sims)[:k]
        return [(self.ids[int(i)], float(sims[int(i)])) for i in top]
