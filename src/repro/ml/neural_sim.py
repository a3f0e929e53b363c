"""Learned string similarity (§5.1) — numpy stand-in for the paper's
neural character encoders.

A hashed character-n-gram embedding table is trained with a triplet loss
(anchor/positive/negative) via SGD.  Training data comes from *distant
supervision*: alias pairs of the same KG entity (plus typo augmentations)
are positives; names of unlinked entities are negatives.  Inference is
cosine similarity of mean-pooled n-gram embeddings — exactly the paper's
encode-then-cosine scheme, minus the GPU (see DESIGN.md §3 substitution).

The learned function captures *synonyms* ("Robert" ~ "Bob") that q-gram
Jaccard cannot: nickname pairs recur across many training entities, so
their n-grams are pulled together and generalize to held-out entities.
"""
from __future__ import annotations

import zlib

import numpy as np

from repro.ml.simfns import normalize
from repro.kgdata.sources import _typo
from repro.kgdata.universe import Universe


class NeuralStringSim:
    """Char-n-gram embedding similarity with triplet-loss training."""

    def __init__(
        self,
        *,
        dim: int = 48,
        q: int = 3,
        buckets: int = 4096,
        margin: float = 0.4,
        lr: float = 0.05,
        seed: int = 0,
    ):
        self.dim, self.q, self.buckets = dim, q, buckets
        self.margin, self.lr = margin, lr
        g = np.random.default_rng(seed)
        self.W = g.normal(0, 0.1, size=(buckets, dim))
        self._rng = g

    # -- encoding ---------------------------------------------------------
    def _ids(self, s: str) -> np.ndarray:
        s = f"^{normalize(s)}$"
        grams = [s[i : i + self.q] for i in range(max(1, len(s) - self.q + 1))]
        return np.fromiter(
            (zlib.crc32(gm.encode()) % self.buckets for gm in grams), dtype=np.int64
        )

    def _vec(self, s: str) -> tuple[np.ndarray, np.ndarray]:
        ids = self._ids(s)
        return self.W[ids].mean(axis=0), ids

    def encode(self, s: str) -> np.ndarray:
        """Unit-norm embedding of a string."""
        v, _ = self._vec(s)
        n = np.linalg.norm(v)
        return v / n if n > 0 else v

    def similarity(self, a: str, b: str) -> float:
        """Cosine similarity mapped to [0, 1]."""
        return float((self.encode(a) @ self.encode(b) + 1.0) / 2.0)

    # -- training ---------------------------------------------------------
    @staticmethod
    def _dcos(u: np.ndarray, v: np.ndarray) -> np.ndarray:
        """∂ cos(u, v) / ∂u."""
        nu, nv = np.linalg.norm(u), np.linalg.norm(v)
        if nu == 0 or nv == 0:
            return np.zeros_like(u)
        return v / (nu * nv) - (u @ v) * u / (nu**3 * nv)

    def fit(
        self,
        positives: list[tuple[str, str]],
        negatives_pool: list[str],
        *,
        hard_negatives: dict[str, list[str]] | None = None,
        epochs: int = 6,
    ) -> "NeuralStringSim":
        """SGD over triplets: (a, p) from ``positives``; n drawn from the
        anchor's *hard negatives* (surface-similar strings of unlinked
        entities, e.g. same family name) when available, else uniformly
        from ``negatives_pool`` — hard negatives are what teach the encoder
        that "Robert ~ Bob" but "Robert ≁ Susan" despite a shared surname."""
        neg = list(negatives_pool)
        hard = hard_negatives or {}
        for _ in range(epochs):
            order = self._rng.permutation(len(positives))
            for k in order:
                a, p = positives[int(k)]
                h = hard.get(a)
                if h and self._rng.random() < 0.7:
                    n = h[int(self._rng.integers(len(h)))]
                else:
                    n = neg[int(self._rng.integers(len(neg)))]
                va, ia = self._vec(a)
                vp, ip = self._vec(p)
                vn, i_n = self._vec(n)
                cos_ap = float(
                    va @ vp / (np.linalg.norm(va) * np.linalg.norm(vp) + 1e-12)
                )
                cos_an = float(
                    va @ vn / (np.linalg.norm(va) * np.linalg.norm(vn) + 1e-12)
                )
                if self.margin - cos_ap + cos_an <= 0:
                    continue
                ga = -self._dcos(va, vp) + self._dcos(va, vn)
                gp = -self._dcos(vp, va)
                gn = self._dcos(vn, va)
                for ids, grad in ((ia, ga), (ip, gp), (i_n, gn)):
                    np.add.at(self.W, ids, -self.lr * grad / len(ids))
        return self


def _last_token(s: str) -> str:
    return normalize(s).split()[-1]


def distant_supervision(
    uni: Universe,
    *,
    types: tuple[str, ...] = ("person", "artist"),
    holdout_frac: float = 0.3,
    typo_augment: int = 1,
    seed: int = 21,
) -> tuple[
    list[tuple[str, str]],
    list[str],
    dict[str, list[str]],
    list[tuple[str, str, int]],
]:
    """Bootstrap training data from the KG (§5.1).

    Returns ``(positives, negatives_pool, hard_negatives, eval_pairs)``:
    positives are alias pairs + typo augmentations of *training* entities;
    ``hard_negatives`` maps a name to surface-similar names of unlinked
    entities (shared family name) — the discriminations q-gram similarity
    cannot make; ``eval_pairs`` is a held-out labelled set ``(a, b,
    is_match)`` over entities never seen in training, whose negatives are
    hard whenever possible.
    """
    g = np.random.default_rng(seed)
    ents = uni.entities[uni.entities.type.isin(types)]
    eids = ents.eid.to_numpy()
    g.shuffle(eids := eids.copy())
    n_hold = int(len(eids) * holdout_frac)
    hold, train = set(eids[:n_hold].tolist()), eids[n_hold:]

    # index names by family name for hard-negative mining
    by_last_train: dict[str, list[tuple[int, str]]] = {}
    for eid in train:
        for al in uni.aliases_of(int(eid)):
            by_last_train.setdefault(_last_token(al), []).append((int(eid), al))

    positives: list[tuple[str, str]] = []
    negatives_pool: list[str] = []
    hard_negatives: dict[str, list[str]] = {}
    for eid in train:
        al = uni.aliases_of(int(eid))
        negatives_pool.append(al[0])
        for i in range(len(al)):
            hard = [
                nm
                for oe, nm in by_last_train.get(_last_token(al[i]), [])
                if oe != int(eid)
            ]
            if hard:
                hard_negatives[al[i]] = hard
            for j in range(i + 1, len(al)):
                positives.append((al[i], al[j]))
            for _ in range(typo_augment):
                positives.append((al[i], _typo(g, al[i])))

    by_last_hold: dict[str, list[tuple[int, str]]] = {}
    for eid in sorted(hold):
        for al in uni.aliases_of(int(eid)):
            by_last_hold.setdefault(_last_token(al), []).append((int(eid), al))

    eval_pairs: list[tuple[str, str, int]] = []
    hold_list = sorted(hold)
    for eid in hold_list:
        al = uni.aliases_of(int(eid))
        a = al[0]
        # positives mix typo variants (edit-distance-friendly) and synonym
        # aliases (nickname pairs only a learned similarity can bridge) —
        # the paper's "cases where typos and synonyms are present"
        use_synonym = len(al) > 1 and g.random() < 0.5
        b = al[1] if use_synonym else _typo(g, a)
        eval_pairs.append((a, b, 1))
        hard = [nm for oe, nm in by_last_hold.get(_last_token(a), []) if oe != eid]
        if hard:
            eval_pairs.append((a, hard[int(g.integers(len(hard)))], 0))
        else:
            other = int(hold_list[int(g.integers(len(hold_list)))])
            if other != eid:
                eval_pairs.append((a, uni.aliases_of(other)[0], 0))
    return positives, negatives_pool, hard_negatives, eval_pairs


def recall_at_precision(
    scores: list[tuple[float, int]], target_precision: float = 0.95
) -> float:
    """Best recall achievable at ≥ ``target_precision`` over thresholds."""
    ranked = sorted(scores, key=lambda t: -t[0])
    n_pos = sum(lbl for _, lbl in ranked) or 1
    tp = fp = 0
    best = 0.0
    for _, lbl in ranked:
        tp += lbl
        fp += 1 - lbl
        if tp / (tp + fp) >= target_precision:
            best = max(best, tp / n_pos)
    return best
