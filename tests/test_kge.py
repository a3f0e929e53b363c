"""Unit tests for KG embeddings and the Vector DB (§5.3)."""
import numpy as np
import pytest

from repro.experiments.e8_kge import facts_from_universe
from repro.ml.kge import KGEModel, TripleSet, VectorStore

FACTS = [
    ("a", "likes", "b"), ("b", "likes", "c"), ("a", "knows", "c"),
    ("c", "likes", "a"), ("d", "likes", "a"), ("d", "knows", "b"),
]


class TestTripleSet:
    def test_encoding_roundtrip(self):
        ts = TripleSet.from_facts(FACTS)
        assert len(ts) == len(FACTS)
        assert set(ts.ent_ids) == {"a", "b", "c", "d"}
        assert set(ts.rel_ids) == {"likes", "knows"}

    def test_deterministic_ids(self):
        a, b = TripleSet.from_facts(FACTS), TripleSet.from_facts(FACTS)
        assert a.ent_ids == b.ent_ids and a.rel_ids == b.rel_ids


class TestModels:
    @pytest.fixture(scope="class")
    def world_facts(self, uni_mid):
        return facts_from_universe(uni_mid)

    @pytest.mark.parametrize("model", ["transe", "distmult"])
    def test_training_improves_verification_auc(self, model, world_facts):
        ts = TripleSet.from_facts(world_facts)
        untrained = KGEModel(ts, model=model, dim=16, seed=0)
        auc0 = untrained.verification_auc(world_facts[:200])
        trained = KGEModel(ts, model=model, dim=16, seed=0).fit(epochs=25)
        auc1 = trained.verification_auc(world_facts[:200])
        assert auc1 > auc0
        assert auc1 > 0.8

    @pytest.mark.parametrize("model", ["transe", "distmult"])
    def test_imputation_recovers_known_tails(self, model, world_facts):
        ts = TripleSet.from_facts(world_facts)
        m = KGEModel(ts, model=model, dim=16, seed=0).fit(epochs=25)
        sample = world_facts[:60]
        hits = sum(1 for h, r, t in sample if t in m.impute_tail(h, r, k=10))
        assert hits / len(sample) > 0.5

    def test_fact_ranking_prefers_true_object(self, world_facts):
        ts = TripleSet.from_facts(world_facts)
        m = KGEModel(ts, model="distmult", dim=16, seed=0).fit(epochs=25)
        ents = list(ts.ent_ids)
        wins = 0
        for h, r, t in world_facts[:40]:
            distractors = [e for e in ents[:6] if e != t]
            ranked = m.rank_objects(h, r, [t] + distractors)
            wins += ranked[0][0] == t
        assert wins / 40 > 0.6

    def test_unknown_model_rejected(self):
        with pytest.raises(ValueError):
            KGEModel(TripleSet.from_facts(FACTS), model="rotate")

    def test_score_shape(self):
        ts = TripleSet.from_facts(FACTS)
        m = KGEModel(ts, model="transe", dim=8, seed=0)
        s = m.score(ts.heads, ts.rels, ts.tails)
        assert s.shape == (len(FACTS),)


class TestVectorStore:
    def test_nearest_self(self):
        ts = TripleSet.from_facts(FACTS)
        m = KGEModel(ts, model="transe", dim=8, seed=0).fit(epochs=5)
        store = VectorStore.from_model(m)
        q = m.E[ts.ent_ids["a"]]
        assert store.nearest(q, k=1)[0][0] == "a"

    def test_type_filter_subsets(self):
        ts = TripleSet.from_facts(FACTS)
        m = KGEModel(ts, model="transe", dim=8, seed=0)
        store = VectorStore.from_model(m, types={"a": "person", "b": "person", "c": "city", "d": "city"})
        people = store.filter_by_type("person")
        assert set(people.ids) == {"a", "b"}

    def test_vectors_unit_normalized(self):
        ts = TripleSet.from_facts(FACTS)
        store = VectorStore.from_model(KGEModel(ts, dim=8, seed=0))
        norms = np.linalg.norm(store.V, axis=1)
        assert np.allclose(norms, 1.0)
