"""Unit tests for the learned string similarity (§5.1)."""
import numpy as np
import pytest

from repro.ml.neural_sim import NeuralStringSim, distant_supervision, recall_at_precision


class TestEncoder:
    def test_unit_norm(self):
        m = NeuralStringSim(seed=1)
        v = m.encode("hello world")
        assert np.linalg.norm(v) == pytest.approx(1.0)

    def test_deterministic(self):
        a = NeuralStringSim(seed=1).encode("rome")
        b = NeuralStringSim(seed=1).encode("rome")
        assert np.allclose(a, b)

    def test_similarity_bounds_and_symmetry(self):
        m = NeuralStringSim(seed=1)
        s1, s2 = m.similarity("abc", "abd"), m.similarity("abd", "abc")
        assert s1 == pytest.approx(s2)
        assert 0.0 <= s1 <= 1.0

    def test_self_similarity_is_max(self):
        m = NeuralStringSim(seed=1)
        assert m.similarity("robert", "robert") == pytest.approx(1.0)

    def test_case_whitespace_invariant(self):
        m = NeuralStringSim(seed=1)
        assert m.similarity("Tom  Hanks", "tom hanks") == pytest.approx(1.0)


class TestTraining:
    @pytest.fixture(scope="class")
    def data(self, uni_mid):
        return distant_supervision(uni_mid)

    def test_distant_supervision_shapes(self, data):
        pos, pool, hard, ev = data
        assert len(pos) > 100 and len(pool) > 50 and len(ev) > 50
        assert hard  # surname collisions exist
        labels = {y for _, _, y in ev}
        assert labels == {0, 1}

    def test_eval_mostly_unseen_surface_pairs(self, data, uni_mid):
        # entities are held out, but full names repeat across entities by
        # design (shared first/surname pools), so *some* surface pairs
        # coincide; the benchmark must still be dominated by unseen pairs
        pos, _, _, ev = data
        train_pairs = {frozenset(p) for p in pos}
        eval_pos = {frozenset((a, b)) for a, b, y in ev if y == 1}
        leak = len(train_pairs & eval_pos) / len(eval_pos)
        assert leak < 0.5

    def test_training_brings_synonyms_closer(self, data):
        pos, pool, hard, _ = data
        untrained = NeuralStringSim(seed=0)
        trained = NeuralStringSim(seed=0).fit(pos, pool, hard_negatives=hard, epochs=6)
        syn_pairs = [(a, b) for a, b in pos if a.split()[0] != b.split()[0]][:40]
        before = np.mean([untrained.similarity(a, b) for a, b in syn_pairs])
        after = np.mean([trained.similarity(a, b) for a, b in syn_pairs])
        assert after > before

    def test_training_separates_hard_negatives_from_synonyms(self, data):
        pos, pool, hard, ev = data
        m = NeuralStringSim(seed=0).fit(pos, pool, hard_negatives=hard, epochs=8)
        scores = [(m.similarity(a, b), y) for a, b, y in ev]
        assert recall_at_precision(scores, 0.9) > 0.7


class TestRecallAtPrecision:
    def test_perfect_separation(self):
        scores = [(0.9, 1), (0.8, 1), (0.2, 0), (0.1, 0)]
        assert recall_at_precision(scores, 0.95) == 1.0

    def test_inseparable(self):
        scores = [(0.5, 0), (0.5, 0), (0.5, 0), (0.4, 1)]
        assert recall_at_precision(scores, 0.9) == 0.0

    def test_partial(self):
        scores = [(0.9, 1), (0.8, 0), (0.7, 1), (0.6, 1)]
        # accepting only the top item gives precision 1.0, recall 1/3
        assert recall_at_precision(scores, 0.95) == pytest.approx(1 / 3)
