"""Unit tests for evaluator metrics (paper §4.3)."""
import numpy as np
import pytest

from repro.core.registry import METRICS
from repro.evaluator import Accuracy, RocAuc


class TestAccuracy:
    def test_multiclass(self):
        m = Accuracy()
        logits = np.array([[2.0, 0.0], [0.0, 2.0], [3.0, 1.0]])
        m.update(logits, np.array([0, 1, 1]))
        assert m.result() == pytest.approx(2 / 3)

    def test_binary_logits(self):
        m = Accuracy()
        m.update(np.array([1.0, -1.0, 0.5]), np.array([1, 0, 0]))
        assert m.result() == pytest.approx(2 / 3)

    def test_incremental_equals_single_shot(self, rng):
        logits = rng.standard_normal((100, 5))
        labels = rng.integers(0, 5, 100)
        whole = Accuracy()
        whole.update(logits, labels)
        chunked = Accuracy()
        for i in range(0, 100, 7):  # decomposable: arbitrary batching
            chunked.update(logits[i : i + 7], labels[i : i + 7])
        assert chunked.result() == pytest.approx(whole.result())

    def test_empty_is_nan(self):
        assert np.isnan(Accuracy().result())

    def test_registered(self):
        assert isinstance(METRICS.get("Accuracy")(), Accuracy)


class TestRocAuc:
    def test_perfect_separation(self):
        m = RocAuc()
        m.update(np.array([-2.0, -1.0, 1.0, 2.0]), np.array([0, 0, 1, 1]))
        assert m.result() == pytest.approx(1.0)

    def test_inverted_scores(self):
        m = RocAuc()
        m.update(np.array([2.0, 1.0, -1.0, -2.0]), np.array([0, 0, 1, 1]))
        assert m.result() == pytest.approx(0.0)

    def test_random_scores_near_half(self):
        g = np.random.default_rng(0)
        m = RocAuc()
        m.update(g.standard_normal(20000), g.integers(0, 2, 20000))
        assert m.result() == pytest.approx(0.5, abs=0.02)

    def test_matches_pairwise_definition(self, rng):
        scores = rng.standard_normal(50)
        labels = rng.integers(0, 2, 50)
        m = RocAuc()
        m.update(scores, labels)
        pos, neg = scores[labels == 1], scores[labels == 0]
        wins = sum((p > n) + 0.5 * (p == n) for p in pos for n in neg)
        assert m.result() == pytest.approx(wins / (len(pos) * len(neg)))

    def test_ties_get_midranks(self):
        m = RocAuc()
        m.update(np.array([1.0, 1.0, 0.0, 0.0]), np.array([1, 0, 1, 0]))
        assert m.result() == pytest.approx(0.5)

    def test_holistic_buffers_across_updates(self, rng):
        scores = rng.standard_normal(60)
        labels = rng.integers(0, 2, 60)
        whole = RocAuc()
        whole.update(scores, labels)
        chunked = RocAuc()
        for i in range(0, 60, 13):
            chunked.update(scores[i : i + 13], labels[i : i + 13])
        assert chunked.result() == pytest.approx(whole.result())

    def test_single_class_is_nan(self):
        m = RocAuc()
        m.update(np.array([1.0, 2.0]), np.array([1, 1]))
        assert np.isnan(m.result())

    def test_multiclass_rejected(self):
        m = RocAuc()
        with pytest.raises(ValueError):
            m.update(np.zeros((3, 2)), np.zeros(3, dtype=int))

    def test_registered(self):
        assert isinstance(METRICS.get("RocAuc")(), RocAuc)


class TestRegistry:
    def test_unknown_metric_lists_available(self):
        with pytest.raises(KeyError, match="Accuracy"):
            METRICS.get("NopeMetric")

    def test_duplicate_registration_rejected(self):
        with pytest.raises(ValueError, match="already registered"):
            METRICS.register("Accuracy")(Accuracy)
