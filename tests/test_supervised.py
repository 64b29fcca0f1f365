"""Tests for supervised matching (fine-tuned surrogates + MLP head)."""
import numpy as np
import pytest

from repro.core.supervised import (
    MLPClassifier,
    SupervisedResult,
    _f1_at_half,
    pair_features,
    train_eval,
)


class TestPairFeatures:
    def test_shape(self):
        vl = np.ones((3, 8), dtype=np.float32)
        vr = np.zeros((3, 8), dtype=np.float32)
        X = pair_features(vl, vr)
        assert X.shape == (3, 16)

    def test_identical_pair(self):
        v = np.random.default_rng(0).standard_normal((2, 4)).astype(np.float32)
        X = pair_features(v, v)
        np.testing.assert_allclose(X[:, :4], 0.0)
        np.testing.assert_allclose(X[:, 4:], v * v, atol=1e-6)


class TestMLP:
    def test_learns_linear_separation(self):
        g = np.random.default_rng(0)
        X = g.standard_normal((600, 10)).astype(np.float32)
        y = (X[:, 0] + X[:, 1] > 0).astype(np.float32)
        clf = MLPClassifier(10, seed=0)
        for _ in range(30):
            clf.train_epoch(X, y, rng=g)
        assert _f1_at_half(clf.predict_proba(X), y) > 0.95

    def test_learns_xor(self):
        """The hidden layer buys nonlinearity (a linear model cannot do XOR)."""
        g = np.random.default_rng(1)
        X = g.uniform(-1, 1, (800, 2)).astype(np.float32)
        y = ((X[:, 0] * X[:, 1]) > 0).astype(np.float32)
        clf = MLPClassifier(2, hidden=32, seed=0, lr=3e-2)
        for _ in range(200):
            clf.train_epoch(X, y, rng=g)
        assert _f1_at_half(clf.predict_proba(X), y) > 0.9

    def test_deterministic(self):
        g1, g2 = np.random.default_rng(3), np.random.default_rng(3)
        X = np.random.default_rng(2).standard_normal((100, 5)).astype(np.float32)
        y = (X[:, 0] > 0).astype(np.float32)
        a, b = MLPClassifier(5, seed=1), MLPClassifier(5, seed=1)
        a.train_epoch(X, y, rng=g1)
        b.train_epoch(X, y, rng=g2)
        np.testing.assert_array_equal(a.W1, b.W1)

    def test_probabilities_in_range(self):
        clf = MLPClassifier(4, seed=0)
        p = clf.predict_proba(np.random.default_rng(0)
                              .standard_normal((50, 4)).astype(np.float32))
        assert ((p >= 0) & (p <= 1)).all()


class TestF1AtHalf:
    def test_perfect(self):
        assert _f1_at_half(np.array([0.9, 0.1]), np.array([1.0, 0.0])) == 1.0

    def test_all_negative_predictions(self):
        assert _f1_at_half(np.array([0.1, 0.2]), np.array([1.0, 0.0])) == 0.0


class TestTrainEval:
    @pytest.fixture(scope="class")
    def result(self):
        return train_eval("DSM2", "SM", epochs=8, seed=0)

    def test_result_type(self, result):
        assert isinstance(result, SupervisedResult)
        assert result.model == "SM" and result.dataset == "DSM2"

    def test_learns_something(self, result):
        assert result.f1 > 0.5

    def test_times_positive(self, result):
        assert result.t_train > 0 and result.t_test > 0

    def test_static_runs_without_finetune(self):
        r = train_eval("DSM2", "GE", epochs=8)
        assert 0 <= r.f1 <= 1

    def test_sampling(self):
        r = train_eval("DSM2", "SM", epochs=4, sample=0.5)
        assert 0 <= r.f1 <= 1

    def test_dynamic_beats_glove_on_product_data(self):
        """The paper's supervised headline: fine-tuned dynamic models beat
        the static word-level ones on terminology-heavy data."""
        ge = train_eval("DSM2", "GE", epochs=8)
        ra = train_eval("DSM2", "RA", epochs=8)
        assert ra.f1 > ge.f1 - 0.05
