"""Tests for the numpy feed-forward network (the forecasting model)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.mlp import MLP, softmax


class TestSoftmax:
    def test_rows_sum_to_one(self):
        z = np.random.default_rng(0).normal(size=(10, 4))
        p = softmax(z)
        np.testing.assert_allclose(p.sum(axis=1), 1.0)
        assert (p > 0).all()

    def test_shift_invariant(self):
        z = np.random.default_rng(1).normal(size=(5, 3))
        np.testing.assert_allclose(softmax(z), softmax(z + 100.0))

    def test_large_values_stable(self):
        p = softmax(np.array([[1000.0, 0.0]]))
        assert np.isfinite(p).all()


class TestMLP:
    def test_architecture_matches_paper(self):
        """Appendix K: input -> 16 ReLU -> 8 ReLU -> |C| softmax."""
        m = MLP(in_dim=24, out_dim=3)
        assert [w.shape for w in m.weights] == [(24, 16), (16, 8), (8, 3)]

    def test_predict_distribution(self):
        m = MLP(in_dim=4, out_dim=3, seed=0)
        p = m.predict_proba(np.random.default_rng(0).random((7, 4)))
        assert p.shape == (7, 3)
        np.testing.assert_allclose(p.sum(axis=1), 1.0)

    def test_deterministic_init(self):
        a = MLP(in_dim=4, out_dim=2, seed=5)
        b = MLP(in_dim=4, out_dim=2, seed=5)
        for wa, wb in zip(a.weights, b.weights):
            np.testing.assert_array_equal(wa, wb)

    def test_gradient_check(self):
        """Analytic gradients match finite differences."""
        rng = np.random.default_rng(0)
        m = MLP(in_dim=3, hidden=(5,), out_dim=2, seed=1)
        x = rng.random((6, 3))
        y = softmax(rng.normal(size=(6, 2)))
        gw, gb = m._gradients(x, y)
        eps = 1e-6
        for pi in range(2):  # check a few weight entries
            w = m.weights[pi]
            for idx in [(0, 0), (w.shape[0] - 1, w.shape[1] - 1)]:
                orig = w[idx]
                w[idx] = orig + eps
                lp = m.loss(x, y)
                w[idx] = orig - eps
                lm = m.loss(x, y)
                w[idx] = orig
                num = (lp - lm) / (2 * eps)
                assert gw[pi][idx] == pytest.approx(num, rel=1e-4, abs=1e-7)

    def test_training_reduces_loss(self):
        rng = np.random.default_rng(0)
        x = rng.random((200, 6))
        # deterministic target distribution from the input
        logits = np.stack([x[:, 0], x[:, 1], x[:, 2]], axis=1) * 4
        y = softmax(logits)
        m = MLP(in_dim=6, out_dim=3, seed=0)
        loss0 = m.loss(x, y)
        hist = m.fit(x, y, epochs=40, seed=0)
        assert m.loss(x, y) < loss0
        assert len(hist["train"]) == 40

    def test_fit_deterministic(self):
        rng = np.random.default_rng(0)
        x = rng.random((60, 4))
        y = softmax(rng.normal(size=(60, 2)))
        a = MLP(in_dim=4, out_dim=2, seed=3)
        a.fit(x, y, epochs=5, seed=3)
        b = MLP(in_dim=4, out_dim=2, seed=3)
        b.fit(x, y, epochs=5, seed=3)
        np.testing.assert_array_equal(
            a.predict_proba(x), b.predict_proba(x)
        )

    def test_best_validation_weights_kept(self):
        rng = np.random.default_rng(1)
        x = rng.random((100, 4))
        y = softmax(rng.normal(size=(100, 3)))
        m = MLP(in_dim=4, out_dim=3, seed=0)
        hist = m.fit(x, y, epochs=30, seed=0)
        val = np.array(hist["val"])
        # final model loss equals the best epoch's val loss (re-eval on
        # the same split would need the split; check it's not the worst)
        assert val.min() <= val[-1] + 1e-9

    def test_tiny_dataset(self):
        m = MLP(in_dim=2, out_dim=2, seed=0)
        x = np.array([[0.0, 1.0], [1.0, 0.0]])
        y = np.array([[0.9, 0.1], [0.1, 0.9]])
        m.fit(x, y, epochs=3, seed=0)  # must not crash
        assert m.predict_proba(x).shape == (2, 2)
