"""Loss/activation primitive tests."""
import numpy as np
import pytest

from repro.ml import losses


class TestSigmoid:
    def test_midpoint(self):
        assert losses.sigmoid(np.array([0.0]))[0] == 0.5

    def test_extremes_stable(self):
        out = losses.sigmoid(np.array([-1e6, 1e6]))
        assert out[0] == pytest.approx(0.0, abs=1e-12)
        assert out[1] == pytest.approx(1.0, abs=1e-12)
        assert np.isfinite(out).all()

    def test_symmetry(self):
        z = np.linspace(-5, 5, 11)
        np.testing.assert_allclose(losses.sigmoid(z) + losses.sigmoid(-z), 1.0)


class TestSoftmax:
    def test_rows_sum_to_one(self):
        z = np.random.default_rng(0).normal(size=(6, 4)) * 10
        np.testing.assert_allclose(losses.softmax(z).sum(axis=1), 1.0)

    def test_shift_invariance(self):
        z = np.random.default_rng(1).normal(size=(3, 5))
        np.testing.assert_allclose(losses.softmax(z), losses.softmax(z + 100.0))

    def test_large_logits_stable(self):
        out = losses.softmax(np.array([[1000.0, 0.0]]))
        assert np.isfinite(out).all()
        assert out[0, 0] == pytest.approx(1.0)


class TestLosses:
    def test_logistic_loss_perfect_prediction_near_zero(self):
        z = np.array([100.0, -100.0])
        y = np.array([1.0, 0.0])
        assert losses.logistic_loss(z, y) == pytest.approx(0.0, abs=1e-12)

    def test_logistic_loss_at_zero_margin(self):
        assert losses.logistic_loss(np.zeros(4), np.ones(4)) == pytest.approx(np.log(2))

    def test_hinge_zero_beyond_margin(self):
        assert losses.hinge_loss(np.array([2.0, -2.0]), np.array([1.0, -1.0])) == 0.0

    def test_hinge_linear_inside_margin(self):
        assert losses.hinge_loss(np.array([0.0]), np.array([1.0])) == 1.0

    def test_cross_entropy_perfect(self):
        probs = np.array([[1.0, 0.0], [0.0, 1.0]])
        onehot = probs.copy()
        assert losses.cross_entropy(probs, onehot) == pytest.approx(0.0, abs=1e-9)

    def test_one_hot(self):
        out = losses.one_hot(np.array([0, 2, 1]), 3)
        np.testing.assert_array_equal(out, np.eye(3)[[0, 2, 1]])
