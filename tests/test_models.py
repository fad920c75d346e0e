"""Model tests: Table 1 op usage, gradient correctness (numeric check),
and cross-format gradient equivalence."""
import numpy as np
import pytest

from repro.formats import REGISTRY
from repro.ml import losses
from repro.ml.models import (
    TABLE1_OPS,
    FeedForwardNN,
    LinearSVMModel,
    LogisticRegressionModel,
    OneVsRestModel,
    make_model,
)


def _data(seed=0, n=40, m=12, classes=2):
    rng = np.random.default_rng(seed)
    X = rng.choice([0.0, 0.0, 1.0, 2.0], size=(n, m))
    y = rng.integers(0, classes, n)
    return X, y


class _OpRecorder:
    """Wraps a DEN batch and records which Table-1 ops get called."""

    def __init__(self, X):
        self._inner = REGISTRY["DEN"].encode(X)
        self.called = set()

    @property
    def shape(self):
        return self._inner.shape

    def __getattr__(self, name):
        attr = getattr(self._inner, name)
        if name in ("dot_vec", "vec_dot", "dot_mat", "mat_dot"):
            def wrapper(*a, **kw):
                self.called.add(name)
                return attr(*a, **kw)

            return wrapper
        return attr


class TestTable1OpUsage:
    """The paper's Table 1: LR/SVM use A·v and v·A; NN uses A·M and M·A."""

    @pytest.mark.parametrize("kind", ["LR", "SVM"])
    def test_linear_models_use_only_vector_ops(self, kind):
        X, y = _data()
        rec = _OpRecorder(X)
        model = make_model(kind, X.shape[1])
        yk = np.where(y > 0, 1.0, -1.0) if kind == "SVM" else y.astype(float)
        model.step(rec, yk, 0.1)
        assert rec.called == TABLE1_OPS[kind] == {"dot_vec", "vec_dot"}

    def test_nn_uses_only_matrix_ops(self):
        X, y = _data()
        rec = _OpRecorder(X)
        model = make_model("NN", X.shape[1])
        model.step(rec, y.astype(float), 0.1)
        assert rec.called == TABLE1_OPS["NN"] == {"dot_mat", "mat_dot"}


class TestLogisticRegression:
    def test_gradient_matches_numeric(self):
        X, y = _data(1, n=20, m=6)
        batch = REGISTRY["DEN"].encode(X)
        model = LogisticRegressionModel(6)
        model.w = np.random.default_rng(2).normal(size=6) * 0.1
        grad = model.gradient(batch, y.astype(float))
        eps = 1e-6
        for j in range(6):
            w_plus, w_minus = model.w.copy(), model.w.copy()
            w_plus[j] += eps
            w_minus[j] -= eps
            lp = losses.logistic_loss(X @ w_plus, y)
            lm = losses.logistic_loss(X @ w_minus, y)
            assert grad[j] == pytest.approx((lp - lm) / (2 * eps), abs=1e-5)

    def test_loss_decreases(self):
        X, y = _data(3, n=100)
        batch = REGISTRY["DEN"].encode(X)
        model = LogisticRegressionModel(X.shape[1])
        before = model.loss(batch, y.astype(float))
        for _ in range(30):
            model.step(batch, y.astype(float), 0.5)
        assert model.loss(batch, y.astype(float)) < before

    def test_predictions_binary(self):
        X, y = _data(4)
        model = LogisticRegressionModel(X.shape[1])
        preds = model.predict(REGISTRY["DEN"].encode(X))
        assert set(np.unique(preds)).issubset({0, 1})


class TestLinearSVM:
    def test_gradient_matches_numeric_away_from_hinge(self):
        X, y01 = _data(5, n=20, m=6)
        y = np.where(y01 > 0, 1.0, -1.0)
        batch = REGISTRY["DEN"].encode(X)
        model = LinearSVMModel(6)
        model.w = np.random.default_rng(6).normal(size=6) * 0.01
        margins = y * (X @ model.w)
        if np.any(np.abs(margins - 1.0) < 1e-4):
            pytest.skip("degenerate: a margin sits on the hinge")
        grad = model.gradient(batch, y)
        eps = 1e-7
        for j in range(6):
            wp, wm = model.w.copy(), model.w.copy()
            wp[j] += eps
            wm[j] -= eps
            lp = losses.hinge_loss(X @ wp, y)
            lm = losses.hinge_loss(X @ wm, y)
            assert grad[j] == pytest.approx((lp - lm) / (2 * eps), abs=1e-4)

    def test_loss_decreases(self):
        X, y01 = _data(7, n=100)
        y = np.where(y01 > 0, 1.0, -1.0)
        batch = REGISTRY["DEN"].encode(X)
        model = LinearSVMModel(X.shape[1])
        before = model.loss(batch, y)
        for _ in range(30):
            model.step(batch, y, 0.1)
        assert model.loss(batch, y) < before

    def test_regularization_shrinks_weights(self):
        X, y01 = _data(8)
        y = np.where(y01 > 0, 1.0, -1.0)
        batch = REGISTRY["DEN"].encode(X)
        plain = LinearSVMModel(X.shape[1], reg=0.0)
        reg = LinearSVMModel(X.shape[1], reg=1.0)
        for _ in range(20):
            plain.step(batch, y, 0.1)
            reg.step(batch, y, 0.1)
        assert np.linalg.norm(reg.w) < np.linalg.norm(plain.w)


class TestFeedForwardNN:
    def test_architecture_matches_paper(self):
        # §5.3: two hidden layers of 200 and 50 sigmoid units.
        model = FeedForwardNN(30)
        assert model.W1.shape == (30, 200)
        assert model.W2.shape == (200, 50)
        assert model.W3.shape == (50, 1)

    def test_softmax_head_for_multiclass(self):
        model = FeedForwardNN(30, n_classes=10)
        assert model.W3.shape == (50, 10)

    def test_w1_gradient_matches_numeric(self):
        X, y = _data(9, n=15, m=5)
        batch = REGISTRY["DEN"].encode(X)
        model = FeedForwardNN(5, hidden=(4, 3), seed=1)
        grad = model.gradient_W1(batch, y.astype(float))
        eps = 1e-6
        rng = np.random.default_rng(10)
        for _ in range(6):
            i, j = rng.integers(0, 5), rng.integers(0, 4)
            orig = model.W1[i, j]
            model.W1[i, j] = orig + eps
            lp = model.loss(batch, y.astype(float))
            model.W1[i, j] = orig - eps
            lm = model.loss(batch, y.astype(float))
            model.W1[i, j] = orig
            assert grad[i, j] == pytest.approx((lp - lm) / (2 * eps), abs=1e-4)

    def test_loss_decreases_binary(self):
        X, y = _data(11, n=120, m=10)
        batch = REGISTRY["DEN"].encode(X)
        model = FeedForwardNN(10, hidden=(16, 8), seed=0)
        before = model.loss(batch, y.astype(float))
        for _ in range(50):
            model.step(batch, y.astype(float), 0.5)
        assert model.loss(batch, y.astype(float)) < before

    def test_loss_decreases_multiclass(self):
        X, y = _data(12, n=120, m=10, classes=4)
        batch = REGISTRY["DEN"].encode(X)
        model = FeedForwardNN(10, n_classes=4, hidden=(16, 8), seed=0)
        before = model.loss(batch, y)
        for _ in range(50):
            model.step(batch, y, 0.5)
        assert model.loss(batch, y) < before

    def test_params_roundtrip(self):
        model = FeedForwardNN(8, hidden=(4, 3))
        params = model.get_params()
        clone = FeedForwardNN(8, hidden=(4, 3), seed=99)
        clone.set_params(params)
        for k, v in clone.get_params().items():
            np.testing.assert_array_equal(v, params[k])


class TestOneVsRest:
    def test_trains_k_models(self):
        model = OneVsRestModel(LogisticRegressionModel, 10, 4)
        assert len(model.models) == 4

    def test_svm_targets_are_pm1(self):
        model = OneVsRestModel(LinearSVMModel, 5, 3)
        y = np.array([0, 1, 2, 1])
        t = model._target(model.models[1], y, 1)
        np.testing.assert_array_equal(t, [-1.0, 1.0, -1.0, 1.0])

    def test_lr_targets_are_01(self):
        model = OneVsRestModel(LogisticRegressionModel, 5, 3)
        y = np.array([0, 1, 2, 1])
        t = model._target(model.models[1], y, 1)
        np.testing.assert_array_equal(t, [0.0, 1.0, 0.0, 1.0])

    def test_predict_returns_class_ids(self):
        X, y = _data(13, n=80, classes=3)
        batch = REGISTRY["DEN"].encode(X)
        model = OneVsRestModel(LogisticRegressionModel, X.shape[1], 3)
        for _ in range(20):
            model.step(batch, y, 0.5)
        preds = model.predict(batch)
        assert set(np.unique(preds)).issubset({0, 1, 2})


class TestCrossFormatGradients:
    """The same model step over any format must produce (numerically)
    identical parameters — the correctness claim behind §4's theorems."""

    @pytest.mark.parametrize("fmt", sorted(set(REGISTRY) - {"DEN"}))
    @pytest.mark.parametrize("kind", ["LR", "SVM", "NN"])
    def test_one_step_equivalence(self, fmt, kind):
        X, y = _data(14, n=30, m=8)
        yk = np.where(y > 0, 1.0, -1.0) if kind == "SVM" else y.astype(float)
        ref = make_model(kind, 8, seed=5)
        other = make_model(kind, 8, seed=5)
        ref.step(REGISTRY["DEN"].encode(X), yk, 0.2)
        other.step(REGISTRY[fmt].encode(X), yk, 0.2)
        for k, v in ref.get_params().items():
            np.testing.assert_allclose(other.get_params()[k], v, atol=1e-9, err_msg=k)

    def test_make_model_rejects_unknown(self):
        with pytest.raises(ValueError):
            make_model("RF", 5)
