"""MGD-trainable models expressed through the compressed-op interface.

Table 1 of the paper maps models to op classes; this module honours it:

- LR / SVM use only ``dot_vec`` (A·v) and ``vec_dot`` (v·A);
- the NN uses only ``dot_mat`` (A·M) and ``mat_dot`` (M·A).

A model never touches batch internals, so any registry format — TOC or
baseline — plugs in unchanged, and gradients are bitwise-comparable across
formats up to float reassociation.

The NN follows §5.3: feed-forward, two hidden layers of 200 and 50
sigmoid units, sigmoid output for binary labels / softmax for multiclass,
cross-entropy loss. LR/SVM do multiclass one-vs-rest, as the paper does.
"""
from __future__ import annotations

import numpy as np

from repro.ml import losses

#: ops each model is allowed to call, per Table 1 of the paper.
TABLE1_OPS = {
    "LR": {"dot_vec", "vec_dot"},
    "SVM": {"dot_vec", "vec_dot"},
    "NN": {"dot_mat", "mat_dot"},
}


class LogisticRegressionModel:
    """Binary logistic regression; labels in {0, 1}."""

    used_ops = TABLE1_OPS["LR"]

    def __init__(self, n_features: int, seed: int = 0) -> None:
        self.w = np.zeros(n_features, dtype=np.float64)

    def gradient(self, batch, y: np.ndarray) -> np.ndarray:
        z = batch.dot_vec(self.w)
        s = (losses.sigmoid(z) - y) / len(y)
        return batch.vec_dot(s)

    def step(self, batch, y: np.ndarray, lr: float) -> None:
        self.w -= lr * self.gradient(batch, y)

    def loss(self, batch, y: np.ndarray) -> float:
        return losses.logistic_loss(batch.dot_vec(self.w), y)

    def predict(self, batch) -> np.ndarray:
        return (losses.sigmoid(batch.dot_vec(self.w)) > 0.5).astype(np.int64)

    def decision(self, batch) -> np.ndarray:
        return batch.dot_vec(self.w)

    def get_params(self) -> dict[str, np.ndarray]:
        return {"w": self.w}

    def set_params(self, params: dict[str, np.ndarray]) -> None:
        self.w = params["w"].copy()


class LinearSVMModel:
    """Linear SVM with hinge loss; labels in {-1, +1}."""

    used_ops = TABLE1_OPS["SVM"]

    def __init__(self, n_features: int, seed: int = 0, reg: float = 0.0) -> None:
        self.w = np.zeros(n_features, dtype=np.float64)
        self.reg = float(reg)

    def gradient(self, batch, y: np.ndarray) -> np.ndarray:
        z = batch.dot_vec(self.w)
        active = (y * z) < 1.0
        s = -(y * active) / len(y)
        g = batch.vec_dot(s)
        if self.reg:
            g = g + self.reg * self.w
        return g

    def step(self, batch, y: np.ndarray, lr: float) -> None:
        self.w -= lr * self.gradient(batch, y)

    def loss(self, batch, y: np.ndarray) -> float:
        return losses.hinge_loss(batch.dot_vec(self.w), y)

    def predict(self, batch) -> np.ndarray:
        return np.where(batch.dot_vec(self.w) >= 0.0, 1, -1)

    def decision(self, batch) -> np.ndarray:
        return batch.dot_vec(self.w)

    def get_params(self) -> dict[str, np.ndarray]:
        return {"w": self.w}

    def set_params(self, params: dict[str, np.ndarray]) -> None:
        self.w = params["w"].copy()


class OneVsRestModel:
    """k binary models trained on y==c indicators — the paper's multiclass
    strategy for LR/SVM. One shared pass over each mini-batch updates all k
    sub-models (so the op count scales with k, as the paper observes on
    10-class Mnist)."""

    def __init__(self, base_factory, n_features: int, n_classes: int, seed: int = 0) -> None:
        self.models = [base_factory(n_features, seed=seed + c) for c in range(n_classes)]
        self.n_classes = n_classes
        self.used_ops = self.models[0].used_ops

    def _target(self, model, y: np.ndarray, c: int) -> np.ndarray:
        ind = (y == c).astype(np.float64)
        if isinstance(model, LinearSVMModel):
            return 2.0 * ind - 1.0
        return ind

    def step(self, batch, y: np.ndarray, lr: float) -> None:
        for c, m in enumerate(self.models):
            m.step(batch, self._target(m, y, c), lr)

    def loss(self, batch, y: np.ndarray) -> float:
        return float(
            np.mean([m.loss(batch, self._target(m, y, c)) for c, m in enumerate(self.models)])
        )

    def predict(self, batch) -> np.ndarray:
        scores = np.stack([m.decision(batch) for m in self.models], axis=1)
        return scores.argmax(axis=1)

    def get_params(self) -> dict[str, np.ndarray]:
        return {f"w{c}": m.w for c, m in enumerate(self.models)}

    def set_params(self, params: dict[str, np.ndarray]) -> None:
        for c, m in enumerate(self.models):
            m.w = params[f"w{c}"].copy()


class FeedForwardNN:
    """Two-hidden-layer sigmoid MLP (200, 50) per §5.3.

    Forward uses ``A·M`` once (input layer); backward uses ``M·A`` once
    (input-weight gradient, via (δ1ᵀ·A)ᵀ = A ᵀ·δ1). Hidden-to-hidden math
    is on small uncompressed activations and uses plain numpy, as in the
    paper where only the mini-batch itself is compressed.
    """

    used_ops = TABLE1_OPS["NN"]

    def __init__(
        self,
        n_features: int,
        n_classes: int = 2,
        hidden: tuple[int, int] = (200, 50),
        seed: int = 0,
    ) -> None:
        rng = np.random.default_rng(seed)
        h1, h2 = hidden
        self.n_out = 1 if n_classes == 2 else n_classes
        self.n_classes = n_classes

        def init(fan_in: int, fan_out: int) -> np.ndarray:
            bound = np.sqrt(6.0 / (fan_in + fan_out))
            return rng.uniform(-bound, bound, size=(fan_in, fan_out))

        self.W1 = init(n_features, h1)
        self.b1 = np.zeros(h1)
        self.W2 = init(h1, h2)
        self.b2 = np.zeros(h2)
        self.W3 = init(h2, self.n_out)
        self.b3 = np.zeros(self.n_out)

    def _forward(self, batch):
        Z1 = batch.dot_mat(self.W1) + self.b1  # A·M — Table 1
        H1 = losses.sigmoid(Z1)
        H2 = losses.sigmoid(H1 @ self.W2 + self.b2)
        Z3 = H2 @ self.W3 + self.b3
        out = losses.sigmoid(Z3) if self.n_out == 1 else losses.softmax(Z3)
        return H1, H2, out

    def _targets(self, y: np.ndarray) -> np.ndarray:
        if self.n_out == 1:
            return np.asarray(y, dtype=np.float64).reshape(-1, 1)
        return losses.one_hot(y, self.n_classes)

    def step(self, batch, y: np.ndarray, lr: float) -> None:
        n = batch.shape[0]
        T = self._targets(y)
        H1, H2, out = self._forward(batch)
        # Output delta is (p - t)/n for both sigmoid+BCE and softmax+CE.
        d3 = (out - T) / n
        dW3 = H2.T @ d3
        d2 = (d3 @ self.W3.T) * H2 * (1.0 - H2)
        dW2 = H1.T @ d2
        d1 = (d2 @ self.W2.T) * H1 * (1.0 - H1)
        dW1 = batch.mat_dot(d1.T).T  # (δ1ᵀ·A)ᵀ = Aᵀ·δ1 — M·A of Table 1
        self.W3 -= lr * dW3
        self.b3 -= lr * d3.sum(axis=0)
        self.W2 -= lr * dW2
        self.b2 -= lr * d2.sum(axis=0)
        self.W1 -= lr * dW1
        self.b1 -= lr * d1.sum(axis=0)

    def gradient_W1(self, batch, y: np.ndarray) -> np.ndarray:
        """Input-layer weight gradient only — used by cross-format tests."""
        n = batch.shape[0]
        T = self._targets(y)
        H1, H2, out = self._forward(batch)
        d3 = (out - T) / n
        d2 = (d3 @ self.W3.T) * H2 * (1.0 - H2)
        d1 = (d2 @ self.W2.T) * H1 * (1.0 - H1)
        return batch.mat_dot(d1.T).T

    def loss(self, batch, y: np.ndarray) -> float:
        T = self._targets(y)
        _, _, out = self._forward(batch)
        if self.n_out == 1:
            eps = 1e-12
            return float(
                -np.mean(T * np.log(out + eps) + (1 - T) * np.log(1 - out + eps))
            )
        return losses.cross_entropy(out, T)

    def predict(self, batch) -> np.ndarray:
        _, _, out = self._forward(batch)
        if self.n_out == 1:
            return (out.ravel() > 0.5).astype(np.int64)
        return out.argmax(axis=1)

    def get_params(self) -> dict[str, np.ndarray]:
        return {
            "W1": self.W1, "b1": self.b1,
            "W2": self.W2, "b2": self.b2,
            "W3": self.W3, "b3": self.b3,
        }

    def set_params(self, params: dict[str, np.ndarray]) -> None:
        for k, v in params.items():
            setattr(self, k, v.copy())


def make_model(kind: str, n_features: int, n_classes: int = 2, seed: int = 0):
    """Factory used by harnesses and the Spark trainer: LR | SVM | NN."""
    if kind == "NN":
        return FeedForwardNN(n_features, n_classes=n_classes, seed=seed)
    if kind == "LR":
        if n_classes > 2:
            return OneVsRestModel(LogisticRegressionModel, n_features, n_classes, seed)
        return LogisticRegressionModel(n_features, seed)
    if kind == "SVM":
        if n_classes > 2:
            return OneVsRestModel(LinearSVMModel, n_features, n_classes, seed)
        return LinearSVMModel(n_features, seed)
    raise ValueError(f"unknown model kind {kind!r}")
