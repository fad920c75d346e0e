"""Loss and activation primitives shared by the MGD models.

Matches the paper's choices (§5.3): logistic loss for LR, hinge loss for
SVM, cross-entropy with sigmoid/softmax outputs for the NN.
"""
from __future__ import annotations

import numpy as np


def sigmoid(z: np.ndarray) -> np.ndarray:
    """Numerically stable logistic function."""
    z = np.clip(z, -500, 500)
    return 1.0 / (1.0 + np.exp(-z))


def softmax(z: np.ndarray) -> np.ndarray:
    """Row-wise softmax with max-shift stabilization."""
    z = z - z.max(axis=1, keepdims=True)
    e = np.exp(z)
    return e / e.sum(axis=1, keepdims=True)


def logistic_loss(z: np.ndarray, y01: np.ndarray) -> float:
    """Mean logistic loss; ``z`` margins, ``y01`` labels in {0, 1}."""
    s = np.where(y01 > 0.5, -z, z)  # log(1 + exp(s)) with stable log1p
    return float(np.mean(np.logaddexp(0.0, s)))


def hinge_loss(z: np.ndarray, ypm: np.ndarray) -> float:
    """Mean hinge loss; ``ypm`` labels in {-1, +1}."""
    return float(np.mean(np.maximum(0.0, 1.0 - ypm * z)))


def cross_entropy(probs: np.ndarray, onehot: np.ndarray) -> float:
    """Mean cross-entropy between predicted probabilities and one-hot y."""
    eps = 1e-12
    return float(-np.mean(np.sum(onehot * np.log(probs + eps), axis=1)))


def one_hot(y: np.ndarray, n_classes: int) -> np.ndarray:
    out = np.zeros((len(y), n_classes), dtype=np.float64)
    out[np.arange(len(y)), y.astype(int)] = 1.0
    return out
