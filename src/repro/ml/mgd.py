"""Mini-batch SGD driver (paper §2.1): shuffle once, fixed epochs.

``make_batches`` performs the shuffle-once protocol (one seeded
permutation up front, §2.1.3) and compresses each mini-batch with the
requested format. ``train`` runs the fixed-epoch MGD loop of §5.3,
visiting batches in the shuffled order every epoch. Codec formats
(Snappy/Gzip surrogates) get a ``begin_step``/``end_step`` bracket so a
mini-batch is decompressed once per visit and the dense copy is dropped
afterwards — the paper's GC access pattern.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class BatchSet:
    """Compressed mini-batches plus their labels, in visit order."""

    batches: list  # compressed mini-batch objects (registry formats)
    labels: list[np.ndarray]
    n_features: int
    format_name: str

    def total_size_bytes(self) -> int:
        return sum(b.size_bytes() for b in self.batches)

    def __len__(self) -> int:
        return len(self.batches)


def shuffle_once(n: int, seed: int) -> np.ndarray:
    """The paper's shuffle-once permutation (§2.1.3)."""
    return np.random.default_rng(seed).permutation(n)


def encode_labels(kind: str, y: np.ndarray, n_classes: int) -> np.ndarray:
    """Per-model label encoding: SVM wants ±1 for binary, else class ids."""
    y = np.asarray(y)
    if kind == "SVM" and n_classes == 2:
        return np.where(y > 0, 1.0, -1.0)
    return y.astype(np.float64)


def make_batches(
    X: np.ndarray,
    y: np.ndarray,
    fmt,
    batch_size: int = 250,
    seed: int = 0,
) -> BatchSet:
    """Shuffle once, slice into ``batch_size``-row mini-batches, compress."""
    X = np.asarray(X, dtype=np.float64)
    perm = shuffle_once(len(X), seed)
    Xs, ys = X[perm], np.asarray(y)[perm]
    batches, labels = [], []
    for start in range(0, len(Xs), batch_size):
        batches.append(fmt.encode(Xs[start : start + batch_size]))
        labels.append(ys[start : start + batch_size])
    return BatchSet(batches, labels, X.shape[1], getattr(fmt, "name", fmt.__name__))


@dataclass
class TrainResult:
    model: object
    epoch_losses: list[float] = field(default_factory=list)


def train(
    model,
    batch_set: BatchSet,
    epochs: int = 10,
    lr: float = 0.1,
    track_loss: bool = True,
) -> TrainResult:
    """Fixed-epoch MGD (§5.3): every epoch visits every mini-batch once."""
    result = TrainResult(model=model)
    for _ in range(epochs):
        for batch, yb in zip(batch_set.batches, batch_set.labels):
            visit = getattr(batch, "begin_step", None)
            if visit is not None:
                visit()
            try:
                model.step(batch, yb, lr)
            finally:
                leave = getattr(batch, "end_step", None)
                if leave is not None:
                    leave()
        if track_loss:
            total = 0.0
            for batch, yb in zip(batch_set.batches, batch_set.labels):
                total += model.loss(batch, yb) * len(yb)
            result.epoch_losses.append(total / sum(len(l) for l in batch_set.labels))
    return result
