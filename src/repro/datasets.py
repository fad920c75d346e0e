"""Synthetic surrogates for the paper's six evaluation datasets (Table 5).

The real datasets (US Census, ImageNet features, Mnist8m, Kdd99, Rcv1,
Deep1Billion) are not available offline, so each is replaced by a
deterministic generator matching the properties TOC's behaviour depends
on (see DESIGN.md substitution table):

- column count (Rcv1 scaled from 47,236 to 2,000 columns);
- sparsity (fraction of non-zeros, Table 5's definition);
- value-dictionary size (how well value indexing works);
- cross-row *sequence* redundancy (how well LZW-style logical encoding
  works).

Redundancy model for the moderate-sparsity datasets (census, imagenet,
kdd99): columns are split into contiguous *segments*; each segment has a
pool of variants (sparse pattern + values) chosen per row with a Zipf
law, plus a per-entry mutation rate. Head variants recur often → long
learnable column_index:value subsequences (TOC's fuel); tail variants and
mutations keep full rows from repeating. Low mutation (kdd) → strongest
redundancy, matching the paper's ordering. The mnist surrogate uses
whole-row templates with a *high* mutation rate and a large value pool,
reproducing the paper's observation that Mnist has few repeated
subsequences for logical encoding to exploit (TOC < Gzip there). rcv1 is
extreme-sparse with near-random supports; deep1b is dense i.i.d. doubles
(incompressible).

Labels come from a planted linear model over the features so LR/SVM/NN
training has signal to descend on.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class DatasetSpec:
    """Generator knobs for one paper-dataset surrogate."""

    name: str
    paper_name: str
    n_cols: int
    sparsity: float  # target fraction of non-zeros
    n_segments: int  # column segments (0 = special generator)
    n_variants: int  # variant pool per segment / template pool for mnist
    zipf_a: float  # skew of the variant choice (0 = uniform)
    mutation: float  # per-entry probability an entry is resampled
    n_values: int  # distinct non-zero value pool size
    n_classes: int = 2
    paper_dims: str = ""
    paper_sparsity: float = 0.0


SPECS: dict[str, DatasetSpec] = {
    "census": DatasetSpec(
        name="census", paper_name="US Census", n_cols=68, sparsity=0.43,
        n_segments=4, n_variants=40, zipf_a=1.6, mutation=0.01, n_values=12,
        paper_dims="2.5M * 68", paper_sparsity=0.43,
    ),
    "imagenet": DatasetSpec(
        name="imagenet", paper_name="ImageNet", n_cols=900, sparsity=0.31,
        n_segments=30, n_variants=12, zipf_a=1.2, mutation=0.06, n_values=32,
        paper_dims="1.2M * 900", paper_sparsity=0.31,
    ),
    "mnist": DatasetSpec(
        name="mnist", paper_name="Mnist8m", n_cols=784, sparsity=0.25,
        n_segments=0, n_variants=60, zipf_a=0.0, mutation=0.25, n_values=255,
        n_classes=10, paper_dims="8.1M * 784", paper_sparsity=0.25,
    ),
    "kdd99": DatasetSpec(
        name="kdd99", paper_name="Kdd99", n_cols=42, sparsity=0.39,
        n_segments=3, n_variants=40, zipf_a=2.0, mutation=0.003, n_values=8,
        paper_dims="4M * 42", paper_sparsity=0.39,
    ),
    "rcv1": DatasetSpec(
        name="rcv1", paper_name="Rcv1", n_cols=2000,
        sparsity=0.0016 * (47236 / 2000),  # keep nnz/row at the paper's ~76
        n_segments=0, n_variants=0, zipf_a=0.0, mutation=1.0, n_values=5000,
        paper_dims="800K * 47236", paper_sparsity=0.0016,
    ),
    "deep1b": DatasetSpec(
        name="deep1b", paper_name="Deep1Billion", n_cols=96, sparsity=1.0,
        n_segments=0, n_variants=0, zipf_a=0.0, mutation=1.0, n_values=0,
        paper_dims="1B * 96", paper_sparsity=1.0,
    ),
}


def _zipf_weights(n: int, a: float) -> np.ndarray:
    if a <= 0:
        return np.full(n, 1.0 / n)
    w = 1.0 / np.arange(1, n + 1) ** a
    return w / w.sum()


def _segmented(spec: DatasetSpec, n_rows: int, rng: np.random.Generator) -> np.ndarray:
    """Zipf-chosen segment variants + mutation (census/imagenet/kdd99)."""
    bounds = np.linspace(0, spec.n_cols, spec.n_segments + 1).astype(int)
    value_pool = rng.random(spec.n_values) * 10.0 + 0.1  # nonzero doubles
    weights = _zipf_weights(spec.n_variants, spec.zipf_a)
    X = np.zeros((n_rows, spec.n_cols))
    for s in range(spec.n_segments):
        width = bounds[s + 1] - bounds[s]
        masks = rng.random((spec.n_variants, width)) < spec.sparsity
        vals = value_pool[rng.integers(0, spec.n_values, (spec.n_variants, width))] * masks
        choice = rng.choice(spec.n_variants, n_rows, p=weights)
        X[:, bounds[s] : bounds[s + 1]] = vals[choice]
    if spec.mutation > 0:
        mut = rng.random(X.shape) < spec.mutation
        new_mask = rng.random(X.shape) < spec.sparsity
        new_vals = value_pool[rng.integers(0, spec.n_values, X.shape)] * new_mask
        X = np.where(mut, new_vals, X)
    return X


def _templated(spec: DatasetSpec, n_rows: int, rng: np.random.Generator) -> np.ndarray:
    """Whole-row templates + heavy mutation (mnist surrogate)."""
    masks = rng.random((spec.n_variants, spec.n_cols)) < spec.sparsity
    value_pool = np.round(rng.random(spec.n_values) * 10.0, 1) + 0.1
    tvals = value_pool[rng.integers(0, spec.n_values, (spec.n_variants, spec.n_cols))] * masks
    t_ids = rng.integers(0, spec.n_variants, n_rows)
    X = tvals[t_ids].copy()
    mut = rng.random(X.shape) < spec.mutation
    new_mask = rng.random(X.shape) < spec.sparsity
    new_vals = value_pool[rng.integers(0, len(value_pool), X.shape)] * new_mask
    return np.where(mut, new_vals, X)


def _rcv1(spec: DatasetSpec, n_rows: int, rng: np.random.Generator) -> np.ndarray:
    """Extreme-sparse, near-random supports — no sequence redundancy."""
    nnz_per_row = max(1, int(round(spec.sparsity * spec.n_cols)))
    X = np.zeros((n_rows, spec.n_cols))
    value_pool = np.round(rng.random(spec.n_values) * 2.0, 4) + 0.01
    for r in range(n_rows):
        k = max(1, int(rng.poisson(nnz_per_row)))
        cols = rng.choice(spec.n_cols, size=min(k, spec.n_cols), replace=False)
        X[r, cols] = value_pool[rng.integers(0, spec.n_values, len(cols))]
    return X


def generate(name: str, n_rows: int, seed: int = 0) -> tuple[np.ndarray, np.ndarray]:
    """Generate ``(X, y)`` for the surrogate dataset ``name``."""
    spec = SPECS[name]
    rng = np.random.default_rng(seed)

    if name == "deep1b":
        X = rng.random((n_rows, spec.n_cols))
    elif name == "rcv1":
        X = _rcv1(spec, n_rows, rng)
    elif name == "mnist":
        X = _templated(spec, n_rows, rng)
    else:
        X = _segmented(spec, n_rows, rng)

    # Planted linear labels with noise; thresholds balance the classes.
    w = np.random.default_rng(seed + 1).normal(size=spec.n_cols)
    scores = X @ w + 0.1 * rng.normal(size=n_rows)
    if spec.n_classes == 2:
        y = (scores > np.median(scores)).astype(np.int64)
    else:
        qs = np.quantile(scores, np.linspace(0, 1, spec.n_classes + 1)[1:-1])
        y = np.searchsorted(qs, scores).astype(np.int64)
    return X, y


def sparsity_of(X: np.ndarray) -> float:
    """Table 5's sparsity: # non-zeros / # total values."""
    return float(np.count_nonzero(X) / X.size)
