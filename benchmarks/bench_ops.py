"""Matrix-operation runtime benchmarks (§5.2 / Figure 8 support).

One 250-row mini-batch per dataset, ops A*c, A·v, v·A, A·M (20 cols),
M·A — the grid the paper's §5.2 reports. Codec formats pay decompression
inside each op, as in the paper.
"""
import numpy as np
import pytest

from repro import datasets
from repro.formats import REGISTRY

BATCH = 250
DATASETS = ["census", "imagenet", "kdd99"]
METHODS = ["TOC", "DEN", "CSR", "CVI", "DVI", "CLA", "Snappy", "Gzip"]


@pytest.fixture(scope="module")
def encoded():
    out = {}
    for name in DATASETS:
        X, _ = datasets.generate(name, BATCH, seed=0)
        out[name] = (X, {m: REGISTRY[m].encode(X) for m in METHODS})
    return out


def _op(batch, X, op):
    rng = np.random.default_rng(0)
    if op == "scal":
        return lambda: batch.scal(1.5)
    if op == "dot_vec":
        v = rng.random(X.shape[1])
        return lambda: batch.dot_vec(v)
    if op == "vec_dot":
        u = rng.random(X.shape[0])
        return lambda: batch.vec_dot(u)
    if op == "dot_mat":
        M = rng.random((X.shape[1], 20))  # paper: row size of M is 20
        return lambda: batch.dot_mat(M)
    if op == "mat_dot":
        P = rng.random((20, X.shape[0]))
        return lambda: batch.mat_dot(P)
    raise ValueError(op)


@pytest.mark.benchmark(group="ops")
@pytest.mark.parametrize("op", ["scal", "dot_vec", "vec_dot", "dot_mat", "mat_dot"])
@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("dataset", DATASETS)
def test_matrix_op(benchmark, encoded, dataset, method, op):
    X, batches = encoded[dataset]
    fn = _op(batches[method], X, op)
    benchmark.pedantic(fn, rounds=3, iterations=2, warmup_rounds=1)
