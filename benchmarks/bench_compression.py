"""Compression-side benchmarks supporting §5.1 (ratios) and §5.4
(compression/decompression speed) — the context for Tables 6/7's
fits-in-memory mechanism. One 250-row mini-batch per dataset, as in the
paper's mini-batch experiments.
"""
import numpy as np
import pytest

from repro import datasets
from repro.formats import REGISTRY
from repro.formats.dense import den_size_bytes

BATCH = 250
DATASETS = ["census", "imagenet", "mnist", "kdd99", "rcv1", "deep1b"]
METHODS = ["TOC", "CSR", "CVI", "DVI", "CLA", "Snappy", "Gzip"]


@pytest.fixture(scope="module")
def batches():
    return {name: datasets.generate(name, BATCH, seed=0)[0] for name in DATASETS}


@pytest.mark.benchmark(group="compress")
@pytest.mark.parametrize("dataset", ["census", "mnist"])
@pytest.mark.parametrize("method", ["TOC", "Snappy", "Gzip"])
def test_compression_time(benchmark, batches, dataset, method):
    """§5.4 left panel: compression time on a 250-row mini-batch."""
    X = batches[dataset]
    batch = benchmark.pedantic(REGISTRY[method].encode, args=(X,), rounds=3, iterations=1)
    ratio = den_size_bytes(*X.shape) / batch.size_bytes()
    benchmark.extra_info["compression_ratio"] = round(ratio, 2)


@pytest.mark.benchmark(group="decompress")
@pytest.mark.parametrize("dataset", ["census", "mnist"])
@pytest.mark.parametrize("method", ["TOC", "Snappy", "Gzip"])
def test_decompression_time(benchmark, batches, dataset, method):
    """§5.4 right panel: full decode of a 250-row mini-batch."""
    X = batches[dataset]
    batch = REGISTRY[method].encode(X)
    out = benchmark.pedantic(batch.decode, rounds=3, iterations=1)
    np.testing.assert_array_equal(out, X)


@pytest.mark.benchmark(group="ratio")
@pytest.mark.parametrize("dataset", DATASETS)
def test_compression_ratios_all_methods(benchmark, batches, dataset):
    """§5.1: ratios of every method on one mini-batch (reported via
    extra_info; the timed body is the full zoo encode)."""
    X = batches[dataset]

    def encode_all():
        return {m: REGISTRY[m].encode(X).size_bytes() for m in METHODS}

    sizes = benchmark.pedantic(encode_all, rounds=1, iterations=1)
    den = den_size_bytes(*X.shape)
    ratios = {m: round(den / s, 2) for m, s in sizes.items()}
    benchmark.extra_info.update(ratios)
    from repro.harness import report

    report.append(
        "compression_ratios.txt",
        f"{dataset:9s} "
        + " ".join(f"{m}={ratios[m]:6.1f}x" for m in METHODS),
    )
