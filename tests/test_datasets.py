"""Dataset-surrogate tests: Table 5 properties and the redundancy ordering
the paper's results depend on."""
import numpy as np
import pytest

from repro import datasets
from repro.core.toc import TOCMatrix
from repro.formats import REGISTRY
from repro.formats.dense import den_size_bytes

ALL = sorted(datasets.SPECS)


class TestBasicProperties:
    @pytest.mark.parametrize("name", ALL)
    def test_shapes(self, name):
        X, y = datasets.generate(name, 120, seed=0)
        assert X.shape == (120, datasets.SPECS[name].n_cols)
        assert y.shape == (120,)

    @pytest.mark.parametrize("name", ALL)
    def test_deterministic_in_seed(self, name):
        X1, y1 = datasets.generate(name, 60, seed=42)
        X2, y2 = datasets.generate(name, 60, seed=42)
        np.testing.assert_array_equal(X1, X2)
        np.testing.assert_array_equal(y1, y2)

    @pytest.mark.parametrize("name", ALL)
    def test_different_seeds_differ(self, name):
        X1, _ = datasets.generate(name, 60, seed=1)
        X2, _ = datasets.generate(name, 60, seed=2)
        assert not np.array_equal(X1, X2)

    @pytest.mark.parametrize("name", ALL)
    def test_labels_in_class_range(self, name):
        _, y = datasets.generate(name, 200, seed=0)
        spec = datasets.SPECS[name]
        assert y.min() >= 0
        assert y.max() < spec.n_classes

    def test_mnist_is_ten_class(self):
        _, y = datasets.generate("mnist", 500, seed=0)
        assert datasets.SPECS["mnist"].n_classes == 10
        assert len(np.unique(y)) > 5

    def test_labels_not_constant(self):
        for name in ALL:
            _, y = datasets.generate(name, 200, seed=0)
            assert len(np.unique(y)) >= 2


class TestTable5Sparsity:
    """Measured sparsity must sit near the paper's Table 5 column."""

    @pytest.mark.parametrize(
        "name,rel_tol",
        [("census", 0.15), ("imagenet", 0.15), ("mnist", 0.15), ("kdd99", 0.15)],
    )
    def test_moderate_sparsity_targets(self, name, rel_tol):
        X, _ = datasets.generate(name, 500, seed=0)
        spec = datasets.SPECS[name]
        assert datasets.sparsity_of(X) == pytest.approx(spec.paper_sparsity, rel=rel_tol)

    def test_rcv1_extreme_sparse(self):
        X, _ = datasets.generate("rcv1", 300, seed=0)
        assert datasets.sparsity_of(X) < 0.06

    def test_rcv1_nnz_per_row_matches_paper(self):
        # Paper: 0.0016 * 47236 ≈ 76 non-zeros per row.
        X, _ = datasets.generate("rcv1", 300, seed=0)
        nnz_per_row = np.count_nonzero(X) / len(X)
        assert 50 <= nnz_per_row <= 100

    def test_deep1b_fully_dense(self):
        X, _ = datasets.generate("deep1b", 200, seed=0)
        assert datasets.sparsity_of(X) == 1.0

    def test_sparsity_of_definition(self):
        X = np.array([[0.0, 1.0], [2.0, 0.0]])
        assert datasets.sparsity_of(X) == 0.5


class TestRedundancyOrdering:
    """Compression behaviour the evaluation narrative depends on."""

    @pytest.fixture(scope="class")
    def batches(self):
        return {name: datasets.generate(name, 250, seed=0)[0] for name in ALL}

    def _ratio(self, X, fmt="TOC"):
        return den_size_bytes(*X.shape) / REGISTRY[fmt].encode(X).size_bytes()

    def test_toc_strong_on_moderate_sparsity(self, batches):
        for name in ("census", "imagenet", "kdd99"):
            assert self._ratio(batches[name]) > 10, name

    def test_kdd_is_most_redundant(self, batches):
        # Paper: largest TOC ratios (up to 51x) on the most redundant data.
        assert self._ratio(batches["kdd99"]) > self._ratio(batches["mnist"])

    def test_mnist_weak_for_logical_encoding(self, batches):
        # Paper §5.1: TOC inferior to Gzip on Mnist.
        X = batches["mnist"]
        assert self._ratio(X, "TOC") < self._ratio(X, "Gzip")

    def test_deep1b_incompressible(self, batches):
        X = batches["deep1b"]
        for fmt in ("TOC", "Gzip", "Snappy"):
            assert self._ratio(X, fmt) < 1.3, fmt

    def test_rcv1_toc_close_to_csr(self, batches):
        # Paper: CSR best on Rcv1, TOC similar (both sparse encodings).
        X = batches["rcv1"]
        assert self._ratio(X, "TOC") > 0.8 * self._ratio(X, "CSR")

    def test_toc_beats_direct_execution_formats(self, batches):
        # On moderate-sparsity data TOC out-compresses every format that
        # can execute ops directly (CSR/CVI/DVI/CLA) — Figure 1C's claim.
        for name in ("census", "imagenet", "kdd99"):
            X = batches[name]
            toc = self._ratio(X, "TOC")
            for fmt in ("CSR", "CVI", "DVI", "CLA"):
                assert toc > self._ratio(X, fmt), (name, fmt)

    def test_toc_losslessness_on_all_surrogates(self, batches):
        for name, X in batches.items():
            np.testing.assert_array_equal(TOCMatrix.encode(X).decode(), X)
