"""CLA-specific tests: column co-coding structure and the small-mini-batch
dictionary-overhead behaviour the paper leans on (§7)."""
import numpy as np
import pytest

from repro.formats.cla import CLABatch
from repro.core.toc import TOCMatrix


class TestGrouping:
    def test_groups_cover_all_columns_once(self):
        X = np.random.default_rng(0).choice([0.0, 1.5, 2.5], size=(40, 9))
        batch = CLABatch.encode(X)
        cols = np.concatenate([g.cols for g in batch._groups])
        assert sorted(cols.tolist()) == list(range(9))

    def test_identical_columns_cocoded(self):
        # Two identical low-cardinality columns should merge: the shared
        # dictionary is strictly cheaper than two.
        col = np.random.default_rng(1).choice([0.0, 1.0], size=40)
        X = np.column_stack([col, col, np.random.default_rng(2).random(40)])
        batch = CLABatch.encode(X)
        group_of = {}
        for gi, g in enumerate(batch._groups):
            for c in g.cols:
                group_of[int(c)] = gi
        assert group_of[0] == group_of[1]

    def test_dictionary_rows_are_distinct(self):
        X = np.random.default_rng(3).choice([0.0, 1.0, 2.0], size=(30, 5))
        batch = CLABatch.encode(X)
        for g in batch._groups:
            uniq = np.unique(g.dictionary, axis=0)
            assert len(uniq) == len(g.dictionary)

    def test_codes_reference_dictionary(self):
        X = np.random.default_rng(4).choice([0.0, 1.0], size=(25, 4))
        batch = CLABatch.encode(X)
        for g in batch._groups:
            assert g.codes.min() >= 0
            assert g.codes.max() < len(g.dictionary)
            assert len(g.codes) == 25


class TestDictionaryOverhead:
    def test_small_batches_pay_dictionary_cost(self):
        # §7: "on a small mini-batch, there are not that many references
        # to the dictionary entries, so the explicit dictionary cost makes
        # the CLA compression ratio less desirable" — per-row cost shrinks
        # as the batch grows over a fixed value population.
        rng = np.random.default_rng(5)
        pool = rng.random(8)

        def gen(n):
            return pool[rng.integers(0, 8, size=(n, 10))]

        small = CLABatch.encode(gen(20))
        large = CLABatch.encode(gen(400))
        assert small.size_bytes() / 20 > large.size_bytes() / 400

    def test_toc_beats_cla_on_redundant_mini_batch(self):
        # The paper's core CLA-vs-TOC claim on mini-batches.
        rng = np.random.default_rng(6)
        templates = rng.choice([0.0, 0.0, 1.5, 2.5], size=(5, 30))
        X = templates[rng.integers(0, 5, 100)]
        assert TOCMatrix.encode(X).size_bytes() < CLABatch.encode(X).size_bytes()


class TestCLAOps:
    @pytest.fixture(scope="class")
    def data(self):
        X = np.random.default_rng(7).choice([0.0, 1.5, 2.5, 3.5], size=(35, 11))
        return X, CLABatch.encode(X)

    def test_ops_after_bytes_roundtrip(self, data):
        X, batch = data
        again = CLABatch.from_bytes(batch.to_bytes())
        v = np.random.default_rng(8).random(11)
        np.testing.assert_allclose(again.dot_vec(v), X @ v, atol=1e-10)

    def test_per_group_execution_matches_monolithic(self, data):
        # Summing per-group partial products must equal the full product.
        X, batch = data
        M = np.random.default_rng(9).random((11, 4))
        np.testing.assert_allclose(batch.dot_mat(M), X @ M, atol=1e-10)

    def test_scal_scales_dictionaries_only(self, data):
        _, batch = data
        scaled = batch.scal(3.0)
        for g0, g1 in zip(batch._groups, scaled._groups):
            np.testing.assert_array_equal(g1.codes, g0.codes)
            np.testing.assert_allclose(g1.dictionary, g0.dictionary * 3.0)
