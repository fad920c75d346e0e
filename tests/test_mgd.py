"""MGD driver tests: shuffle-once batching and cross-format training
equivalence over full runs."""
import numpy as np
import pytest

from repro import datasets
from repro.formats import REGISTRY
from repro.ml import mgd
from repro.ml.models import make_model


class TestShuffleOnce:
    def test_permutation_deterministic(self):
        np.testing.assert_array_equal(mgd.shuffle_once(100, 7), mgd.shuffle_once(100, 7))

    def test_permutation_is_permutation(self):
        p = mgd.shuffle_once(50, 0)
        assert sorted(p.tolist()) == list(range(50))

    def test_different_seed_different_order(self):
        assert not np.array_equal(mgd.shuffle_once(100, 1), mgd.shuffle_once(100, 2))


class TestMakeBatches:
    def test_batch_sizes(self):
        X = np.random.default_rng(0).random((1010, 5))
        y = np.zeros(1010)
        bs = mgd.make_batches(X, y, REGISTRY["DEN"], batch_size=250, seed=0)
        sizes = [b.shape[0] for b in bs.batches]
        assert sizes == [250, 250, 250, 250, 10]
        assert [len(l) for l in bs.labels] == sizes

    def test_batches_partition_the_data(self):
        X = np.random.default_rng(1).choice([0.0, 1.5], size=(100, 4))
        y = np.arange(100, dtype=np.float64)
        bs = mgd.make_batches(X, y, REGISTRY["DEN"], batch_size=30, seed=3)
        rebuilt = np.vstack([b.decode() for b in bs.batches])
        labels = np.concatenate(bs.labels)
        perm = mgd.shuffle_once(100, 3)
        np.testing.assert_array_equal(rebuilt, X[perm])
        np.testing.assert_array_equal(labels, y[perm])

    def test_total_size_bytes(self):
        X = np.random.default_rng(2).choice([0.0, 1.5], size=(60, 6))
        bs = mgd.make_batches(X, np.zeros(60), REGISTRY["TOC"], batch_size=20, seed=0)
        assert bs.total_size_bytes() == sum(b.size_bytes() for b in bs.batches)
        assert bs.format_name == "TOC"
        assert len(bs) == 3


class TestEncodeLabels:
    def test_svm_binary_pm1(self):
        y = np.array([0, 1, 1, 0])
        np.testing.assert_array_equal(mgd.encode_labels("SVM", y, 2), [-1.0, 1.0, 1.0, -1.0])

    @pytest.mark.parametrize("kind", ["LR", "NN"])
    def test_others_passthrough(self, kind):
        y = np.array([0, 1, 2])
        np.testing.assert_array_equal(mgd.encode_labels(kind, y, 3), [0.0, 1.0, 2.0])

    def test_svm_multiclass_passthrough(self):
        y = np.array([0, 1, 2])
        np.testing.assert_array_equal(mgd.encode_labels("SVM", y, 3), [0.0, 1.0, 2.0])


class TestTrainingEquivalence:
    """Full MGD runs must be format-independent (§4 correctness, end to
    end): identical losses and final parameters across every format."""

    @pytest.fixture(scope="class")
    def census(self):
        return datasets.generate("census", 400, seed=1)

    @pytest.mark.parametrize("fmt", sorted(set(REGISTRY) - {"DEN"}))
    def test_lr_training_matches_den(self, census, fmt):
        X, y = census
        results = {}
        for name in ("DEN", fmt):
            bs = mgd.make_batches(X, y.astype(float), REGISTRY[name], batch_size=100, seed=2)
            model = make_model("LR", X.shape[1], seed=0)
            res = mgd.train(model, bs, epochs=2, lr=0.1)
            results[name] = (res.epoch_losses, model.w)
        np.testing.assert_allclose(results[fmt][0], results["DEN"][0], rtol=1e-7)
        np.testing.assert_allclose(results[fmt][1], results["DEN"][1], atol=1e-8)

    @pytest.mark.parametrize("kind", ["LR", "SVM", "NN"])
    def test_toc_full_run_matches_den(self, census, kind):
        X, y = census
        yk = mgd.encode_labels(kind, y, 2)
        params = {}
        for name in ("DEN", "TOC"):
            bs = mgd.make_batches(X, yk, REGISTRY[name], batch_size=100, seed=4)
            model = make_model(kind, X.shape[1], seed=1)
            mgd.train(model, bs, epochs=3, lr=0.05, track_loss=False)
            params[name] = model.get_params()
        for k in params["DEN"]:
            np.testing.assert_allclose(params["TOC"][k], params["DEN"][k], atol=1e-7, err_msg=k)

    def test_loss_decreases_over_epochs(self, census):
        X, y = census
        bs = mgd.make_batches(X, y.astype(float), REGISTRY["TOC"], batch_size=100, seed=5)
        model = make_model("LR", X.shape[1])
        res = mgd.train(model, bs, epochs=5, lr=0.1)
        assert res.epoch_losses[-1] < res.epoch_losses[0]

    def test_multiclass_ovr_training(self):
        X, y = datasets.generate("mnist", 300, seed=2)
        bs = mgd.make_batches(X, y, REGISTRY["TOC"], batch_size=100, seed=6)
        model = make_model("LR", X.shape[1], n_classes=10, seed=0)
        res = mgd.train(model, bs, epochs=3, lr=0.2)
        assert res.epoch_losses[-1] < res.epoch_losses[0]

    def test_codec_step_cache_released_after_training(self, census):
        X, y = census
        bs = mgd.make_batches(X, y.astype(float), REGISTRY["Gzip"], batch_size=100, seed=7)
        model = make_model("LR", X.shape[1])
        mgd.train(model, bs, epochs=1, lr=0.1, track_loss=False)
        for b in bs.batches:
            assert b._step_cache is None
