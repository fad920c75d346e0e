"""Distributed-MGD tests: single-partition equivalence with the local
driver, multi-partition model averaging, multi-format support."""
import numpy as np
import pytest

from repro import datasets
from repro.dist import batching, train
from repro.formats import REGISTRY
from repro.ml import mgd
from repro.ml.models import make_model


@pytest.fixture(scope="module")
def blob_setup(spark):
    X, y = datasets.generate("census", 300, seed=3)
    df = batching.to_feature_df(spark, X, y)
    assigned = batching.assign_batches(df, batch_size=100, seed=9)
    return X, y, assigned


class TestSinglePartitionEquivalence:
    """With one partition, train_distributed is sequential MGD — it must
    match a local run over the identical batch order exactly."""

    @pytest.mark.parametrize("kind", ["LR", "SVM"])
    def test_matches_local_sequential(self, spark, blob_setup, kind):
        X, y, assigned = blob_setup
        blob_df = batching.encode_batches(assigned, "TOC").coalesce(1)
        params = train.train_distributed(
            blob_df, kind, X.shape[1], n_classes=2, epochs=2, lr=0.1, seed=0
        )
        # Rebuild the same batches locally from the Spark assignment.
        rows = sorted(blob_df.collect(), key=lambda r: r.batch_id)
        batches, labels = [], []
        for r in rows:
            Xb, yb = batching.decode_blob_row(r)
            batches.append(REGISTRY["TOC"].encode(Xb))
            labels.append(mgd.encode_labels(kind, yb, 2))
        model = make_model(kind, X.shape[1], seed=0)
        for _ in range(2):
            for b, yb in zip(batches, labels):
                model.step(b, yb, 0.1)
        for k, v in model.get_params().items():
            np.testing.assert_allclose(params[k], v, atol=1e-9, err_msg=k)


class TestMultiPartition:
    def test_model_averaging_trains(self, spark, blob_setup):
        X, y, assigned = blob_setup
        blob_df = batching.encode_batches(assigned, "TOC").repartition(3)
        params = train.train_distributed(
            blob_df, "LR", X.shape[1], epochs=5, lr=0.02, seed=0
        )
        model = make_model("LR", X.shape[1], seed=0)
        untrained_loss = model.loss(REGISTRY["DEN"].encode(X), y.astype(float))
        model.set_params(params)
        trained_loss = model.loss(REGISTRY["DEN"].encode(X), y.astype(float))
        assert trained_loss < untrained_loss

    def test_param_shapes_preserved(self, spark, blob_setup):
        X, y, assigned = blob_setup
        blob_df = batching.encode_batches(assigned, "TOC").repartition(2)
        params = train.train_distributed(blob_df, "NN", X.shape[1], epochs=1, lr=0.05)
        ref = make_model("NN", X.shape[1]).get_params()
        assert set(params) == set(ref)
        for k in ref:
            assert params[k].shape == ref[k].shape


class TestFormatsThroughSpark:
    @pytest.mark.parametrize("fmt", ["DEN", "CSR", "Gzip"])
    def test_other_formats_train(self, spark, blob_setup, fmt):
        X, y, assigned = blob_setup
        blob_df = batching.encode_batches(assigned, fmt).coalesce(1)
        params = train.train_distributed(blob_df, "LR", X.shape[1], epochs=1, lr=0.1, seed=1)
        assert np.isfinite(params["w"]).all()
        assert np.linalg.norm(params["w"]) > 0

    def test_format_equivalence_through_spark(self, spark, blob_setup):
        # TOC and DEN blobs through the same pipeline → same parameters.
        X, y, assigned = blob_setup
        outs = {}
        for fmt in ("DEN", "TOC"):
            blob_df = batching.encode_batches(assigned, fmt).coalesce(1)
            outs[fmt] = train.train_distributed(
                blob_df, "LR", X.shape[1], epochs=1, lr=0.1, seed=2
            )
        np.testing.assert_allclose(outs["TOC"]["w"], outs["DEN"]["w"], atol=1e-8)

    def test_multiclass_through_spark(self, spark):
        X, y = datasets.generate("mnist", 200, seed=4)
        df = batching.to_feature_df(spark, X, y)
        blob_df = batching.encode_batches(
            batching.assign_batches(df, batch_size=100, seed=1), "TOC"
        ).coalesce(1)
        params = train.train_distributed(
            blob_df, "LR", X.shape[1], n_classes=10, epochs=1, lr=0.1
        )
        assert len(params) == 10  # one weight vector per OvR class
