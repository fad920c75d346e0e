"""Distributed MGD over compressed blob tables.

Per-epoch protocol (the "classical way" [Dean et al. 2012] the paper cites
for parallel NN training, a.k.a. model averaging):

1. the driver broadcasts the current model parameters;
2. ``mapInPandas`` runs over the blob table: each *partition* deserializes
   its mini-batches (sorted by batch_id), runs sequential MGD locally on
   the compressed representation — the compressed kernels execute inside
   the executor — and emits its final parameters plus its example count;
3. the driver averages partition models weighted by example count.

With the blob table coalesced to one partition this is exactly sequential
MGD, which the equivalence tests rely on. Parameters travel as pickled
dicts of numpy arrays.
"""
from __future__ import annotations

import pickle

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

_RESULT_SCHEMA = "params binary, n_examples long"


def _make_partition_trainer(bparams, kind: str, n_features: int, n_classes: int, lr: float, seed: int):
    """One epoch's mapInPandas function, closing over the broadcast params."""

    def _train(iterator):
        # Imports inside the UDF so executors resolve them locally.
        from repro.formats import get_format
        from repro.ml.mgd import encode_labels
        from repro.ml.models import make_model

        rows = [pdf for pdf in iterator]
        if not rows:
            return
        data = pd.concat(rows).sort_values("batch_id")
        model = make_model(kind, n_features, n_classes=n_classes, seed=seed)
        model.set_params(bparams.value)
        n_examples = 0
        for _, row in data.iterrows():
            fmt = get_format(row["fmt"])
            batch = fmt.from_bytes(bytes(row["blob"]))
            y = np.frombuffer(bytes(row["labels"]), dtype=np.float64)
            yb = encode_labels(kind, y, n_classes)
            visit = getattr(batch, "begin_step", None)
            if visit is not None:
                visit()
            model.step(batch, yb, lr)
            n_examples += len(y)
        yield pd.DataFrame(
            {
                "params": [pickle.dumps(model.get_params(), protocol=4)],
                "n_examples": [n_examples],
            }
        )

    return _train


def train_distributed(
    blob_df: DataFrame,
    kind: str,
    n_features: int,
    n_classes: int = 2,
    epochs: int = 5,
    lr: float = 0.1,
    seed: int = 0,
) -> dict[str, np.ndarray]:
    """Run model-averaged MGD for ``epochs`` epochs; returns final params."""
    from repro.ml.models import make_model

    spark = blob_df.sparkSession
    blob_df = blob_df.cache()
    params = make_model(kind, n_features, n_classes=n_classes, seed=seed).get_params()
    for _ in range(epochs):
        bparams = spark.sparkContext.broadcast(params)
        fn = _make_partition_trainer(bparams, kind, n_features, n_classes, lr, seed)
        results = blob_df.mapInPandas(fn, schema=_RESULT_SCHEMA).collect()
        bparams.unpersist()
        total = sum(r.n_examples for r in results)
        averaged: dict[str, np.ndarray] = {}
        for r in results:
            p = pickle.loads(bytes(r.params))
            w = r.n_examples / total
            for k, v in p.items():
                averaged[k] = averaged.get(k, 0.0) + w * v
        params = averaged
    return params
