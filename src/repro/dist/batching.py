"""Shuffle-once batching + per-mini-batch compression on Spark.

Pipeline (all DataFrame API / Catalyst):

1. ``to_feature_df`` — (X, y) numpy → DataFrame(id, features array<double>,
   label) via Arrow.
2. ``assign_batches`` — the paper's shuffle-once (§2.1.3): one global
   ``row_number() over (order by rand(seed))`` then ``batch_id = (rank-1)
   div batch_size``. Done once up front; epochs never reshuffle.
3. ``encode_batches`` — ``groupBy(batch_id).applyInPandas`` runs the
   chosen format's ``encode`` inside executors, one mini-batch per group,
   and returns a blob table: (batch_id, n_rows, n_cols, blob, labels).
   This is the repro hint's "TOC compression as per-partition UDFs".
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.formats import get_format

BLOB_SCHEMA = (
    "batch_id long, n_rows long, n_cols long, fmt string, blob binary, labels binary"
)


def to_feature_df(spark: SparkSession, X: np.ndarray, y: np.ndarray) -> DataFrame:
    """Build the input DataFrame: one row per example, dense feature array."""
    X = np.asarray(X, dtype=np.float64)
    pdf = pd.DataFrame(
        {
            "id": np.arange(len(X), dtype=np.int64),
            "features": list(X),
            "label": np.asarray(y, dtype=np.float64),
        }
    )
    return spark.createDataFrame(pdf)


def assign_batches(df: DataFrame, batch_size: int = 250, seed: int = 0) -> DataFrame:
    """Shuffle once and assign contiguous batch ids over the shuffled order."""
    w = Window.orderBy(F.rand(seed), F.col("id"))
    return df.withColumn(
        "batch_id",
        ((F.row_number().over(w) - F.lit(1)) / F.lit(batch_size)).cast("long"),
    )


def encode_batches(df: DataFrame, fmt_name: str) -> DataFrame:
    """Compress each mini-batch inside executors; returns the blob table."""
    fmt = get_format(fmt_name)  # fail fast on the driver for unknown names

    def _encode(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("id")  # deterministic row order within a batch
        X = np.stack(pdf["features"].to_numpy())
        batch = fmt.encode(X)
        return pd.DataFrame(
            {
                "batch_id": [int(pdf["batch_id"].iloc[0])],
                "n_rows": [X.shape[0]],
                "n_cols": [X.shape[1]],
                "fmt": [fmt_name],
                "blob": [batch.to_bytes()],
                "labels": [pdf["label"].to_numpy(np.float64).tobytes()],
            }
        )

    return df.groupBy("batch_id").applyInPandas(_encode, schema=BLOB_SCHEMA)


def decode_blob_row(row) -> tuple[np.ndarray, np.ndarray]:
    """Driver/test helper: blob-table row → (dense X, labels)."""
    fmt = get_format(row.fmt)
    batch = fmt.from_bytes(bytes(row.blob))
    labels = np.frombuffer(bytes(row.labels), dtype=np.float64)
    return batch.decode(), labels
