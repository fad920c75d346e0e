"""Compression metrics over blob tables — pure DataFrame/Catalyst aggs.

These feed Table 5 (dataset stats) and the compression-ratio narrative of
§5.1. Results are cross-checked against DuckDB by the oracle tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def compression_stats(blob_df: DataFrame) -> DataFrame:
    """Per-format totals: batches, rows, compressed bytes, DEN bytes, ratio.

    DEN bytes = 8 * rows * cols + the 12-byte header per batch, matching
    ``repro.formats.dense.den_size_bytes``.
    """
    return (
        blob_df.withColumn("blob_bytes", F.length("blob"))
        .withColumn("den_bytes", F.lit(12) + F.lit(8) * F.col("n_rows") * F.col("n_cols"))
        .groupBy("fmt")
        .agg(
            F.count("*").alias("n_batches"),
            F.sum("n_rows").alias("n_rows"),
            F.sum("blob_bytes").alias("compressed_bytes"),
            F.sum("den_bytes").alias("dense_bytes"),
        )
        .withColumn(
            "compression_ratio",
            F.col("dense_bytes").cast("double") / F.col("compressed_bytes"),
        )
    )


def dataset_stats(feature_df: DataFrame, n_cols: int) -> DataFrame:
    """Table 5 stats for a feature DataFrame: rows, cols, sparsity, DEN GB.

    Sparsity (# non-zero / # total) is computed with Spark SQL
    higher-order functions over the feature arrays — no UDF needed.
    """
    nnz = F.aggregate(
        F.transform("features", lambda x: F.when(x != 0.0, 1).otherwise(0)),
        F.lit(0),
        lambda acc, x: acc + x,
    )
    return (
        feature_df.withColumn("nnz", nnz)
        .agg(
            F.count("*").alias("n_rows"),
            F.lit(n_cols).alias("n_cols"),
            F.sum("nnz").alias("total_nnz"),
        )
        .withColumn(
            "sparsity",
            F.col("total_nnz").cast("double") / (F.col("n_rows") * F.col("n_cols")),
        )
        .withColumn(
            "den_bytes", F.lit(8) * F.col("n_rows") * F.col("n_cols")
        )
    )
