"""Spark batching tests: shuffle-once assignment, per-batch encode UDFs,
blob-table correctness — cross-checked against DuckDB via the oracle."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import datasets
from repro.dist import batching
from repro.ml import mgd
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def census_df(spark):
    X, y = datasets.generate("census", 300, seed=0)
    return X, y, batching.to_feature_df(spark, X, y)


class TestFeatureDf:
    def test_schema(self, census_df):
        _, _, df = census_df
        assert set(df.columns) == {"id", "features", "label"}

    def test_row_count_via_oracle(self, census_df):
        X, y, df = census_df
        import pandas as pd

        counts = df.groupBy().agg(F.count("*").alias("n"))
        assert_equivalent(
            counts,
            "SELECT count(*) AS n FROM t",
            t=pd.DataFrame({"id": np.arange(len(X))}),
        )

    def test_features_roundtrip(self, census_df):
        X, _, df = census_df
        rows = df.orderBy("id").limit(5).collect()
        for r in rows:
            np.testing.assert_array_equal(np.array(r.features), X[r.id])


class TestAssignBatches:
    def test_batch_sizes(self, census_df, spark):
        _, _, df = census_df
        out = batching.assign_batches(df, batch_size=100, seed=0)
        sizes = {
            r.batch_id: r.n
            for r in out.groupBy("batch_id").agg(F.count("*").alias("n")).collect()
        }
        assert sizes == {0: 100, 1: 100, 2: 100}

    def test_deterministic_in_seed(self, census_df):
        _, _, df = census_df
        a = batching.assign_batches(df, batch_size=100, seed=3)
        b = batching.assign_batches(df, batch_size=100, seed=3)
        ma = {r.id: r.batch_id for r in a.collect()}
        mb = {r.id: r.batch_id for r in b.collect()}
        assert ma == mb

    def test_shuffles_rows(self, census_df):
        _, _, df = census_df
        out = batching.assign_batches(df, batch_size=100, seed=1)
        first_batch_ids = [r.id for r in out.where("batch_id = 0").collect()]
        assert sorted(first_batch_ids) != list(range(100))

    def test_every_row_assigned_once(self, census_df):
        X, _, df = census_df
        out = batching.assign_batches(df, batch_size=64, seed=2)
        assert out.select("id").distinct().count() == len(X)
        assert out.count() == len(X)


class TestEncodeBatches:
    @pytest.mark.parametrize("fmt_name", ["TOC", "DEN", "CSR"])
    def test_blobs_decode_to_original_rows(self, census_df, fmt_name):
        X, y, df = census_df
        assigned = batching.assign_batches(df, batch_size=100, seed=4)
        blob_df = batching.encode_batches(assigned, fmt_name)
        rows = blob_df.collect()
        assert len(rows) == 3
        # Union of decoded batch rows == the full dataset (order-free).
        decoded, labels = [], []
        for r in rows:
            Xb, yb = batching.decode_blob_row(r)
            assert r.fmt == fmt_name
            assert Xb.shape == (r.n_rows, r.n_cols)
            decoded.append(Xb)
            labels.append(yb)
        allX = np.vstack(decoded)
        key = np.lexsort(allX.T)
        key_orig = np.lexsort(X.T)
        np.testing.assert_array_equal(allX[key], X[key_orig])
        assert sorted(np.concatenate(labels).tolist()) == sorted(y.astype(float).tolist())

    def test_matches_local_make_batches(self, spark):
        # Spark batching with seed s must produce the same multiset of
        # batch contents as some local shuffle (not necessarily the same
        # permutation — Spark's rand() differs from numpy), but batch
        # count, sizes, and global content must agree.
        X, y = datasets.generate("kdd99", 220, seed=1)
        df = batching.to_feature_df(spark, X, y)
        blob_df = batching.encode_batches(
            batching.assign_batches(df, batch_size=100, seed=5), "TOC"
        )
        local = mgd.make_batches(X, y.astype(float), __import__("repro.formats", fromlist=["REGISTRY"]).REGISTRY["TOC"], batch_size=100, seed=5)
        spark_sizes = sorted(r.n_rows for r in blob_df.collect())
        local_sizes = sorted(b.shape[0] for b in local.batches)
        assert spark_sizes == local_sizes

    def test_unknown_format_fails_on_driver(self, census_df):
        _, _, df = census_df
        with pytest.raises(KeyError):
            batching.encode_batches(batching.assign_batches(df, 100, 0), "NOPE")


class TestBlobMetrics:
    def test_compression_stats_vs_oracle(self, spark, census_df):
        from repro.dist import metrics

        _, _, df = census_df
        assigned = batching.assign_batches(df, batch_size=100, seed=6)
        blob_df = batching.encode_batches(assigned, "TOC")
        stats = metrics.compression_stats(blob_df).select(
            "fmt", "n_batches", "n_rows", "compressed_bytes", "dense_bytes"
        )
        pdf = blob_df.select(
            "fmt",
            F.length("blob").alias("blob_bytes"),
            "n_rows",
            "n_cols",
        ).toPandas()
        assert_equivalent(
            stats,
            """
            SELECT fmt,
                   count(*) AS n_batches,
                   sum(n_rows) AS n_rows,
                   sum(blob_bytes) AS compressed_bytes,
                   sum(12 + 8 * n_rows * n_cols) AS dense_bytes
            FROM blobs GROUP BY fmt
            """,
            blobs=pdf,
        )

    def test_toc_ratio_exceeds_ten_on_census(self, spark, census_df):
        from repro.dist import metrics

        _, _, df = census_df
        blob_df = batching.encode_batches(
            batching.assign_batches(df, batch_size=100, seed=7), "TOC"
        )
        ratio = metrics.compression_stats(blob_df).collect()[0]["compression_ratio"]
        assert ratio > 10
