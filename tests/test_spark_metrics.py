"""Spark metric aggregations (Table 5 support) vs the DuckDB oracle, plus
TPC-H-lite smoke queries keeping the provided generators exercised."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import datasets, synth_data
from repro.dist import batching, metrics
from repro.oracle import assert_equivalent


class TestDatasetStats:
    @pytest.mark.parametrize("name", ["census", "rcv1", "deep1b"])
    def test_sparsity_matches_numpy(self, spark, name):
        X, y = datasets.generate(name, 150, seed=0)
        df = batching.to_feature_df(spark, X, y)
        row = metrics.dataset_stats(df, X.shape[1]).collect()[0]
        assert row["n_rows"] == 150
        assert row["sparsity"] == pytest.approx(datasets.sparsity_of(X), abs=1e-12)
        assert row["den_bytes"] == 8 * X.size

    def test_stats_vs_oracle(self, spark):
        X, y = datasets.generate("kdd99", 120, seed=1)
        df = batching.to_feature_df(spark, X, y)
        got = metrics.dataset_stats(df, X.shape[1]).select(
            "n_rows", "total_nnz", "sparsity"
        )
        nnz_per_row = pd.DataFrame({"nnz": (X != 0).sum(axis=1)})
        assert_equivalent(
            got,
            """
            SELECT count(*) AS n_rows,
                   sum(nnz) AS total_nnz,
                   sum(nnz) * 1.0 / (count(*) * {m}) AS sparsity
            FROM t
            """.format(m=X.shape[1]),
            t=nnz_per_row,
        )


class TestTpchLiteOracle:
    """Smoke queries over the provided TPC-H-lite generators; every result
    goes through the DuckDB oracle."""

    @pytest.fixture(scope="class")
    def tables(self, spark):
        li = synth_data.lineitem(spark, sf=0.002, seed=0)
        o = synth_data.orders(spark, sf=0.002, seed=1)
        return li.cache(), o.cache()

    def test_q1_style_aggregate(self, spark, tables):
        li, _ = tables
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.count("*").alias("cnt"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_join_aggregate_exercises_shuffle(self, spark, tables):
        li, o = tables
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"), F.sum("l_extendedprice").alias("rev"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS n, sum(l_extendedprice) AS rev
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=o,
        )

    def test_zipf_keys_are_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=0)
        top = df.groupBy("k").count().orderBy(F.desc("count")).first()
        assert top["count"] > 5000 / 100 * 3  # far above uniform share


class TestCompressionRatioAggregation:
    def test_ratio_formula(self, spark):
        X, y = datasets.generate("census", 200, seed=5)
        df = batching.to_feature_df(spark, X, y)
        blob_df = batching.encode_batches(
            batching.assign_batches(df, batch_size=100, seed=0), "CSR"
        )
        row = metrics.compression_stats(blob_df).collect()[0]
        assert row["compression_ratio"] == pytest.approx(
            row["dense_bytes"] / row["compressed_bytes"]
        )
        assert row["n_rows"] == 200

    def test_multi_format_union(self, spark):
        X, y = datasets.generate("kdd99", 150, seed=6)
        df = batching.to_feature_df(spark, X, y)
        assigned = batching.assign_batches(df, batch_size=75, seed=0)
        union = batching.encode_batches(assigned, "TOC").unionByName(
            batching.encode_batches(assigned, "DEN")
        )
        stats = {r["fmt"]: r for r in metrics.compression_stats(union).collect()}
        assert set(stats) == {"TOC", "DEN"}
        assert stats["TOC"]["compression_ratio"] > stats["DEN"]["compression_ratio"]
