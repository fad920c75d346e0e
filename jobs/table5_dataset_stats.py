"""spark-submit entrypoint reproducing Table 5 (dataset statistics).

Usage: spark-submit jobs/table5_dataset_stats.py [sample_rows]
"""
import sys

from pyspark.sql import SparkSession

from repro.harness import table5


def main(sample_rows: int = 1000) -> None:
    spark = SparkSession.builder.appName("table5").getOrCreate()
    measured = table5.rows(sample_rows=sample_rows)
    print("== Table 5 (measured on surrogates; paper numbers alongside) ==")
    print(table5.format_table(measured))
    print("\n== Spark (Catalyst) recomputation ==")
    for r in table5.rows_spark(spark, sample_rows=sample_rows):
        print(r)
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 1000)
