"""spark-submit entrypoint reproducing Table 7 (MGD runtimes, Census/Kdd99).

Usage: spark-submit jobs/table7_mgd_census_kdd.py [actual_rows]
"""
import sys

from pyspark.sql import SparkSession

from repro.harness import table7
from repro.harness.mgd_runtime import format_rows


def main(actual_rows: int = 1000) -> None:
    spark = SparkSession.builder.appName("table7").getOrCreate()
    local = table7.rows(actual_rows=actual_rows)
    spark_cells = table7.spark_rows(spark, actual_rows=actual_rows)
    print("== Table 7 (measured, virtual-scale minutes) ==")
    print(format_rows(local + spark_cells))
    print("\n== Paper Table 7 (minutes) ==")
    for key, methods in table7.PAPER.items():
        print(key, methods)
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 1000)
