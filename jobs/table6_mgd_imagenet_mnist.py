"""spark-submit entrypoint reproducing Table 6 (MGD runtimes, Imagenet/Mnist).

Usage: spark-submit jobs/table6_mgd_imagenet_mnist.py [actual_rows]

Prints the measured table (virtual-scale minutes; see DESIGN.md for the
scaling model) including the Spark integration rows, with the paper's
numbers for comparison.
"""
import sys

from pyspark.sql import SparkSession

from repro.harness import table6
from repro.harness.mgd_runtime import format_rows


def main(actual_rows: int = 1000) -> None:
    spark = SparkSession.builder.appName("table6").getOrCreate()
    local = table6.rows(actual_rows=actual_rows)
    spark_cells = table6.spark_rows(spark, actual_rows=actual_rows)
    print("== Table 6 (measured, virtual-scale minutes) ==")
    print(format_rows(local + spark_cells))
    print("\n== Paper Table 6 (minutes) ==")
    for key, methods in table6.PAPER.items():
        print(key, methods)
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 1000)
