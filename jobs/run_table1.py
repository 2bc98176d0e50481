"""spark-submit entrypoint reproducing the paper's Table 1.

Usage::

    spark-submit jobs/run_table1.py [dataset ...]

Prints measured P/R/F for the five systems on the five benchmarks next
to the paper's numbers (column-type and DMV cells excluded, per the
paper's scoring convention).
"""
import sys

from pyspark.sql import SparkSession

from repro.evalharness.tables import DATASETS, format_table, run_table1


def main() -> None:
    spark = (
        SparkSession.builder.appName("repro-table1")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    datasets = tuple(sys.argv[1:]) or DATASETS
    print(format_table(run_table1(spark, datasets=datasets),
                       "Table 1: cleaning P/R/F (measured vs paper)"))
    spark.stop()


if __name__ == "__main__":
    main()
