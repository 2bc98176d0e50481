"""spark-submit entrypoint reproducing the paper's Table 3 (Appendix B).

Usage::

    spark-submit jobs/run_table3.py

Same systems as Table 1 over Hospital and Movies, but column-type and
DMV errors are scored.
"""
from pyspark.sql import SparkSession

from repro.evalharness.tables import format_table, run_table3


def main() -> None:
    spark = (
        SparkSession.builder.appName("repro-table3")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    print(format_table(run_table3(spark),
                       "Table 3: all error types scored (measured vs paper)"))
    spark.stop()


if __name__ == "__main__":
    main()
