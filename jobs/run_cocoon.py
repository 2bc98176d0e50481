"""spark-submit entrypoint: clean one benchmark with Cocoon and print
the commented SQL artifact (the paper's Fig. 5-style output).

Usage::

    spark-submit jobs/run_cocoon.py [hospital|flights|beers|rayyan|movies]
"""
import sys

from pyspark.sql import SparkSession

from repro.benchdata import load
from repro.core import CocoonPipeline
from repro.llm import SimulatedLLM


def main() -> None:
    name = sys.argv[1] if len(sys.argv) > 1 else "hospital"
    spark = (
        SparkSession.builder.appName(f"repro-cocoon-{name}")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    bench = load(name)
    report = CocoonPipeline(SimulatedLLM()).clean(
        bench.spark_dirty(spark), name)
    print(f"-- Cocoon cleaning SQL for {name} "
          f"({report.llm_calls} LLM calls)\n")
    print(report.sql)
    print("\n-- step audit trail")
    for s in report.steps:
        flag = "DETECTED" if s.detected else "clean"
        print(f"--   [{flag:8s}] {s.step:22s} {s.column or '-':28s} "
              f"{s.summary}")
    spark.stop()


if __name__ == "__main__":
    main()
