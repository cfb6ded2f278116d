"""spark-submit entrypoint reproducing paper Table 2.

Usage::

    spark-submit jobs/table2_benchmarks.py

Prints the measured table next to the paper's published numbers.
"""
from pyspark.sql import SparkSession

from repro.eval import harness, tables


def main() -> None:
    spark = (SparkSession.builder.appName("cmdl-table2_benchmarks")
             .config("spark.sql.shuffle.partitions", "16")
             .config("spark.sql.execution.arrow.pyspark.enabled", "true")
             .config("spark.sql.autoBroadcastJoinThreshold", -1)
             .getOrCreate())
    spark.sparkContext.setLogLevel("ERROR")
    df = harness.run_table2()
    print(tables.render_table2(df))
    spark.stop()


if __name__ == "__main__":
    main()
