"""spark-submit entrypoint reproducing paper Table 1.

Usage::

    spark-submit jobs/table1_datasets.py

Prints the measured table next to the paper's published numbers.
"""
from pyspark.sql import SparkSession

from repro.eval import harness, tables


def main() -> None:
    spark = (SparkSession.builder.appName("cmdl-table1_datasets")
             .config("spark.sql.shuffle.partitions", "16")
             .config("spark.sql.execution.arrow.pyspark.enabled", "true")
             .config("spark.sql.autoBroadcastJoinThreshold", -1)
             .getOrCreate())
    spark.sparkContext.setLogLevel("ERROR")
    df = harness.run_table1()
    print(tables.render_table1(df))
    spark.stop()


if __name__ == "__main__":
    main()
