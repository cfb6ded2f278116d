"""spark-submit entrypoint for the Doc→Table accuracy experiment.

This is the machinery behind the paper's Fig. 6 (figures are out of the
reproduction's scope, but the pipeline — CMDL solo / joint / gold-tuned
variants against the elastic-search and containment baselines — is the
paper's core contribution, so this job prints the per-method
precision/recall@k for each of benchmarks 1A, 1B, and 1C).

Usage::

    spark-submit jobs/doc2table_eval.py [1A|1B|1C ...]
"""
import sys

from pyspark.sql import SparkSession

from repro.eval import harness


def main() -> None:
    benches = sys.argv[1:] or ["1A", "1B", "1C"]
    spark = (SparkSession.builder.appName("cmdl-doc2table")
             .config("spark.sql.shuffle.partitions", "16")
             .config("spark.sql.execution.arrow.pyspark.enabled", "true")
             .config("spark.sql.autoBroadcastJoinThreshold", -1)
             .getOrCreate())
    spark.sparkContext.setLogLevel("ERROR")
    for b in benches:
        df = harness.run_doc2table(spark, b)
        print(f"\nDoc→Table benchmark {b} (precision/recall @k per method)")
        print(df.pivot_table(index="method", columns="k",
                             values=["precision", "recall"]).round(3).to_string())
    spark.stop()


if __name__ == "__main__":
    main()
