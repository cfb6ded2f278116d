"""Exact distributed overlap/containment computation (brute-force GT path).

The 2B/2C ground truth is "an expensive all-pairs exact set similarity"
(§6). The generator computes it in pandas at build time;
:func:`exact_containment_spark` is the distributed equivalent used for
larger value tables and for DuckDB-oracle cross-checking: a self-join of
the distinct (col_id, value) relation on value, aggregated to pairwise
intersection sizes, joined with per-column distinct counts.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F


def exact_containment_spark(values: DataFrame, *, id_col: str = "col_id",
                            value_col: str = "value") -> DataFrame:
    """All-pairs (col_a < col_b) exact overlap statistics.

    Returns columns: col_a, col_b, inter, n_a, n_b, cont_a, cont_b,
    jaccard — only pairs with non-empty intersection appear.
    """
    dv = values.select(F.col(id_col).alias("c"), F.col(value_col).alias("v")).distinct()
    sizes = dv.groupBy("c").agg(F.count("*").alias("n"))
    a = dv.select(F.col("c").alias("col_a"), "v")
    b = dv.select(F.col("c").alias("col_b"), "v")
    inter = (
        a.join(b, "v")
        .where(F.col("col_a") < F.col("col_b"))
        .groupBy("col_a", "col_b")
        .agg(F.count("*").alias("inter"))
    )
    return (
        inter
        .join(sizes.select(F.col("c").alias("col_a"), F.col("n").alias("n_a")), "col_a")
        .join(sizes.select(F.col("c").alias("col_b"), F.col("n").alias("n_b")), "col_b")
        .withColumn("cont_a", F.col("inter") / F.col("n_a"))
        .withColumn("cont_b", F.col("inter") / F.col("n_b"))
        .withColumn("jaccard", F.col("inter")
                    / (F.col("n_a") + F.col("n_b") - F.col("inter")))
        .select("col_a", "col_b", "inter", "n_a", "n_b",
                "cont_a", "cont_b", "jaccard")
    )
