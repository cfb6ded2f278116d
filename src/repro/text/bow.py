"""Spark document→bag-of-words transformation (paper §3, Fig. 2 left).

Converts a DataFrame of raw documents into a column-style token format:
one row per (de_id, token) with term frequency. Applies the full NLP
pipeline (tokenize, stopword removal, noun filter, lemmatize) through a
vectorized pandas UDF, then drops tokens that occur in too large a
fraction of documents ("non-discriminative words", §3).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import ArrayType, StringType

from repro.text.tokenizer import normalize


@F.pandas_udf(ArrayType(StringType()))
def _normalize_udf(texts: pd.Series) -> pd.Series:
    return texts.map(lambda t: normalize(t or ""))


def tokens_from_text(df: DataFrame, id_col: str, text_col: str) -> DataFrame:
    """Explode ``text_col`` into normalized tokens: (de_id, token, tf)."""
    return (
        df.select(F.col(id_col).alias("de_id"), _normalize_udf(F.col(text_col)).alias("toks"))
        .select("de_id", F.explode("toks").alias("token"))
        .groupBy("de_id", "token")
        .agg(F.count("*").alias("tf"))
    )


def filter_high_df(tokens: DataFrame, *, max_df_frac: float = 0.5) -> DataFrame:
    """Drop tokens appearing in more than ``max_df_frac`` of the DEs.

    Mirrors the paper's removal of words occurring in a large number of
    documents. The document frequency is computed over the DEs present in
    ``tokens`` itself.
    """
    n_docs = tokens.select("de_id").distinct().count()
    cutoff = max(1, int(max_df_frac * n_docs))
    keep = (
        tokens.groupBy("token")
        .agg(F.countDistinct("de_id").alias("df"))
        .where(F.col("df") <= F.lit(cutoff))
        .select("token")
    )
    return tokens.join(keep, "token", "inner").select("de_id", "token", "tf")


def docs_to_bow(docs: DataFrame, *, id_col: str = "doc_id", text_col: str = "text",
                max_df_frac: float = 0.5) -> DataFrame:
    """Full document transformation: raw docs → filtered (de_id, token, tf)."""
    return filter_high_df(tokens_from_text(docs, id_col, text_col), max_df_frac=max_df_frac)
