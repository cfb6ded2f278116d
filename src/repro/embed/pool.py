"""Mean pooling of word vectors to DE-level solo embeddings, in Spark.

Given a (de_id, token) DataFrame and a :class:`WordEmbedder`, produce one
100-d vector per DE via mean pooling (paper §3: mean pooling is used
instead of min/max because it represents the whole set). The distinct
vocabulary is embedded once on the driver and broadcast; per-DE pooling
runs distributed via ``applyInPandas``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, DoubleType, StringType, StructField, StructType

from repro.embed.wordvec import WordEmbedder

_SCHEMA = StructType([
    StructField("de_id", StringType()),
    StructField("vec", ArrayType(DoubleType())),
])


def pool_embeddings(tokens: DataFrame, embedder: WordEmbedder, *,
                    weight_col: str | None = None) -> DataFrame:
    """(de_id, token[, tf]) → (de_id, vec) with mean pooling.

    If ``weight_col`` is given (e.g. ``"tf"``) the mean is weighted by
    it; otherwise each distinct token contributes equally (set
    semantics, matching how columns are pooled from their value tokens).
    """
    spark = tokens.sparkSession
    vocab = [r["token"] for r in tokens.select("token").distinct().collect()]
    vec_map = {w: embedder.word_vector(w) for w in vocab}
    dim = embedder.dim
    bc = spark.sparkContext.broadcast(vec_map)

    cols = ["de_id", "token"] + ([weight_col] if weight_col else [])

    def _pool(pdf: pd.DataFrame) -> pd.DataFrame:
        vm = bc.value
        mat = np.stack([vm[t] for t in pdf["token"]])
        if weight_col:
            w = pdf[weight_col].to_numpy(dtype="float64")
            v = (mat * w[:, None]).sum(axis=0) / max(w.sum(), 1e-12)
        else:
            v = mat.mean(axis=0)
        if v.shape[0] != dim:  # defensive; cannot happen with one embedder
            v = np.zeros(dim)
        return pd.DataFrame({"de_id": [pdf["de_id"].iloc[0]], "vec": [v.tolist()]})

    return tokens.select(*cols).groupBy("de_id").applyInPandas(_pool, schema=_SCHEMA)


def collect_vectors(vec_df: DataFrame) -> tuple[list[str], np.ndarray]:
    """Collect a (de_id, vec) DataFrame into (ids, matrix) on the driver."""
    rows = vec_df.collect()
    ids = [r["de_id"] for r in rows]
    mat = np.array([r["vec"] for r in rows]) if rows else np.zeros((0, 1))
    return ids, mat
