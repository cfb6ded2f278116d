"""The CMDL profiler (paper §3): tags columns and builds every sketch.

Runs the distributed scan/sketch pipeline over a synthetic lake:

- column tagging heuristics (which discovery tasks a column can serve),
- bag-of-words transformation of documents (``repro.text.bow``),
- tokenization of column values,
- minwise-hash signatures at two granularities — full values (used by
  join/PK-FK discovery) and word tokens (used by cross-modal
  containment, since documents contain words, not cell values),
- solo embeddings via mean pooling (content and metadata, 100-d each),
- numeric statistics.

All heavy scans are Spark DataFrame transformations; the resulting
sketches are small (O(#DEs)) and are collected into a :class:`Profile`
on the driver, where the index layer consumes them.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, functions as F

from repro.embed.pool import pool_embeddings
from repro.embed.wordvec import DIM, WordEmbedder
from repro.sketch.minhash import MinHasher, signatures_spark
from repro.sketch.stats import numeric_stats_spark
from repro.text.bow import docs_to_bow, tokens_from_text
from repro.text.tokenizer import normalize

# Tagging thresholds (§3 "Tabular Columns Tagging")
MIN_DISTINCT_FRAC = 0.05   # below → categorical, excluded from text search
MIN_DISTINCT_ABS = 5
MAX_PKFK_AVG_LEN = 40.0    # longer → long-text, excluded from PK-FK
KEY_CARDINALITY = 0.95     # distinct ratio above → key candidate


@dataclass
class Profile:
    """Driver-side view of every sketch the profiler produced."""

    lake_name: str
    col_meta: pd.DataFrame            # col_id, collection, table, column, dtype, stats, tags
    doc_meta: pd.DataFrame            # doc_id, collection, title
    doc_tokens: pd.DataFrame          # de_id, token, tf  (bag of words)
    col_tokens: pd.DataFrame          # de_id, token, tf  (text columns)
    value_sigs: dict[str, tuple[np.ndarray, int]]
    col_token_sigs: dict[str, tuple[np.ndarray, int]]
    doc_token_sigs: dict[str, tuple[np.ndarray, int]]
    content_vecs: dict[str, np.ndarray]
    meta_vecs: dict[str, np.ndarray]
    numeric_stats: pd.DataFrame       # indexed by col_id
    hasher: MinHasher
    embedder: WordEmbedder
    joint_vecs: dict[str, np.ndarray] = field(default_factory=dict)

    # ---- convenience views -------------------------------------------------
    @property
    def doc_ids(self) -> list[str]:
        return list(self.doc_meta["doc_id"])

    @property
    def col_ids(self) -> list[str]:
        return list(self.col_meta["col_id"])

    def text_col_ids(self, tag: str = "text-search") -> list[str]:
        return [r.col_id for r in self.col_meta.itertuples() if tag in r.tags]

    def encode(self, de_id: str) -> np.ndarray:
        """200-d joint-model input: concat(metadata vec, content vec) (§4.2)."""
        return np.concatenate([
            self.meta_vecs.get(de_id, np.zeros(DIM)),
            self.content_vecs.get(de_id, np.zeros(DIM)),
        ])

    def de_vector(self, de_id: str) -> np.ndarray:
        """Representation used for semantic discovery: joint if trained, else solo."""
        if self.joint_vecs:
            return self.joint_vecs[de_id]
        return self.content_vecs.get(de_id, np.zeros(DIM))


def _tags_for(row: pd.Series) -> frozenset[str]:
    tags: set[str] = set()
    if row["dtype"] == "num":
        tags |= {"numeric", "pkfk"}
        if row["distinct_ratio"] >= KEY_CARDINALITY:
            tags.add("key-candidate")
        return frozenset(tags)
    if row["dtype"] == "date":
        return frozenset()
    # text column
    if (row["n_distinct"] >= MIN_DISTINCT_ABS
            and row["distinct_ratio"] >= MIN_DISTINCT_FRAC):
        tags.add("text-search")
    if row["avg_len"] <= MAX_PKFK_AVG_LEN:
        tags.add("pkfk")
        if row["distinct_ratio"] >= KEY_CARDINALITY:
            tags.add("key-candidate")
    return frozenset(tags)


def _sigs_to_dict(df: DataFrame) -> dict[str, tuple[np.ndarray, int]]:
    return {
        r["de_id"]: (np.array(r["sig"], dtype=np.int64), int(r["n_distinct"]))
        for r in df.collect()
    }


def _vecs_to_dict(df: DataFrame) -> dict[str, np.ndarray]:
    return {r["de_id"]: np.array(r["vec"]) for r in df.collect()}


_WARMED: set[int] = set()


def _warm_workers(spark: SparkSession) -> None:
    """One-time Python-worker warmup per session.

    The first UDF stage otherwise pays ~16 simultaneous cold imports of
    pandas + the repro package inside forked workers (tens of seconds
    under this container's filesystem); a dummy job that performs those
    imports once makes every subsequent profiler stage run in ~1 s.
    """
    key = id(spark.sparkContext)
    if key in _WARMED:
        return

    @F.pandas_udf("long")
    def _w(x: pd.Series) -> pd.Series:
        from repro.sketch import minhash  # noqa: F401
        from repro.text import tokenizer  # noqa: F401
        return x

    n = max(2, spark.sparkContext.defaultParallelism)
    spark.range(n * 2, numPartitions=n).select(_w("id")).count()
    _WARMED.add(key)


def profile_lake(spark: SparkSession, lake, *, n_hashes: int = 128,
                 max_df_frac: float = 0.4, embedder: WordEmbedder | None = None) -> Profile:
    """Run the full profiler over a :class:`repro.lake.generator.Lake`."""
    _warm_workers(spark)
    hasher = MinHasher(n_hashes=n_hashes)
    embedder = embedder or WordEmbedder(lake.vocab_topics)

    cols = lake.columns
    str_cols = cols[cols["dtype"] == "str"]

    # ---- column stats (Spark scan over the long value table) --------------
    sv = spark.createDataFrame(lake.string_values)
    col_stats = (
        sv.groupBy("col_id")
        .agg(
            F.count("value").alias("n_values"),
            F.countDistinct("value").alias("n_distinct"),
            F.avg(F.length("value")).alias("avg_len"),
        )
        .toPandas()
    )

    num_stats = pd.DataFrame(columns=["col_id", "n", "n_distinct", "vmin", "vmax", "mean"])
    if len(lake.numeric_values):
        nv = spark.createDataFrame(lake.numeric_values.rename(columns={"col_id": "de_id"}))
        num_stats = numeric_stats_spark(nv, id_col="de_id")

    col_meta = cols.merge(col_stats, on="col_id", how="left")
    if len(num_stats):
        ns = num_stats.rename(columns={"n": "n_values_num", "n_distinct": "n_distinct_num"})
        col_meta = col_meta.merge(
            ns[["col_id", "n_values_num", "n_distinct_num"]], on="col_id", how="left")
        numeric_mask = col_meta["dtype"] == "num"
        col_meta.loc[numeric_mask, "n_values"] = col_meta.loc[numeric_mask, "n_values_num"]
        col_meta.loc[numeric_mask, "n_distinct"] = col_meta.loc[numeric_mask, "n_distinct_num"]
        col_meta = col_meta.drop(columns=["n_values_num", "n_distinct_num"])
    col_meta[["n_values", "n_distinct"]] = col_meta[["n_values", "n_distinct"]].fillna(0)
    col_meta["avg_len"] = col_meta["avg_len"].fillna(0.0)
    col_meta["distinct_ratio"] = np.where(
        col_meta["n_values"] > 0, col_meta["n_distinct"] / col_meta["n_values"], 0.0)
    col_meta["tags"] = col_meta.apply(_tags_for, axis=1)

    # ---- tokens ------------------------------------------------------------
    doc_df = spark.createDataFrame(lake.docs[["doc_id", "title", "text"]])
    doc_tokens_df = docs_to_bow(doc_df, max_df_frac=max_df_frac).cache()

    col_tokens_df = tokens_from_text(
        sv.withColumnRenamed("col_id", "cid"), "cid", "value").cache()

    # ---- minhash signatures -----------------------------------------------
    value_sigs = _sigs_to_dict(signatures_spark(
        sv.withColumnRenamed("col_id", "de_id"), hasher, elem_col="value"))
    col_token_sigs = _sigs_to_dict(signatures_spark(
        col_tokens_df, hasher, elem_col="token"))
    doc_token_sigs = _sigs_to_dict(signatures_spark(
        doc_tokens_df, hasher, elem_col="token"))

    # ---- solo content embeddings (mean pooling) ---------------------------
    content_vecs = _vecs_to_dict(pool_embeddings(col_tokens_df, embedder))
    content_vecs.update(
        _vecs_to_dict(pool_embeddings(doc_tokens_df, embedder, weight_col="tf")))

    # ---- metadata embeddings (names/titles are tiny — driver side) --------
    meta_vecs: dict[str, np.ndarray] = {}
    for r in col_meta.itertuples():
        toks = normalize(f"{r.table.replace('_', ' ')} {r.column.replace('_', ' ')}")
        meta_vecs[r.col_id] = embedder.mean_pool(toks)
    for r in lake.docs.itertuples():
        meta_vecs[r.doc_id] = embedder.mean_pool(normalize(r.title))

    profile = Profile(
        lake_name=lake.name,
        col_meta=col_meta,
        doc_meta=lake.docs[["doc_id", "collection", "title"]].copy(),
        doc_tokens=doc_tokens_df.toPandas(),
        col_tokens=col_tokens_df.toPandas(),
        value_sigs=value_sigs,
        col_token_sigs=col_token_sigs,
        doc_token_sigs=doc_token_sigs,
        content_vecs=content_vecs,
        meta_vecs=meta_vecs,
        numeric_stats=num_stats.set_index("col_id") if len(num_stats) else num_stats,
        hasher=hasher,
        embedder=embedder,
    )
    doc_tokens_df.unpersist()
    col_tokens_df.unpersist()
    return profile
