"""BM25 and LM-Dirichlet ranking — the Elasticsearch substitute (§3, §6).

Two execution paths over the same statistics:

- :func:`score_queries_spark` — batch scoring of many queries as Spark
  DataFrame joins (query tokens ⋈ postings → groupBy sum), used by the
  benchmark harness;
- :class:`InvertedIndex` — a driver-side inverted index with the same
  formulas, used by the labeling functions and the throughput
  microbenchmark (Table 6), standing in for an Elasticsearch server.

Formulas: Robertson BM25 with k1=1.2, b=0.75 and the Lucene idf
``ln(1 + (N - df + 0.5)/(df + 0.5))``; LM Dirichlet with the standard
rank-equivalent decomposition ``Σ_q log(1 + tf/(μ p(w|C))) +
|q|·log(μ/(dl+μ))``.
"""
from __future__ import annotations

import math
from collections import defaultdict
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, functions as F

K1 = 1.2
B = 0.75
MU = 300.0


def score_queries_spark(query_tokens: DataFrame, de_tokens: DataFrame, *,
                        method: str = "bm25", k1: float = K1, b: float = B,
                        mu: float = MU) -> DataFrame:
    """Score (query_id × de_id) pairs sharing at least one token.

    ``query_tokens``: (query_id, token[, qtf]); ``de_tokens``:
    (de_id, token, tf). Returns (query_id, de_id, score). For
    ``method='lmd'`` the per-query length-normalization constant is
    omitted — it is constant per (query, de) candidate set only in dl,
    so we add the exact ``|q| log(mu/(dl+mu))`` term per pair.
    """
    n_des = de_tokens.select("de_id").distinct().count()
    doclen = de_tokens.groupBy("de_id").agg(F.sum("tf").alias("dl"))
    avgdl = doclen.agg(F.avg("dl")).first()[0] or 1.0
    total_tokens = de_tokens.agg(F.sum("tf")).first()[0] or 1

    dfreq = de_tokens.groupBy("token").agg(
        F.countDistinct("de_id").alias("df"), F.sum("tf").alias("cf"))

    q = query_tokens.select("query_id", "token").distinct()
    qlen = q.groupBy("query_id").agg(F.count("token").alias("qlen"))

    joined = (
        q.join(de_tokens, "token")
        .join(dfreq, "token")
        .join(doclen, "de_id")
    )
    if method == "bm25":
        idf = F.log(F.lit(1.0) + (F.lit(n_des) - F.col("df") + 0.5) / (F.col("df") + 0.5))
        tfc = (F.col("tf") * (k1 + 1)) / (
            F.col("tf") + k1 * (1 - b + b * F.col("dl") / F.lit(float(avgdl))))
        scored = joined.withColumn("s", idf * tfc)
        return scored.groupBy("query_id", "de_id").agg(F.sum("s").alias("score"))
    if method == "lmd":
        pwc = F.col("cf") / F.lit(float(total_tokens))
        term = F.log(F.lit(1.0) + F.col("tf") / (F.lit(mu) * pwc))
        scored = joined.withColumn("s", term)
        agg = scored.groupBy("query_id", "de_id").agg(
            F.sum("s").alias("s"), F.first("dl").alias("dl"))
        return (
            agg.join(qlen, "query_id")
            .withColumn("score", F.col("s") + F.col("qlen")
                        * F.log(F.lit(mu) / (F.col("dl") + F.lit(mu))))
            .select("query_id", "de_id", "score")
        )
    raise ValueError(f"unknown method {method!r}")


@dataclass
class _DocStat:
    dl: float


class InvertedIndex:
    """In-memory inverted index with BM25 / LM-Dirichlet query scoring."""

    def __init__(self, tokens: pd.DataFrame, *, k1: float = K1, b: float = B,
                 mu: float = MU):
        """``tokens``: pandas (de_id, token, tf)."""
        self.k1, self.b, self.mu = k1, b, mu
        self.postings: dict[str, list[tuple[str, float]]] = defaultdict(list)
        self.dl: dict[str, float] = defaultdict(float)
        self.cf: dict[str, float] = defaultdict(float)
        for de, tok, tf in tokens[["de_id", "token", "tf"]].itertuples(index=False):
            self.postings[tok].append((de, float(tf)))
            self.dl[de] += float(tf)
            self.cf[tok] += float(tf)
        self.n_des = len(self.dl)
        self.avgdl = (sum(self.dl.values()) / self.n_des) if self.n_des else 1.0
        self.total_tokens = sum(self.cf.values()) or 1.0

    def _idf(self, token: str) -> float:
        df = len(self.postings.get(token, ()))
        return math.log(1.0 + (self.n_des - df + 0.5) / (df + 0.5))

    def query(self, tokens: list[str], *, k: int = 10,
              method: str = "bm25") -> list[tuple[str, float]]:
        """Top-k (de_id, score) for a bag of query tokens."""
        scores: dict[str, float] = defaultdict(float)
        qtoks = list(dict.fromkeys(tokens))
        for t in qtoks:
            plist = self.postings.get(t)
            if not plist:
                continue
            if method == "bm25":
                idf = self._idf(t)
                for de, tf in plist:
                    dl = self.dl[de]
                    tfc = tf * (self.k1 + 1) / (
                        tf + self.k1 * (1 - self.b + self.b * dl / self.avgdl))
                    scores[de] += idf * tfc
            elif method == "lmd":
                pwc = self.cf[t] / self.total_tokens
                for de, tf in plist:
                    scores[de] += math.log(1.0 + tf / (self.mu * pwc))
            else:
                raise ValueError(f"unknown method {method!r}")
        if method == "lmd":
            qn = len(qtoks)
            for de in scores:
                scores[de] += qn * math.log(self.mu / (self.dl[de] + self.mu))
        ranked = sorted(scores.items(), key=lambda kv: (-kv[1], kv[0]))
        return ranked[:k]
