"""Doc→Table discovery engine — CMDL variants and every §6.1 baseline.

Ranks candidate tables for document queries. All methods first score
individual tabular columns and then aggregate to the table level by the
best column score (as §6.1 prescribes: "compute the relatedness scores
based on the individual tabular columns, and then aggregate these
scores to the table level").

Methods:

- ``embedding`` — cosine in a vector space (pass solo content vectors
  for CMDL-solo, joint vectors for CMDL-joint/gold);
- ``containment`` — minhash Jaccard set containment doc→column
  (the LSHEnsemble baseline);
- ``es-*`` — the four elastic-search settings (BM25 / LM-Dirichlet over
  content+schema, BM25 over content only, BM25 over schema only),
  scored as **Spark DataFrame joins** over all query documents at once;
- ``em-*`` — entity-matching baselines (generic/tuned × jaccard/jaro).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.entity_matching import rank_tables as em_rank_tables
from repro.index.bm25 import score_queries_spark
from repro.lake.benchmarks import Doc2TableBench
from repro.sketch.minhash import est_containment
from repro.sketch.profiler import Profile
from repro.text.tokenizer import normalize

ES_METHODS = {
    "es-bm25-all": ("bm25", "all"),
    "es-lmd-all": ("lmd", "all"),
    "es-bm25-content": ("bm25", "content"),
    "es-bm25-schema": ("bm25", "schema"),
}


class Doc2TableEngine:
    """Batch Doc→Table ranking over one benchmark's scope."""

    def __init__(self, spark: SparkSession, profile: Profile, bench: Doc2TableBench):
        self.spark = spark
        self.profile = profile
        self.bench = bench
        meta = profile.col_meta
        scope = meta[meta["table"].isin(set(bench.candidate_tables))]
        self.cols = [r.col_id for r in scope.itertuples()
                     if r.dtype == "str" and "text-search" in r.tags]
        self.col_table = {r.col_id: r.table for r in scope.itertuples()}
        self.docs = bench.queries

    # ---- shared aggregation ------------------------------------------------
    def _tables_from_col_scores(self, scores: dict[str, float]) -> list[tuple[str, float]]:
        ts: dict[str, float] = {}
        for c, s in scores.items():
            t = self.col_table.get(c)
            if t is None:
                continue
            if s > ts.get(t, -np.inf):
                ts[t] = s
        ranked = sorted(ts.items(), key=lambda kv: (-kv[1], kv[0]))
        return [(t, s) for t, s in ranked if s > 0]

    # ---- methods -----------------------------------------------------------
    def rank_embedding(self, vecs: dict[str, np.ndarray]) -> dict[str, list[tuple[str, float]]]:
        cols = [c for c in self.cols if c in vecs]
        if not cols:
            return {d: [] for d in self.docs}
        M = np.stack([vecs[c] for c in cols])
        Mn = M / np.clip(np.linalg.norm(M, axis=1, keepdims=True), 1e-12, None)
        out = {}
        for d in self.docs:
            dv = vecs.get(d)
            if dv is None:
                out[d] = []
                continue
            n = np.linalg.norm(dv)
            sims = Mn @ (dv / n if n else dv)
            out[d] = self._tables_from_col_scores(dict(zip(cols, sims)))
        return out

    def rank_containment(self) -> dict[str, list[tuple[str, float]]]:
        p = self.profile
        entries = [(c, *p.col_token_sigs[c]) for c in self.cols if c in p.col_token_sigs]
        out = {}
        for d in self.docs:
            e = p.doc_token_sigs.get(d)
            if e is None:
                out[d] = []
                continue
            sig, n = e
            scores = {c: est_containment(sig, n, s, sz) for c, s, sz in entries}
            out[d] = self._tables_from_col_scores(scores)
        return out

    def _schema_tokens(self) -> pd.DataFrame:
        meta = self.profile.col_meta.set_index("col_id")
        rows = [{"de_id": c, "token": t, "tf": 1}
                for c in self.cols
                for t in normalize(f"{meta.loc[c, 'table']} {meta.loc[c, 'column']}"
                                   .replace("_", " "), noun_filter=False)]
        return pd.DataFrame(rows, columns=["de_id", "token", "tf"])

    def rank_elastic(self, method: str) -> dict[str, list[tuple[str, float]]]:
        """One of the four ES settings, batch-scored via Spark joins."""
        scoring, corpus = ES_METHODS[method]
        ct = self.profile.col_tokens
        content = ct[ct["de_id"].isin(set(self.cols))]
        if corpus == "content":
            de_tokens = content
        elif corpus == "schema":
            de_tokens = self._schema_tokens()
        else:
            de_tokens = (pd.concat([content, self._schema_tokens()])
                         .groupby(["de_id", "token"], as_index=False)["tf"].sum())
        dt = self.profile.doc_tokens
        q = dt[dt["de_id"].isin(set(self.docs))].rename(columns={"de_id": "query_id"})
        if q.empty or de_tokens.empty:
            return {d: [] for d in self.docs}
        sdf_q = self.spark.createDataFrame(q)
        sdf_t = self.spark.createDataFrame(de_tokens)
        scored = score_queries_spark(sdf_q, sdf_t, method=scoring).toPandas()
        out = {d: [] for d in self.docs}
        for d, grp in scored.groupby("query_id"):
            out[d] = self._tables_from_col_scores(
                dict(zip(grp["de_id"], grp["score"])))
        return out

    def rank_entity_matching(self, *, mode: str, metric: str,
                             lexicon: set[str] | None = None,
                             doc_texts: dict[str, str] | None = None,
                             col_values: dict[str, np.ndarray] | None = None
                             ) -> dict[str, list[tuple[str, float]]]:
        assert doc_texts is not None and col_values is not None
        cv = {c: v for c, v in col_values.items() if c in set(self.cols)}
        out = {}
        for d in self.docs:
            out[d] = em_rank_tables(doc_texts.get(d, ""), cv, self.col_table,
                                    mode=mode, metric=metric, lexicon=lexicon)
        return out


def evaluate_rankings(rankings: dict[str, list[tuple[str, float]]],
                      gt_tables: pd.DataFrame, ks: list[int]) -> pd.DataFrame:
    """Mean precision/recall@k over queries with non-empty ground truth."""
    truths = {d: set(g["table"]) for d, g in gt_tables.groupby("doc_id")}
    rows = []
    for k in ks:
        ps, rs = [], []
        for d, truth in truths.items():
            top = [t for t, _ in rankings.get(d, [])][:k]
            hits = sum(1 for t in top if t in truth)
            ps.append(hits / k)
            rs.append(hits / len(truth))
        rows.append({"k": k, "precision": float(np.mean(ps)) if ps else 0.0,
                     "recall": float(np.mean(rs)) if rs else 0.0})
    return pd.DataFrame(rows)
