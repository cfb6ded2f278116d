"""Labeling functions over CMDL's indexes (paper §4.1, Fig. 3).

The four weak-supervision signals are top-k probes of the four index
types built on the profiler's sketches:

1. *semantic* — solo-embedding ANN index over column content vectors;
2. *syntactic* — LSHEnsemble over column token-minhash signatures,
   probed with the document's token signature (containment direction
   doc→column);
3. *content* — BM25 inverted index over column value tokens;
4. *metadata* — BM25 inverted index over column/table name tokens,
   probed with the document title.

Each LF labels a (doc, col) pair 1 iff the column appears in the top-k
probe result for the document (with low-score matches cut at
``min_score``), else 0.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.index.ann import AnnIndex
from repro.index.bm25 import InvertedIndex
from repro.index.lshensemble import LSHEnsemble
from repro.sketch.profiler import Profile
from repro.text.tokenizer import normalize

LF_NAMES = ("semantic", "syntactic", "content", "metadata")


@dataclass
class LabelingContext:
    """Prebuilt indexes scoped to one benchmark's documents and columns."""

    profile: Profile
    col_ids: list[str]
    doc_ids: list[str]
    ann: AnnIndex
    lsh: LSHEnsemble
    bm25_content: InvertedIndex
    bm25_meta: InvertedIndex
    doc_tokens: dict[str, list[str]]
    doc_title_tokens: dict[str, list[str]]


def build_labeling_context(profile: Profile, col_ids: list[str],
                           doc_ids: list[str]) -> LabelingContext:
    cols = [c for c in col_ids if c in profile.content_vecs]
    ann = AnnIndex(cols, np.stack([profile.content_vecs[c] for c in cols]))
    lsh_entries = [(c, *profile.col_token_sigs[c]) for c in cols
                   if c in profile.col_token_sigs]
    lsh = LSHEnsemble(lsh_entries, threshold=0.3)
    ct = profile.col_tokens
    bm25_content = InvertedIndex(ct[ct["de_id"].isin(set(cols))])
    meta = profile.col_meta.set_index("col_id")
    meta_rows = [{"de_id": c, "token": t, "tf": 1}
                 for c in cols
                 for t in normalize(f"{meta.loc[c, 'table']} {meta.loc[c, 'column']}"
                                    .replace("_", " "), noun_filter=False)]
    bm25_meta = InvertedIndex(pd.DataFrame(meta_rows))
    dt = profile.doc_tokens
    doc_tokens = {d: list(g["token"]) for d, g in dt.groupby("de_id") if d in set(doc_ids)}
    titles = profile.doc_meta.set_index("doc_id")["title"]
    doc_title_tokens = {d: normalize(titles.loc[d], noun_filter=False)
                        for d in doc_ids if d in titles.index}
    return LabelingContext(profile, cols, list(doc_ids), ann, lsh,
                           bm25_content, bm25_meta, doc_tokens, doc_title_tokens)


def lf_topk(ctx: LabelingContext, doc_id: str, lf: str, *, k: int = 10,
            min_score: float = 1e-9) -> set[str]:
    """Top-k columns returned by one labeling function for a document."""
    p = ctx.profile
    if lf == "semantic":
        vec = p.content_vecs.get(doc_id)
        if vec is None:
            return set()
        return {c for c, s in ctx.ann.query(vec, k) if s >= min_score}
    if lf == "syntactic":
        entry = p.doc_token_sigs.get(doc_id)
        if entry is None:
            return set()
        sig, n = entry
        return {c for c, s in ctx.lsh.query(sig, n, k=k, threshold=None) if s >= min_score}
    if lf == "content":
        toks = ctx.doc_tokens.get(doc_id, [])
        return {c for c, s in ctx.bm25_content.query(toks, k=k) if s >= min_score}
    if lf == "metadata":
        toks = ctx.doc_title_tokens.get(doc_id, [])
        return {c for c, s in ctx.bm25_meta.query(toks, k=k) if s >= min_score}
    raise ValueError(f"unknown LF {lf!r}")


def label_matrix(ctx: LabelingContext, doc_sample: list[str],
                 col_sample: list[str], *, k: int = 10,
                 lfs: tuple[str, ...] = LF_NAMES) -> tuple[pd.DataFrame, np.ndarray]:
    """Vote matrix over the Cartesian product of samples (§4.1).

    One index probe per (doc, LF) labels *all* sampled columns at once
    (the efficiency argument of §4.1). Returns (pairs, votes) where
    ``pairs`` is a DataFrame (doc_id, col_id) and ``votes`` the aligned
    binary matrix of shape (n_pairs, n_lfs).
    """
    col_set = list(col_sample)
    pairs = []
    votes = []
    for d in doc_sample:
        tops = [lf_topk(ctx, d, lf, k=k) for lf in lfs]
        for c in col_set:
            pairs.append((d, c))
            votes.append([1 if c in t else 0 for t in tops])
    return (pd.DataFrame(pairs, columns=["doc_id", "col_id"]),
            np.array(votes, dtype=np.int8))
