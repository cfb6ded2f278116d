"""D3L baseline [15] — multi-signal sketches combined at query time.

D3L builds hash-based sketches on fine-grained signals (name q-grams,
value overlap, numeric ranges, embeddings) and combines the per-signal
*distances* with a weighted Euclidean sum when answering top-k queries:

- syntactic joins: weighted Euclidean over name + value distances
  (``JoinIndex`` method 'd3l');
- unionability: per-measure table scores first, then weighted Euclidean
  combination (``UnionIndex`` combiner 'd3l', matching §6.3's
  description: "first obtains the most unionable tables based on an
  individual measure before combining the similarity scores
  (distances) with a weighted euclidean sum").

D3L does not compute PK-FK links (Table 4 note).
"""
from __future__ import annotations

from repro.discovery.joinability import JoinIndex
from repro.discovery.unionability import MEASURES, UnionIndex


def join_rank(index: JoinIndex, query_col: str, *, k: int | None = None):
    """D3L's syntactic join ranking (name+value weighted Euclidean)."""
    return index.rank(query_col, method="d3l", k=k)


def union_rank(index: UnionIndex, table: str, *, k: int | None = None,
               measures: tuple[str, ...] = MEASURES):
    """D3L's unionability ranking."""
    return index.rank(table, k=k, measures=measures, combiner="d3l")
