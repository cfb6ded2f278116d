"""Aurum baseline [31] — configured from the measures §6 attributes to it.

Aurum materializes schema- and content-similarity links between column
pairs into a knowledge graph:

- syntactic joins: minhash **Jaccard similarity** (not containment);
- PK-FK: Jaccard ≥ threshold + strict key cardinality, no schema filter;
- unionability: only schema(name) similarity and Jaccard similarity,
  combined by taking the **max** of the two scores (§6.3).

All three reuse the shared discovery engines with Aurum's configuration,
so the CMDL-vs-Aurum deltas in Tables 3/4 and Fig. 7 have exactly the
paper's stated causes.
"""
from __future__ import annotations

from repro.discovery.joinability import JoinIndex
from repro.discovery.pkfk import AURUM_PKFK, discover_pkfk
from repro.discovery.unionability import UnionIndex
from repro.sketch.profiler import Profile


def join_rank(index: JoinIndex, query_col: str, *, k: int | None = None):
    """Aurum's syntactic join ranking (Jaccard similarity)."""
    return index.rank(query_col, method="jaccard", k=k)


def pkfk_links(profile: Profile, *, collection: str | None = None):
    """Aurum's PK-FK discovery."""
    return discover_pkfk(profile, collection=collection, config=AURUM_PKFK)


def union_rank(index: UnionIndex, table: str, *, k: int | None = None):
    """Aurum's unionability: max(schema sim, Jaccard sim) per column pair."""
    return index.rank(table, k=k, combiner="aurum")
