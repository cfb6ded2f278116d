"""Schema-name similarity utilities shared by discovery and baselines.

Two measures over column/table names:
- q-gram Jaccard (string-level; D3L's name signal and the "name"
  measure of the unionability ensemble, Table 5),
- token-overlap similarity (word-level; CMDL's PK-FK schema filter).
"""
from __future__ import annotations

from repro.text.tokenizer import normalize


def qgrams(s: str, q: int = 3) -> set[str]:
    """Padded character q-grams of a lowercase, underscore-stripped name."""
    s = "#" + s.lower().replace("_", " ").strip() + "#"
    if len(s) <= q:
        return {s}
    return {s[i:i + q] for i in range(len(s) - q + 1)}


def qgram_jaccard(a: str, b: str, q: int = 3) -> float:
    ga, gb = qgrams(a, q), qgrams(b, q)
    if not ga or not gb:
        return 0.0
    return len(ga & gb) / len(ga | gb)


def name_tokens(name: str) -> set[str]:
    return set(normalize(name.replace("_", " "), noun_filter=False))


def token_overlap_sim(a: str, b: str) -> float:
    """|tokens(a) ∩ tokens(b)| / min(|tokens(a)|, |tokens(b)|)."""
    ta, tb = name_tokens(a), name_tokens(b)
    if not ta or not tb:
        return 0.0
    return len(ta & tb) / min(len(ta), len(tb))


def name_similarity(a: str, b: str) -> float:
    """Combined name similarity: max of q-gram and token-overlap scores."""
    return max(qgram_jaccard(a, b), token_overlap_sim(a, b))
