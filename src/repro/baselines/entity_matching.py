"""Entity-matching baseline (§6.1): SpaCy / SciSpaCy stand-ins.

The paper's entity-matching baselines extract entities from documents
with a NER model and link a document to a table when the entities match
the table's content. Offline, NER is simulated by extraction heuristics:

- ``mode='generic'`` (the plain-SpaCy analog): shape-based extraction —
  any sufficiently long alphanumeric token is treated as a candidate
  entity. Off-domain this is noisy and yields near-random links, which
  is exactly the paper's finding on Benchmarks 1A/1C.
- ``mode='tuned'`` (the SciSpaCy analog): dictionary extraction against
  the lake's entity lexicon (the moral equivalent of a model fine-tuned
  on the domain corpus), competitive on the Pharma benchmark.

Matching uses either Jaccard over the extracted entity set vs the
column's value set, or mean best-Jaro between entities and values.
"""
from __future__ import annotations

import re

import numpy as np
import pandas as pd

from repro.baselines.jaro import jaro
from repro.text.tokenizer import tokenize

_SHAPE = re.compile(r"^[a-z]+[0-9]+$")


def extract_entities(text: str, *, mode: str = "generic",
                     lexicon: set[str] | None = None) -> set[str]:
    """Extract candidate entity mentions from a document."""
    toks = set(tokenize(text))
    if mode == "generic":
        return {t for t in toks if len(t) >= 6}
    if mode == "tuned":
        if lexicon is None:
            raise ValueError("tuned mode needs a lexicon")
        return {t for t in toks if t in lexicon or _SHAPE.match(t)}
    raise ValueError(f"unknown mode {mode!r}")


def match_score(entities: set[str], col_values: np.ndarray, *,
                metric: str = "jaccard", jaro_threshold: float = 0.9) -> float:
    """Similarity between a document's entity set and a column's values."""
    if not entities or len(col_values) == 0:
        return 0.0
    vals = set(map(str, col_values))
    if metric == "jaccard":
        inter = len(entities & vals)
        return inter / len(entities | vals)
    if metric == "jaro":
        # 2-char-prefix blocking keeps the quadratic Jaro cost feasible
        # (high-Jaro pairs almost always share a prefix); the paper had to
        # skip Jaro entirely on its largest benchmark for this reason.
        blocks: dict[str, list[str]] = {}
        for v in vals:
            blocks.setdefault(v[:2], []).append(v)
        hits = 0.0
        for e in entities:
            cand = blocks.get(e[:2], ())
            best = max((jaro(e, v) for v in cand), default=0.0)
            if best >= jaro_threshold:
                hits += best
        return hits / len(entities)
    raise ValueError(f"unknown metric {metric!r}")


def rank_tables(doc_text: str, col_values: dict[str, np.ndarray],
                col_table: dict[str, str], *, mode: str = "generic",
                metric: str = "jaccard",
                lexicon: set[str] | None = None) -> list[tuple[str, float]]:
    """Rank tables for one document by the best matching column score."""
    ents = extract_entities(doc_text, mode=mode, lexicon=lexicon)
    table_scores: dict[str, float] = {}
    for c, vals in col_values.items():
        s = match_score(ents, vals, metric=metric)
        t = col_table[c]
        if s > table_scores.get(t, 0.0):
            table_scores[t] = s
    ranked = sorted(table_scores.items(), key=lambda kv: (-kv[1], kv[0]))
    return [(t, s) for t, s in ranked if s > 0]
