"""The four elastic-search baseline settings of §6.1 (Fig. 6 legend).

Thin registry over :meth:`Doc2TableEngine.rank_elastic`:

1. BM25 (TF/IDF) over the union of content values and schema info;
2. LM Dirichlet over the same union corpus;
3. BM25 over content values only;
4. BM25 over schema information only.
"""
from __future__ import annotations

from repro.discovery.doc2table import Doc2TableEngine

ELASTIC_SETTINGS = {
    "ES BM25 content+schema": "es-bm25-all",
    "ES LMDirichlet content+schema": "es-lmd-all",
    "ES BM25 content": "es-bm25-content",
    "ES BM25 schema": "es-bm25-schema",
}


def run_all(engine: Doc2TableEngine) -> dict[str, dict]:
    """Run every ES setting; returns label → per-doc table rankings."""
    return {label: engine.rank_elastic(method)
            for label, method in ELASTIC_SETTINGS.items()}
