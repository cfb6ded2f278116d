"""CMDL reproduction (Eltabakh et al., VLDB 2023) — PySpark implementation.

Subpackages:

- ``text``, ``embed``, ``sketch``, ``index``, ``lake`` — substrates
  (NLP pipeline, embeddings, profiler sketches, indexes, synthetic lakes);
- ``weak``, ``joint``, ``discovery`` — the paper's core (weak
  supervision, joint representation, discovery engines + SRQL);
- ``baselines`` — Aurum, D3L, elastic-search, entity-matching;
- ``eval`` — metrics, table harness, paper-vs-measured renderers;
- ``synth_data``/``oracle`` — provided TPC-H-lite generators and the
  DuckDB result-equality checker.
"""
