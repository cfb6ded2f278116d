"""Evaluation: metrics, per-table harness, paper-vs-measured renderers."""
