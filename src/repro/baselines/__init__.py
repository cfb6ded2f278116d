"""Baselines: Aurum, D3L, elastic-search settings, entity matching."""
