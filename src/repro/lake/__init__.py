"""Synthetic data lakes, per-lake recipes, and benchmark construction."""
