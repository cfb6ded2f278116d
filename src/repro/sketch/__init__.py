"""Profiler substrate: minhash signatures, numeric stats, column tagging."""
