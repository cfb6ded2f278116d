"""Shared test fixtures: lakes, benchmarks, and cached Spark profiles.

The root ``conftest.py`` provides the session-scoped ``spark`` fixture;
this file layers the reproduction's heavy artifacts on top, cached for
the whole session through ``repro.eval.harness``'s process-level cache
so tests, integration tests, and pytest-benchmarks share one profiling
pass per lake.
"""
import pytest

from repro.eval import harness


@pytest.fixture(scope="session")
def lakes():
    return harness.get_lakes()


@pytest.fixture(scope="session")
def benches():
    return harness.get_benches()


@pytest.fixture(scope="session")
def pharma(lakes):
    return lakes["pharma"]


@pytest.fixture(scope="session")
def ukopen(lakes):
    return lakes["ukopen"]


@pytest.fixture(scope="session")
def mlopen(lakes):
    return lakes["mlopen"]


@pytest.fixture(scope="session")
def pharma_profile(spark):
    return harness.get_profile(spark, "pharma")


@pytest.fixture(scope="session")
def ukopen_profile(spark):
    return harness.get_profile(spark, "ukopen")


@pytest.fixture(scope="session")
def mlopen_profile(spark):
    return harness.get_profile(spark, "mlopen")


@pytest.fixture(scope="session")
def bench_1b(benches):
    return benches["1B"]


@pytest.fixture(scope="session")
def engine_1b(spark, pharma_profile, bench_1b):
    from repro.discovery.doc2table import Doc2TableEngine
    return Doc2TableEngine(spark, pharma_profile, bench_1b)


@pytest.fixture(scope="session")
def ctx_1b(pharma_profile, bench_1b, engine_1b):
    from repro.weak.labeling import build_labeling_context
    return build_labeling_context(pharma_profile, engine_1b.cols, bench_1b.queries)


@pytest.fixture(scope="session")
def training_1b(pharma_profile, bench_1b, engine_1b, ctx_1b):
    from repro.joint.pipeline import build_training_dataset
    return build_training_dataset(pharma_profile, bench_1b.queries,
                                  engine_1b.cols, sample_frac=0.5, seed=0,
                                  ctx=ctx_1b)
