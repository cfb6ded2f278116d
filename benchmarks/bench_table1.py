"""Benchmark: regenerate paper Table 1 (data-lake overview)."""


def test_table1(benchmark, warm):
    df = benchmark(warm.run_table1)
    assert len(df) == 11
