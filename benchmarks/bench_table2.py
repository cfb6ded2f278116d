"""Benchmark: regenerate paper Table 2 (benchmark overview + mQCR)."""


def test_table2(benchmark, warm):
    df = benchmark(warm.run_table2)
    assert len(df) == 13
