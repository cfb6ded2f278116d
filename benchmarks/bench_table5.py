"""Benchmark: regenerate paper Table 5 (union similarity Relative Recall)."""


def test_table5(benchmark, warm, spark):
    df = benchmark.pedantic(warm.run_table5, args=(spark,),
                            rounds=2, iterations=1)
    assert len(df) == 4
