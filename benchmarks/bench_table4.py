"""Benchmark: regenerate paper Table 4 (PK-FK discovery, Aurum vs CMDL)."""


def test_table4(benchmark, warm, spark):
    df = benchmark.pedantic(warm.run_table4, args=(spark,),
                            rounds=3, iterations=1)
    assert len(df) == 3
