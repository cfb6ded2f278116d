"""Benchmark: regenerate paper Table 3 (syntactic join discovery,
Aurum vs D3L vs CMDL over benchmarks 2A-2C)."""


def test_table3(benchmark, warm, spark):
    df = benchmark.pedantic(warm.run_table3, args=(spark,),
                            rounds=3, iterations=1)
    assert (df["CMDL"] >= df["Aurum"] - 0.05).all()
