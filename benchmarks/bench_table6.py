"""Benchmark: regenerate paper Table 6 (labeling-function throughput).

The measured quantity itself is a throughput microbenchmark; this wraps
the full index-construction + query-loop harness."""


def test_table6(benchmark, warm, spark):
    df = benchmark.pedantic(warm.run_table6, args=(spark,),
                            kwargs={"n_queries": 100},
                            rounds=2, iterations=1)
    qps = df.set_index("labeling_function")["throughput_qps"]
    assert qps["Semantic"] == qps.max()
