"""Benchmark: Table 3 network-statistics pipeline (degrees + triangles)."""


def test_bench_table3_stats(benchmark, spark):
    import table3_network_stats

    def run():
        return table3_network_stats.run(spark, networks=["Karate", "BA_s"])

    result = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert len(result) == 2
