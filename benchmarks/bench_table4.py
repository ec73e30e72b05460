"""Benchmark: Table 4 singleton-influence oracle (distributed RR build)."""


def test_bench_table4_singletons(benchmark, spark, ba_s_iwc):
    from repro.experiments.rr_oracle import build_oracle

    def run():
        oracle = build_oracle(spark, ba_s_iwc, 1 << 14, base_seed=99)
        return oracle.singleton_estimates()

    est = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert est.max() > est.mean()
