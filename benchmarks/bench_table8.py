"""Benchmark: Table 8 traversal-cost measurement kernels."""


def test_bench_table8_karate(benchmark, karate_uc01):
    from repro.experiments.traversal import table8_rows

    def run():
        return table8_rows(karate_uc01, "Karate", "UC_0.1", trials=100)

    rows = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert len(rows) == 3


def test_bench_table8_ba_s(benchmark, ba_s_iwc):
    from repro.experiments.traversal import table8_rows

    def run():
        return table8_rows(ba_s_iwc, "BA_s", "IWC", trials=20)

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(rows) == 3
