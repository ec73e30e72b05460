"""Benchmark: Table 7 pipeline (RIS-vs-Snapshot number & size ratios)."""


def test_bench_table7_ratios(benchmark, spark, karate_uc01):
    from repro.experiments.rr_oracle import build_oracle_local
    from repro.experiments.runner import run_trials, sweep_tasks
    from repro.experiments.tables import table6_and_7

    oracle = build_oracle_local(karate_uc01, 1 << 12)
    grids = {"snapshot": [1, 4, 16, 64], "ris": [4, 64, 1024, 8192]}
    tasks = sweep_tasks("Karate", "UC_0.1", 1, grids, trials=20)
    trials = run_trials(spark, karate_uc01, oracle, tasks).cache()
    trials.count()

    def run():
        return table6_and_7(trials)[1]

    t7 = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert len(t7) == 1
