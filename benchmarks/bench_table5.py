"""Benchmark: Table 5 pipeline (trial sweep + least-sample aggregation)."""


def test_bench_table5_pipeline(benchmark, spark, karate_uc01):
    from repro.experiments.rr_oracle import build_oracle_local
    from repro.experiments.runner import run_trials, sweep_tasks
    from repro.experiments.tables import table5

    oracle = build_oracle_local(karate_uc01, 1 << 12)
    grids = {"oneshot": [1, 8, 64], "snapshot": [1, 8, 64], "ris": [16, 256, 4096]}
    tasks = sweep_tasks("Karate", "UC_0.1", 1, grids, trials=20)

    def run():
        trials = run_trials(spark, karate_uc01, oracle, tasks)
        return table5(trials)

    t5 = benchmark.pedantic(run, rounds=1, iterations=1)
    assert set(t5["alg"]) == {"oneshot", "snapshot", "ris"}
