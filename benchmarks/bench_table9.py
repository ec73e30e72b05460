"""Benchmark: Table 9 assembly (sweep → ratios → conditioned cost)."""


def test_bench_table9_pipeline(benchmark, spark, karate_uc01):
    import pandas as pd

    from repro.experiments.rr_oracle import build_oracle_local
    from repro.experiments.runner import run_trials, sweep_tasks
    from repro.experiments.tables import table6_and_7
    from repro.experiments.traversal import table8_rows, table9_rows

    oracle = build_oracle_local(karate_uc01, 1 << 12)
    grids = {
        "oneshot": [1, 4, 16, 64],
        "snapshot": [1, 4, 16, 64],
        "ris": [16, 256, 4096],
    }
    tasks = sweep_tasks("Karate", "UC_0.1", 1, grids, trials=20)

    def run():
        trials = run_trials(spark, karate_uc01, oracle, tasks)
        t6, t7 = table6_and_7(trials)
        t8 = pd.DataFrame(
            table8_rows(karate_uc01, "Karate", "UC_0.1", trials=50)
        )
        return table9_rows(t8, t6, t7)

    t9 = benchmark.pedantic(run, rounds=1, iterations=1)
    assert set(t9["alg"]) == {"oneshot", "snapshot", "ris"}
