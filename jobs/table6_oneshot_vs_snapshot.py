"""Table 6 — median comparable number ratio of Oneshot to Snapshot."""


def run(spark, trials_df):
    from repro.experiments.tables import table6_and_7

    return table6_and_7(trials_df)[0]


if __name__ == "__main__":
    import run_sweeps
    from _common import argparser, emit, get_spark
    from repro.experiments.tables import to_markdown

    args = argparser("Table 6: Oneshot vs Snapshot").parse_args()
    spark = get_spark("table6")
    out_dir = run_sweeps.run(spark, args.profile)
    t6 = run(spark, run_sweeps.load_trials(spark, out_dir))
    emit(to_markdown(t6.sort_values(["network", "setting", "k"])), args.out)
