"""Run the full sweep grid and persist trial results as parquet.

Tables 5, 6 and 7 aggregate from this shared dataset — running sweeps once
and re-aggregating mirrors the paper's design (one pool of recorded trials,
many analyses).
"""
import os
import time


def run(spark, profile: str = "quick", out_dir: str | None = None) -> str:
    from repro.experiments.instances import sweeps
    from repro.experiments.tables import run_sweep

    from _common import RESULTS_DIR

    out_dir = out_dir or os.path.join(RESULTS_DIR, f"trials_{profile}")
    all_sweeps = sweeps(profile)
    for i, sw in enumerate(all_sweeps):
        part = os.path.join(
            out_dir, f"{sw.network}__{sw.setting}__k{sw.k}"
        )
        if os.path.exists(part):
            print(f"[{i+1}/{len(all_sweeps)}] skip (exists): {part}")
            continue
        t0 = time.time()
        run_sweep(spark, sw).write.mode("overwrite").parquet(part)
        print(
            f"[{i+1}/{len(all_sweeps)}] {sw.network} {sw.setting} k={sw.k} "
            f"T={sw.trials}: {time.time()-t0:.1f}s"
        )
    return out_dir


def load_trials(spark, out_dir: str):
    return spark.read.parquet(os.path.join(out_dir, "*"))


if __name__ == "__main__":
    from _common import argparser, get_spark

    args = argparser("Run all trial sweeps").parse_args()
    spark = get_spark("sweeps")
    path = run(spark, args.profile, args.out)
    print(f"trials written under {path}")
