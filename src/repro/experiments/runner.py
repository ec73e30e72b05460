"""Distributed trial fan-out (§4's methodology).

One experiment = run algorithm ``alg`` with sample number ``s`` T times and
record each random seed set with its oracle influence. Trials are
independent, so they fan out as rows of a task DataFrame processed by
``mapInPandas`` workers holding the broadcast CSR graph and RR oracle; all
downstream statistics (entropy, means, percentiles, least sample numbers)
are DataFrame aggregations over the returned trial table.

Trial-result schema:
  network, setting, alg, sample_number, k, trial,
  seed_set (sorted ','-joined), influence (shared-oracle estimate),
  vertex_cost, edge_cost, sample_size
"""
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.algorithms import ALGORITHMS, make_estimator, run_greedy
from repro.experiments.rr_oracle import RROracle
from repro.graphs.csr import CSRGraph
from repro.util import trial_rng

RESULT_SCHEMA = (
    "network string, setting string, alg string, sample_number long, "
    "k long, trial long, seed_set string, influence double, "
    "vertex_cost long, edge_cost long, sample_size long"
)


@dataclass(frozen=True)
class TrialTask:
    network: str
    setting: str
    alg: str  # "oneshot" | "snapshot" | "ris"
    sample_number: int
    k: int
    trial: int


def tasks_dataframe(spark: SparkSession, tasks: list[TrialTask]) -> DataFrame:
    pdf = pd.DataFrame([t.__dict__ for t in tasks])
    return spark.createDataFrame(pdf)


def run_trial_local(
    graph: CSRGraph,
    oracle: RROracle,
    task: TrialTask,
    base_seed: int,
) -> dict:
    """Run one greedy trial (used by workers and directly in tests)."""
    rng = trial_rng(
        base_seed,
        ALGORITHMS.index(task.alg),
        task.sample_number,
        task.k,
        task.trial,
    )
    est = make_estimator(task.alg, graph, task.sample_number, rng)
    res = run_greedy(est, graph.n, task.k, rng)
    seed_set = ",".join(str(v) for v in sorted(res.seeds))
    return {
        "network": task.network,
        "setting": task.setting,
        "alg": task.alg,
        "sample_number": task.sample_number,
        "k": task.k,
        "trial": task.trial,
        "seed_set": seed_set,
        "influence": oracle.estimate(np.array(res.seeds)),
        "vertex_cost": res.vertex_cost,
        "edge_cost": res.edge_cost,
        "sample_size": res.sample_size,
    }


def run_trials(
    spark: SparkSession,
    graph: CSRGraph,
    oracle: RROracle,
    tasks: list[TrialTask],
    base_seed: int = 2020,
) -> DataFrame:
    """Fan trials out over the cluster; returns the trial-result DataFrame."""
    sc = spark.sparkContext
    bc_graph = sc.broadcast(graph)
    bc_oracle = sc.broadcast(oracle)
    n_parts = max(1, min(len(tasks), sc.defaultParallelism * 4))
    tasks_df = tasks_dataframe(spark, tasks).repartition(n_parts)

    def work(batches):
        g = bc_graph.value
        orc = bc_oracle.value
        for pdf in batches:
            rows = [
                run_trial_local(
                    g,
                    orc,
                    TrialTask(
                        r.network,
                        r.setting,
                        r.alg,
                        int(r.sample_number),
                        int(r.k),
                        int(r.trial),
                    ),
                    base_seed,
                )
                for r in pdf.itertuples()
            ]
            yield pd.DataFrame(rows)

    return tasks_df.mapInPandas(work, schema=RESULT_SCHEMA)


def sweep_tasks(
    network: str,
    setting: str,
    k: int,
    grids: dict[str, list[int]],
    trials: int,
) -> list[TrialTask]:
    """Cartesian task list: every algorithm × its sample-number grid × T."""
    return [
        TrialTask(network, setting, alg, s, k, t)
        for alg, grid in grids.items()
        for s in grid
        for t in range(trials)
    ]
