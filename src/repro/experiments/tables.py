"""Table assembly: glue between sweeps, analytics, and the job scripts."""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.experiments import quality, ratios
from repro.experiments.instances import Sweep
from repro.experiments.rr_oracle import RROracle, build_oracle
from repro.experiments.runner import run_trials, sweep_tasks
from repro.graphs import assign_probabilities, build_network, to_csr
from repro.graphs.csr import CSRGraph


def load_influence_graph(
    spark: SparkSession, network: str, setting: str
) -> CSRGraph:
    """Network + probability setting → broadcastable CSR influence graph."""
    edges = build_network(spark, network)
    return to_csr(assign_probabilities(edges, setting))


_ORACLE_CACHE: dict[tuple[str, str, int], RROracle] = {}
_GRAPH_CACHE: dict[tuple[str, str], CSRGraph] = {}


def cached_graph(spark, network: str, setting: str) -> CSRGraph:
    key = (network, setting)
    if key not in _GRAPH_CACHE:
        _GRAPH_CACHE[key] = load_influence_graph(spark, network, setting)
    return _GRAPH_CACHE[key]


def cached_oracle(spark, network: str, setting: str, theta: int) -> RROracle:
    key = (network, setting, theta)
    if key not in _ORACLE_CACHE:
        _ORACLE_CACHE[key] = build_oracle(
            spark, cached_graph(spark, network, setting), theta
        )
    return _ORACLE_CACHE[key]


def run_sweep(spark: SparkSession, sweep: Sweep) -> DataFrame:
    """Execute one sweep: all (alg × sample number × trial) tasks."""
    graph = cached_graph(spark, sweep.network, sweep.setting)
    oracle = cached_oracle(
        spark, sweep.network, sweep.setting, sweep.oracle_theta
    )
    tasks = sweep_tasks(
        sweep.network, sweep.setting, sweep.k, sweep.grids, sweep.trials
    )
    return run_trials(spark, graph, oracle, tasks)


def table4(
    spark: SparkSession,
    networks=("BA_s", "BA_d"),
    settings=("UC_0.1", "UC_0.01", "IWC", "OWC"),
    theta: int = 1 << 18,
) -> pd.DataFrame:
    """Top-3 single-vertex influence per (network, setting)."""
    rows = []
    for net in networks:
        for setting in settings:
            oracle = cached_oracle(spark, net, setting, theta)
            inf = np.sort(oracle.singleton_estimates())[::-1]
            rows.append(
                {
                    "network": net,
                    "setting": setting,
                    "inf_1st": round(float(inf[0]), 4),
                    "inf_2nd": round(float(inf[1]), 4),
                    "inf_3rd": round(float(inf[2]), 4),
                }
            )
    return pd.DataFrame(rows)


def table5(trials: DataFrame) -> pd.DataFrame:
    refs = quality.reference_influence(
        trials.toPandas()
    )
    return quality.least_sample_number(trials, refs)


def table6_and_7(trials: DataFrame) -> tuple[pd.DataFrame, pd.DataFrame]:
    stats = ratios.mean_stats(trials)
    return ratios.table6(stats), ratios.table7(stats)


def to_markdown(df: pd.DataFrame, floatfmt: str = "{:.4g}") -> str:
    """Minimal markdown renderer (no tabulate dependency offline)."""
    cols = list(df.columns)
    out = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for _, r in df.iterrows():
        cells = []
        for c in cols:
            v = r[c]
            if isinstance(v, float) and not pd.isna(v):
                cells.append(floatfmt.format(v))
            else:
                cells.append(str(v))
        out.append("| " + " | ".join(cells) + " |")
    return "\n".join(out)
