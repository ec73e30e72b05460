"""Per-sample traversal cost (§5.3, Table 8) and the identical-accuracy
conditioning (§6, Table 9).

Table 8 measures, averaged over T independent runs, the cost of the first
greedy iteration at k = 1 with sample number 1:

* Oneshot — Estimate for every candidate with β = 1: one simulation per
  vertex (E[vertex cost] = Σ_v Inf(v), edge cost = Σ d⁺ over activated).
* Snapshot — one live graph, reachability scan from every candidate
  (same expected vertex cost; edge cost only touches live edges → ×m̃/m).
* RIS — generating a single RR set (E[vertex cost] = EPT, edge cost = w(R)).

Table 9 is arithmetic on Tables 6/7/8, exactly as the paper does: with
comparable number ratios cr₁ (Oneshot→Snapshot) and cr₂ (RIS→Snapshot),
running β = cr₁γ, τ = γ, θ = cr₂γ equalizes accuracy, so each approach's
cost per γ is its Table 8 (vertex+edge) cost × its ratio (Snapshot's is 1).
"""
import numpy as np
import pandas as pd

from repro.algorithms.snapshot import SnapshotEstimator
from repro.graphs.csr import CSRGraph
from repro.ic.forward import simulate_single_seeds
from repro.ic.rr import rr_sets
from repro.util import trial_rng


def oneshot_cost(
    graph: CSRGraph, trials: int, base_seed: int = 11
) -> tuple[float, float]:
    """Mean (vertex, edge) cost of a full candidate scan at β = 1."""
    v = e = 0
    for t in range(trials):
        rng = trial_rng(base_seed, 0, t)
        res = simulate_single_seeds(
            graph, np.arange(graph.n, dtype=np.int64), 1, rng
        )
        v += res.vertex_cost
        e += res.edge_cost
    return v / trials, e / trials


def snapshot_cost(
    graph: CSRGraph, trials: int, base_seed: int = 11
) -> tuple[float, float]:
    """Mean (vertex, edge) Estimate cost of a full candidate scan at τ = 1."""
    v = e = 0
    for t in range(trials):
        rng = trial_rng(base_seed, 1, t)
        est = SnapshotEstimator(graph, 1, rng)
        est.estimate_all(np.empty(0, dtype=np.int64))
        v += est.vertex_cost
        e += est.edge_cost
    return v / trials, e / trials


def ris_cost(
    graph: CSRGraph, trials: int, base_seed: int = 11
) -> tuple[float, float]:
    """Mean (vertex, edge) cost of generating one RR set."""
    rng = trial_rng(base_seed, 2)
    res = rr_sets(graph, trials, rng)
    return res.vertex_cost / trials, res.edge_cost / trials


def table8_rows(
    graph: CSRGraph,
    network: str,
    setting: str,
    trials: int,
    include_oneshot: bool = True,
    base_seed: int = 11,
) -> list[dict]:
    """Table 8 rows for one influence graph (paper omits Oneshot on ★)."""
    rows = []
    algs = [
        ("snapshot", snapshot_cost),
        ("ris", ris_cost),
    ]
    if include_oneshot:
        algs.insert(0, ("oneshot", oneshot_cost))
    for name, fn in algs:
        v, e = fn(graph, trials, base_seed)
        rows.append(
            {
                "network": network,
                "setting": setting,
                "alg": name,
                "vertex_cost": round(v, 1),
                "edge_cost": round(e, 1),
            }
        )
    return rows


def table9_rows(
    table8: pd.DataFrame, table6: pd.DataFrame, table7: pd.DataFrame
) -> pd.DataFrame:
    """Conditioned traversal cost per γ from Tables 6/7/8 (k = 1 ratios)."""
    t6 = table6[table6["k"] == 1][
        ["network", "setting", "median_number_ratio"]
    ].rename(columns={"median_number_ratio": "cr"})
    t7 = table7[table7["k"] == 1][
        ["network", "setting", "median_number_ratio"]
    ].rename(columns={"median_number_ratio": "cr"})
    rows = []
    for _, r in table8.iterrows():
        total = r["vertex_cost"] + r["edge_cost"]
        if r["alg"] == "snapshot":
            cr = 1.0
        else:
            src = t6 if r["alg"] == "oneshot" else t7
            sel = src[
                (src["network"] == r["network"])
                & (src["setting"] == r["setting"])
            ]
            cr = float(sel["cr"].iloc[0]) if len(sel) else np.nan
        rows.append(
            {
                "network": r["network"],
                "setting": r["setting"],
                "alg": r["alg"],
                "cost_per_gamma": total * cr,
            }
        )
    return pd.DataFrame(rows)
