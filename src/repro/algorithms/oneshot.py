"""Algorithm 3.2 — naive Oneshot (simulation-based) estimator.

Build and Update do nothing; every Estimate runs β fresh Monte-Carlo
simulations of the diffusion from S+v and averages the activation counts.
Estimates across candidates use independent randomness, so neither
monotonicity nor submodularity of the estimator is guaranteed (§3.3.1) —
that independence is preserved here (one batch of β·|candidates| fresh
simulations per greedy iteration).

The sample size is 0: Oneshot stores no samples (§3.3.2).
"""
import numpy as np

from repro.graphs.csr import CSRGraph
from repro.ic.forward import simulate_single_seeds


class OneshotEstimator:
    def __init__(
        self, graph: CSRGraph, beta: int, rng: np.random.Generator
    ) -> None:
        if beta < 1:
            raise ValueError("beta must be >= 1")
        self.graph = graph
        self.beta = beta
        self.rng = rng
        self.vertex_cost = 0
        self.edge_cost = 0
        self.sample_size = 0  # Oneshot keeps nothing in memory

    def estimate_all(self, current_seeds: np.ndarray) -> np.ndarray:
        candidates = np.arange(self.graph.n, dtype=np.int64)
        res = simulate_single_seeds(
            self.graph, candidates, self.beta, self.rng,
            base_seeds=current_seeds,
        )
        self.vertex_cost += res.vertex_cost
        self.edge_cost += res.edge_cost
        return res.activated / self.beta

    def update(self, chosen: int) -> None:  # noqa: ARG002 — per Alg 3.2
        return None
