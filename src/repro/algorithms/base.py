"""Algorithm 3.1 — the simple greedy framework.

Estimators implement the paper's Build/Estimate/Update interface, with
Estimate vectorized over all candidates (``estimate_all``), which is
semantically identical to calling Estimate(S, v) for every v in line 4 of
Algorithm 3.1. Tie-breaking follows §4.1: the vertex order is shuffled once
per run and the *last* vertex attaining the maximum estimate wins (running
through vertices with a ``>=`` update).
"""
from dataclasses import dataclass, field
from typing import Protocol

import numpy as np


class Estimator(Protocol):
    """Build happens in ``__init__``; costs accumulate on the instance."""

    vertex_cost: int
    edge_cost: int
    sample_size: int

    def estimate_all(self, current_seeds: np.ndarray) -> np.ndarray:
        """Estimate (marginal) influence for every vertex given S_{ℓ-1}."""
        ...

    def update(self, chosen: int) -> None:
        ...


@dataclass
class GreedyResult:
    seeds: list[int]
    vertex_cost: int
    edge_cost: int
    sample_size: int
    chosen_estimates: list[float] = field(default_factory=list)


def argmax_last(values: np.ndarray, order: np.ndarray) -> int:
    """The last vertex in ``order`` attaining the maximum of ``values``."""
    in_order = values[order]
    j = len(in_order) - 1 - int(np.argmax(in_order[::-1]))
    return int(order[j])


def run_greedy(
    estimator: Estimator, n: int, k: int, rng: np.random.Generator
) -> GreedyResult:
    """Select k seeds greedily with randomized tie-breaking."""
    order = rng.permutation(n)
    seeds: list[int] = []
    estimates: list[float] = []
    for _ in range(min(k, n)):
        values = np.asarray(
            estimator.estimate_all(np.array(seeds, dtype=np.int64)),
            dtype=np.float64,
        ).copy()
        if seeds:
            # Already-selected vertices never win again (their marginal may
            # tie at 0 with unselected vertices otherwise).
            values[np.array(seeds, dtype=np.int64)] = -np.inf
        chosen = argmax_last(values, order)
        seeds.append(chosen)
        estimates.append(float(values[chosen]))
        estimator.update(chosen)
    return GreedyResult(
        seeds,
        estimator.vertex_cost,
        estimator.edge_cost,
        estimator.sample_size,
        estimates,
    )
