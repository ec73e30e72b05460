"""The paper's three algorithmic approaches in the greedy framework.

* :mod:`repro.algorithms.base` — Algorithm 3.1 (simple greedy framework)
  with shuffled-order last-max tie-breaking and cost accounting.
* :mod:`repro.algorithms.oneshot` — Algorithm 3.2.
* :mod:`repro.algorithms.snapshot` — Algorithm 3.3.
* :mod:`repro.algorithms.ris` — Algorithm 3.4.
"""
from repro.algorithms.base import GreedyResult, run_greedy
from repro.algorithms.oneshot import OneshotEstimator
from repro.algorithms.ris import RISEstimator
from repro.algorithms.snapshot import SnapshotEstimator

ALGORITHMS = ("oneshot", "snapshot", "ris")


def make_estimator(alg: str, graph, sample_number: int, rng):
    """Factory: build the estimator for ``alg`` with its sample number."""
    if alg == "oneshot":
        return OneshotEstimator(graph, sample_number, rng)
    if alg == "snapshot":
        return SnapshotEstimator(graph, sample_number, rng)
    if alg == "ris":
        return RISEstimator(graph, sample_number, rng)
    raise ValueError(f"unknown algorithm {alg!r}; one of {ALGORITHMS}")


__all__ = [
    "GreedyResult",
    "run_greedy",
    "OneshotEstimator",
    "SnapshotEstimator",
    "RISEstimator",
    "ALGORITHMS",
    "make_estimator",
]
