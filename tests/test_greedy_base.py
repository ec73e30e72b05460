"""Greedy framework: tie-breaking and seed selection mechanics."""
import numpy as np
import pytest

from repro.algorithms.base import GreedyResult, argmax_last, run_greedy


class StubEstimator:
    """Deterministic marginal values; counts calls."""

    def __init__(self, rounds):
        self.rounds = [np.asarray(r, dtype=np.float64) for r in rounds]
        self.calls = 0
        self.updates = []
        self.vertex_cost = 0
        self.edge_cost = 0
        self.sample_size = 0

    def estimate_all(self, current_seeds):
        vals = self.rounds[min(self.calls, len(self.rounds) - 1)]
        self.calls += 1
        return vals

    def update(self, chosen):
        self.updates.append(chosen)


class TestArgmaxLast:
    def test_unique_max(self):
        order = np.array([2, 0, 1])
        assert argmax_last(np.array([1.0, 5.0, 3.0]), order) == 1

    def test_tie_takes_last_in_order(self):
        vals = np.array([5.0, 5.0, 1.0])
        assert argmax_last(vals, np.array([0, 1, 2])) == 1
        assert argmax_last(vals, np.array([1, 0, 2])) == 0
        assert argmax_last(vals, np.array([2, 0, 1])) == 1

    def test_all_equal(self):
        vals = np.zeros(4)
        order = np.array([3, 1, 0, 2])
        assert argmax_last(vals, order) == 2

    def test_tie_break_uniform_over_runs(self):
        # With shuffled order, a two-way tie must split ~50/50 (§4.1).
        vals = np.array([7.0, 7.0, 0.0])
        wins = {0: 0, 1: 0}
        for t in range(2000):
            order = np.random.default_rng(t).permutation(3)
            wins[argmax_last(vals, order)] += 1
        assert abs(wins[0] - wins[1]) < 250


class TestRunGreedy:
    def test_selects_max_each_round(self):
        est = StubEstimator([[1, 9, 3, 0], [5, 0, 2, 1]])
        res = run_greedy(est, 4, 2, np.random.default_rng(0))
        assert res.seeds == [1, 0]
        assert est.updates == [1, 0]

    def test_never_reselects(self):
        est = StubEstimator([[9, 1, 0]])  # same values every round
        res = run_greedy(est, 3, 3, np.random.default_rng(0))
        assert sorted(res.seeds) == [0, 1, 2]

    def test_k_capped_at_n(self):
        est = StubEstimator([[1.0, 2.0]])
        res = run_greedy(est, 2, 10, np.random.default_rng(0))
        assert len(res.seeds) == 2

    def test_costs_propagated(self):
        est = StubEstimator([[1.0, 2.0]])
        est.vertex_cost, est.edge_cost, est.sample_size = 7, 8, 9
        res = run_greedy(est, 2, 1, np.random.default_rng(0))
        assert (res.vertex_cost, res.edge_cost, res.sample_size) == (7, 8, 9)

    def test_chosen_estimates_recorded(self):
        est = StubEstimator([[1.0, 4.0], [2.5, 0.0]])
        res = run_greedy(est, 2, 2, np.random.default_rng(0))
        assert res.chosen_estimates == [4.0, 2.5]
