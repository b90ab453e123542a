"""Tests for the knob-planner LP solver (repro.core.mckp).

The greedy dominance method is exact for the LP relaxation of the
multiple-choice knapsack; we verify optimality via KKT conditions and
brute force on small instances.
"""
from __future__ import annotations

import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.mckp import lp_frontier, solve_knob_plan


class TestLpFrontier:
    def test_sorted_by_cost(self):
        cost = np.array([3.0, 1.0, 2.0])
        qual = np.array([0.9, 0.1, 0.5])
        f = lp_frontier(cost, qual)
        assert [cost[i] for i in f] == sorted(cost[i] for i in f)

    def test_removes_dominated(self):
        cost = np.array([1.0, 2.0, 3.0])
        qual = np.array([0.5, 0.4, 0.9])  # item 1 dominated by item 0
        f = lp_frontier(cost, qual)
        assert 1 not in f

    def test_removes_lp_dominated(self):
        # item 1 lies below the segment (0, 2) -> LP-dominated
        cost = np.array([0.0, 1.0, 2.0])
        qual = np.array([0.0, 0.1, 1.0])
        f = lp_frontier(cost, qual)
        assert f == [0, 2]

    def test_keeps_concave_chain(self):
        cost = np.array([0.0, 1.0, 2.0])
        qual = np.array([0.0, 0.8, 1.0])
        assert lp_frontier(cost, qual) == [0, 1, 2]

    def test_single_item(self):
        assert lp_frontier(np.array([2.0]), np.array([0.5])) == [0]

    def test_equal_costs_keep_best(self):
        cost = np.array([1.0, 1.0, 2.0])
        qual = np.array([0.3, 0.7, 0.9])
        f = lp_frontier(cost, qual)
        assert 0 not in f and 1 in f

    def test_ratios_strictly_decreasing(self):
        rng = np.random.default_rng(0)
        cost = rng.random(20) * 10
        qual = rng.random(20)
        f = lp_frontier(cost, qual)
        ratios = [
            (qual[b] - qual[a]) / (cost[b] - cost[a])
            for a, b in zip(f[:-1], f[1:])
        ]
        assert all(r1 > r2 for r1, r2 in zip(ratios, ratios[1:]))


def brute_force_lp(qual, cost, ratios, budget, grid=60):
    """Dense search over per-class mixtures of two frontier items."""
    n_k, n_c = qual.shape
    best = -np.inf
    fronts = [lp_frontier(cost, qual[:, c]) for c in range(n_c)]
    # enumerate, per class, all (item, item, fraction) mixtures on a grid
    choices = []
    for c in range(n_c):
        opts = []
        f = fronts[c]
        for a in f:
            opts.append((a, a, 1.0))
        for a, b in itertools.combinations(f, 2):
            for t in np.linspace(0, 1, grid // 10):
                opts.append((a, b, t))
        choices.append(opts)
    for combo in itertools.product(*choices):
        q = w = 0.0
        for c, (a, b, t) in enumerate(combo):
            q += ratios[c] * (t * qual[a, c] + (1 - t) * qual[b, c])
            w += ratios[c] * (t * cost[a] + (1 - t) * cost[b])
        if w <= budget + 1e-9:
            best = max(best, q)
    return best


class TestSolveKnobPlan:
    def test_unconstrained_picks_best(self):
        qual = np.array([[0.2, 0.1], [0.9, 0.8]])
        cost = np.array([1.0, 5.0])
        sol = solve_knob_plan(qual, cost, np.array([0.5, 0.5]), budget=100.0)
        np.testing.assert_allclose(sol.alpha[1], [1.0, 1.0])

    def test_tight_budget_picks_cheapest(self):
        qual = np.array([[0.2, 0.1], [0.9, 0.8]])
        cost = np.array([1.0, 5.0])
        sol = solve_knob_plan(qual, cost, np.array([0.5, 0.5]), budget=1.0)
        np.testing.assert_allclose(sol.alpha[0], [1.0, 1.0])

    def test_infeasible_flag(self):
        qual = np.array([[0.5]])
        cost = np.array([2.0])
        sol = solve_knob_plan(qual, cost, np.array([1.0]), budget=1.0)
        assert not sol.feasible

    def test_columns_normalized(self):
        rng = np.random.default_rng(0)
        qual = rng.random((5, 4))
        cost = np.sort(rng.random(5) * 10)
        r = rng.random(4)
        sol = solve_knob_plan(qual, cost, r, budget=3.0)
        np.testing.assert_allclose(sol.alpha.sum(axis=0), 1.0)
        assert (sol.alpha >= -1e-12).all()

    def test_budget_respected(self):
        rng = np.random.default_rng(1)
        for trial in range(20):
            qual = rng.random((6, 3))
            cost = np.sort(rng.random(6) * 10)
            r = rng.random(3)
            r /= r.sum()
            budget = float(rng.random() * 8 + cost.min())
            sol = solve_knob_plan(qual, cost, r, budget)
            spent = float((sol.alpha * r[None, :] * cost[:, None]).sum())
            assert spent <= budget + 1e-6

    def test_at_most_one_fractional_class(self):
        rng = np.random.default_rng(2)
        qual = rng.random((5, 4))
        cost = np.sort(rng.random(5) * 5)
        r = np.full(4, 0.25)
        sol = solve_knob_plan(qual, cost, r, budget=2.0)
        frac_classes = sum(
            1
            for c in range(4)
            if ((sol.alpha[:, c] > 1e-9) & (sol.alpha[:, c] < 1 - 1e-9)).any()
        )
        assert frac_classes <= 1

    def test_kkt_optimality(self):
        """At optimum with price lam, each class's chosen mixture must
        maximize r_c*(q - lam*w) over items."""
        rng = np.random.default_rng(3)
        for trial in range(30):
            n_k, n_c = 6, 3
            qual = rng.random((n_k, n_c))
            cost = np.sort(rng.random(n_k) * 10)
            r = rng.random(n_c) + 0.1
            budget = float(
                (r * cost.min()).sum() + rng.random() * (r * cost.max()).sum()
            )
            sol = solve_knob_plan(qual, cost, r, budget)
            lam = sol.lam
            for c in range(n_c):
                scores = qual[:, c] - lam * cost
                best = scores.max()
                chosen = np.flatnonzero(sol.alpha[:, c] > 1e-9)
                for k in chosen:
                    assert scores[k] >= best - 1e-6

    def test_matches_brute_force(self):
        rng = np.random.default_rng(4)
        for trial in range(5):
            qual = rng.random((4, 2))
            cost = np.sort(rng.random(4) * 4)
            r = np.array([0.6, 0.4])
            budget = float(cost.min() + rng.random() * 2)
            sol = solve_knob_plan(qual, cost, r, budget)
            bf = brute_force_lp(qual, cost, r, budget)
            assert sol.quality >= bf - 1e-3

    def test_quality_monotone_in_budget(self):
        rng = np.random.default_rng(5)
        qual = rng.random((6, 3))
        cost = np.sort(rng.random(6) * 10)
        r = np.full(3, 1 / 3)
        quals = [
            solve_knob_plan(qual, cost, r, b).quality
            for b in np.linspace(cost.min(), cost.max() * 2, 10)
        ]
        assert all(a <= b + 1e-9 for a, b in zip(quals, quals[1:]))

    def test_zero_ratio_class_ignored(self):
        qual = np.array([[0.1, 0.9], [0.9, 0.1]])
        cost = np.array([1.0, 10.0])
        sol = solve_knob_plan(qual, cost, np.array([1.0, 0.0]), budget=20.0)
        # class 0 upgraded; class 1 (zero mass) stays at its cheapest
        assert sol.alpha[1, 0] == pytest.approx(1.0)
        assert sol.alpha[0, 1] == pytest.approx(1.0)

    def test_shape_validation(self):
        with pytest.raises(ValueError):
            solve_knob_plan(np.ones((2, 2)), np.ones(3), np.ones(2), 1.0)
        with pytest.raises(ValueError):
            solve_knob_plan(np.ones((2, 2)), np.ones(2), np.ones(3), 1.0)

    @settings(max_examples=30, deadline=None)
    @given(st.integers(min_value=0, max_value=10_000))
    def test_kkt_property(self, seed):
        rng = np.random.default_rng(seed)
        n_k = int(rng.integers(1, 8))
        n_c = int(rng.integers(1, 5))
        qual = rng.random((n_k, n_c))
        cost = np.sort(rng.random(n_k) * 10) + 0.01
        r = rng.random(n_c) + 0.01
        budget = float((r * cost.min()).sum() * (1 + rng.random() * 3))
        sol = solve_knob_plan(qual, cost, r, budget)
        spent = float((sol.alpha * r[None, :] * cost[:, None]).sum())
        assert spent <= budget + 1e-6
        np.testing.assert_allclose(sol.alpha.sum(axis=0), 1.0, atol=1e-9)
