"""Tests for the offline fit artifact, the knob planner, and the knob
switcher (Sections 3 and 4)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.categories import Categories
from repro.core.placement import PlacementProfile, pareto_placements
from repro.core.planner import compute_budget_per_vs, forecast_ratios, make_plan
from repro.core.switcher import KnobSwitcher
from repro.sim.cluster import make_cluster


class TestFitted:
    def test_configs_sorted_by_work(self, covid, covid_fit):
        works = [covid.work_per_vs(c) for c in covid_fit.configs]
        assert works == sorted(works)
        np.testing.assert_allclose(covid_fit.work, works)

    def test_timings_recorded(self, covid_fit):
        assert set(covid_fit.timings) == {
            "filter_knob_configs",
            "filter_task_placements",
            "compute_content_categories",
            "create_forecast_training_data",
            "train_forecast_model",
        }
        assert all(v >= 0 for v in covid_fit.timings.values())

    def test_default_category_counts(self, covid, mosei_high):
        from repro.core.fit import default_n_categories

        assert default_n_categories(covid) == 3
        assert default_n_categories(mosei_high) == 5

    def test_quality_rank_valid_permutation(self, covid_fit):
        assert sorted(covid_fit.quality_rank) == list(
            range(len(covid_fit.configs))
        )

    def test_label_config_is_discriminator(self, covid_fit):
        spreads = covid_fit.categories.centers.std(axis=0)
        assert spreads[covid_fit.k_label_idx] >= 0.5 * spreads.max()

    def test_train_hists_are_distributions(self, covid_fit):
        np.testing.assert_allclose(
            covid_fit.train_hists.sum(axis=1), 1.0, atol=1e-9
        )

    def test_k_minus_is_cheapest(self, covid, covid_fit):
        assert covid_fit.configs[covid_fit.k_minus_idx] == min(
            covid_fit.configs, key=covid.work_per_vs
        )


class TestPlanner:
    def test_budget_conversion(self):
        cl = make_cluster(8)
        b0 = compute_budget_per_vs(
            cl, interval_s=3600.0, cloud_budget_usd=0.0, utilization=1.0
        )
        assert b0 == pytest.approx(8.0)
        b1 = compute_budget_per_vs(
            cl, interval_s=3600.0, cloud_budget_usd=1.0, utilization=1.0
        )
        assert b1 > 8.0
        extra = (b1 - 8.0) * 3600.0 * cl.cloud_usd_per_core_s
        assert extra == pytest.approx(1.0)

    def test_default_budget_reserves_drain_slack(self):
        cl = make_cluster(8)
        b = compute_budget_per_vs(cl, interval_s=3600.0, cloud_budget_usd=0.0)
        assert b < cl.n_cores

    def test_forecast_ratios_sum_to_one(self, covid_fit):
        r = forecast_ratios(covid_fit, covid_fit.train_hists)
        assert r.sum() == pytest.approx(1.0)
        assert (r >= 0).all()

    def test_fallback_without_forecaster(self, covid_fit):
        import dataclasses

        nofc = dataclasses.replace(covid_fit, forecaster=None)
        hists = covid_fit.train_hists[:10]
        r = forecast_ratios(nofc, hists)
        np.testing.assert_allclose(r, hists.mean(axis=0) / hists.mean(axis=0).sum())

    def test_plan_budget_and_shape(self, covid_fit):
        cl = make_cluster(8)
        plan = make_plan(
            covid_fit,
            covid_fit.train_hists,
            cl,
            interval_s=86400.0,
            cloud_budget_usd=0.5,
        )
        assert plan.alpha.shape == (
            len(covid_fit.configs),
            covid_fit.categories.n,
        )
        np.testing.assert_allclose(plan.alpha.sum(axis=0), 1.0)
        assert plan.lp.cost <= plan.budget_per_vs + 1e-6

    def test_bigger_machine_gets_better_plan(self, covid_fit):
        q = []
        for v in (4, 60):
            plan = make_plan(
                covid_fit,
                covid_fit.train_hists,
                make_cluster(v),
                interval_s=86400.0,
                cloud_budget_usd=0.0,
            )
            q.append(plan.lp.quality)
        assert q[1] >= q[0]

    def test_ratio_override(self, covid_fit):
        r = np.zeros(covid_fit.categories.n)
        r[-1] = 1.0
        plan = make_plan(
            covid_fit,
            covid_fit.train_hists,
            make_cluster(8),
            interval_s=86400.0,
            cloud_budget_usd=0.0,
            ratios=r,
        )
        np.testing.assert_array_equal(plan.ratios, r)


def make_switcher(n_k=3, n_c=2):
    centers = np.array([[0.1 * (k + 1) for k in range(n_k)],
                        [0.3 * (k + 1) for k in range(n_k)]])[:n_c]
    cats = Categories(centers=np.array(centers), configs=tuple(range(n_k)))
    placements = [
        [PlacementProfile((False,), runtime_s=1.0 * (k + 1), cloud_core_s=0.0,
                          cloud_usd=0.0, up_bytes=0.0),
         PlacementProfile((True,), runtime_s=0.5 * (k + 1), cloud_core_s=1.0,
                          cloud_usd=0.01, up_bytes=0.0)]
        for k in range(n_k)
    ]
    rank = list(range(n_k))[::-1]  # higher index = higher quality
    return KnobSwitcher(cats, rank, placements)


class TestSwitcher:
    def test_set_plan_resets_counts(self):
        sw = make_switcher()
        sw.counts[0, 0] = 5
        sw.set_plan(np.full((3, 2), 1 / 3))
        assert sw.counts.sum() == 0

    def test_set_plan_shape_validated(self):
        sw = make_switcher()
        with pytest.raises(ValueError):
            sw.set_plan(np.ones((2, 2)))

    def test_pick_config_follows_plan_frequencies(self):
        sw = make_switcher()
        alpha = np.array([[0.5, 0.0], [0.25, 0.0], [0.25, 1.0]])
        sw.set_plan(alpha)
        picks = []
        for _ in range(200):
            k, _ = sw.choose(0, lambda k, p: True)
            picks.append(k)
        freq = np.bincount(picks, minlength=3) / 200
        np.testing.assert_allclose(freq, alpha[:, 0], atol=0.02)

    def test_classify_eq5(self):
        sw = make_switcher()
        sw.k_cur = 1
        # centers column 1: [0.2, 0.6] -> quality 0.55 is closer to 0.6
        assert sw.classify(0.55) == 1
        assert sw.classify(0.25) == 0

    def test_fallback_on_infeasible(self):
        sw = make_switcher()
        sw.set_plan(np.array([[0.0, 0], [0.0, 0], [1.0, 1]]))
        # config 2 infeasible entirely -> fall back to config 1
        k, p = sw.choose(0, lambda k, p: k != 2)
        assert k == 1

    def test_cheapest_placement_preferred(self):
        sw = make_switcher()
        sw.set_plan(np.array([[1.0, 1], [0, 0], [0, 0]]))
        k, p = sw.choose(0, lambda k, p: True)
        assert p.cloud_usd == 0.0  # on-prem placement scanned first

    def test_cloud_placement_when_onprem_infeasible(self):
        sw = make_switcher()
        sw.set_plan(np.array([[1.0, 1], [0, 0], [0, 0]]))
        k, p = sw.choose(0, lambda k, p: p.cloud_usd > 0)
        assert k == 0 and p.cloud_usd > 0

    def test_total_infeasible_forces_last_rank(self):
        sw = make_switcher()
        k, p = sw.choose(0, lambda k, p: False)
        assert k == sw.quality_rank[-1]

    def test_fallback_order_starts_at_desired(self):
        sw = make_switcher()
        order = sw.fallback_order(1)
        assert order[0] == 1
        # only less-qualitative configs follow
        assert order == [1, 0]
