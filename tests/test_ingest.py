"""Tests for the online ingestion simulator (Section 4 + Appendix M)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.sim.ingest import (
    SegmentQueue,
    build_placement_tables,
    multiplier_grid,
    prepare,
    run_skyscraper,
)


class TestSegmentQueue:
    def mk(self, n=100, seg_len=2.0, seg_bytes=100.0, buffer_bytes=500.0):
        return SegmentQueue(seg_len, np.full(n, seg_bytes), buffer_bytes)

    def test_realtime_processing_no_backlog(self):
        q = self.mk()
        for i in range(100):
            q.step(i, 1.0)  # faster than the 2 s arrival rate
        assert q.peak == 0.0
        assert not q.overflowed

    def test_lag_accumulates(self):
        q = self.mk(buffer_bytes=1e9)
        for i in range(100):
            q.step(i, 3.0)  # 1.5x slower than real time
        assert q.peak > 0.0
        # at 1.5x real time, ~1/3 of the stream is still unprocessed when
        # the last segment arrives -> peak ~ 34 segments of backlog
        assert q.peak == pytest.approx(34 * 100.0, rel=0.1)

    def test_overflow_detected(self):
        q = self.mk(buffer_bytes=300.0)  # 3 segments
        for i in range(100):
            q.step(i, 4.0)
        assert q.overflowed

    def test_would_overflow_predicts(self):
        q = self.mk(buffer_bytes=300.0)
        assert not q.would_overflow(0, 1.0)
        assert q.would_overflow(0, 1000.0)

    def test_headroom_tightens(self):
        q = self.mk(buffer_bytes=1000.0)
        rt = 14.0  # backlog after this ~ 6 segments = 600 bytes
        assert not q.would_overflow(0, rt, headroom=1.0)
        assert q.would_overflow(0, rt, headroom=0.3)

    def test_catch_up_drains(self):
        q = self.mk(n=200, buffer_bytes=1e9)
        for i in range(100):
            q.step(i, 3.0)
        peak_mid = q.peak
        for i in range(100, 200):
            q.step(i, 0.5)
        # backlog at the end is zero: ready caught up with arrivals
        assert q.ready <= 201 * 2.0 + 1e-9
        assert q.peak == peak_mid  # peak not exceeded while draining


class TestPlacementTables:
    def test_tables_shapes(self, covid, covid_fit, cluster8):
        tr = covid.content(seed=0, n_days=0.01)
        grid, idx = multiplier_grid(tr)
        tables = build_placement_tables(covid, covid_fit.configs, cluster8, grid)
        assert len(tables) == len(covid_fit.configs)
        for t in tables:
            assert t.runtime.shape == (len(t.placements), len(grid))
            assert (t.runtime > 0).all()
            assert (t.cloud_usd >= 0).all()
            # sorted by cloud cost at the smallest multiplier
            assert list(t.cloud_usd[:, 0]) == sorted(t.cloud_usd[:, 0])

    def test_enable_cloud_false_keeps_only_onprem(self, covid, covid_fit, cluster8):
        tr = covid.content(seed=0, n_days=0.01)
        grid, _ = multiplier_grid(tr)
        tables = build_placement_tables(
            covid, covid_fit.configs, cluster8, grid, enable_cloud=False
        )
        for t in tables:
            assert len(t.placements) == 1
            assert not any(t.placements[0])

    def test_multiplier_grid(self, mosei_high):
        tr = mosei_high.content(seed=0, n_days=0.1)
        grid, idx = multiplier_grid(tr)
        assert (grid >= 1).all()
        np.testing.assert_array_equal(
            grid[idx], np.clip(np.round(tr.work_multiplier), 1, None)
        )


class TestPrepare:
    def test_shapes(self, covid, covid_fit):
        tr = covid.content(seed=0, n_days=0.02)
        prep = prepare(covid, covid_fit.configs, tr, seed=0,
                       categories=covid_fit.categories)
        k, n = len(covid_fit.configs), tr.n_segments
        assert prep.qual_true.shape == (k, n)
        assert prep.qual_obs.shape == (k, n)
        assert prep.qual_best.shape == (n,)
        assert prep.gt_labels.shape == (n,)

    def test_best_quality_is_ceiling(self, covid, covid_fit):
        tr = covid.content(seed=0, n_days=0.02)
        prep = prepare(covid, covid_fit.configs, tr, seed=0)
        assert (prep.qual_true <= prep.qual_best[None, :] + 1e-9).all()


@pytest.fixture(scope="module")
def sky_run(covid, covid_fit, cluster4):
    test = covid.content(seed=0, n_days=0.25, start_day=2.0)
    return run_skyscraper(
        covid, covid_fit, cluster4, test,
        cloud_budget_usd_per_day=0.5, seed=0, plan_days=0.25,
    )


class TestRunSkyscraper:
    def test_no_overflow(self, sky_run):
        assert not sky_run.overflow

    def test_quality_bounds(self, sky_run):
        assert 0.0 < sky_run.quality_pct <= 100.0

    def test_costs_accounted(self, sky_run, cluster4):
        assert sky_run.onprem_usd == pytest.approx(
            cluster4.onprem_cost(sky_run.duration_days * 86400.0)
        )
        assert sky_run.total_usd == pytest.approx(
            sky_run.onprem_usd + sky_run.cloud_usd
        )
        assert sky_run.cloud_usd >= 0.0

    def test_cloud_budget_respected(self, sky_run):
        assert sky_run.cloud_usd <= 0.5 * sky_run.duration_days + 1e-6

    def test_accuracy_metrics_present(self, sky_run):
        assert 0.0 <= sky_run.switch_accuracy <= 1.0
        assert 0.0 <= sky_run.switch_accuracy_no_typeb <= 1.0

    def test_switches_happen(self, sky_run):
        assert sky_run.n_switches > 10

    def test_deterministic(self, covid, covid_fit, cluster4, sky_run):
        test = covid.content(seed=0, n_days=0.25, start_day=2.0)
        again = run_skyscraper(
            covid, covid_fit, cluster4, test,
            cloud_budget_usd_per_day=0.5, seed=0, plan_days=0.25,
        )
        assert again.quality_pct == pytest.approx(sky_run.quality_pct)
        assert again.cloud_usd == pytest.approx(sky_run.cloud_usd)

    def test_more_cores_better_quality(self, covid, covid_fit):
        from repro.sim.cluster import make_cluster

        test = covid.content(seed=0, n_days=0.25, start_day=2.0)
        qs = []
        for v in (4, 60):
            r = run_skyscraper(
                covid, covid_fit, make_cluster(v), test,
                cloud_budget_usd_per_day=0.0, seed=0, plan_days=0.25,
            )
            qs.append(r.quality_pct)
        assert qs[1] > qs[0]

    def test_no_cloud_ablation_spends_nothing(self, covid, covid_fit, cluster4):
        test = covid.content(seed=0, n_days=0.1, start_day=2.0)
        r = run_skyscraper(
            covid, covid_fit, cluster4, test,
            cloud_budget_usd_per_day=5.0, seed=0, plan_days=0.1,
            enable_cloud=False,
        )
        assert r.cloud_usd == 0.0

    def test_classify_ground_truth_perfect_accuracy(
        self, covid, covid_fit, cluster4
    ):
        test = covid.content(seed=0, n_days=0.1, start_day=2.0)
        r = run_skyscraper(
            covid, covid_fit, cluster4, test,
            cloud_budget_usd_per_day=0.0, seed=0, plan_days=0.1,
            classify_mode="ground_truth",
        )
        assert r.switch_accuracy == pytest.approx(1.0)

    def test_no_typeb_at_least_as_accurate(self, covid, covid_fit, cluster4):
        test = covid.content(seed=0, n_days=0.25, start_day=2.0)
        r = run_skyscraper(
            covid, covid_fit, cluster4, test,
            cloud_budget_usd_per_day=0.0, seed=0, plan_days=0.25,
        )
        # removing the timing mismatch (Type-B errors) must improve
        # classification accuracy (Section 5.6)
        assert r.switch_accuracy_no_typeb >= r.switch_accuracy - 0.02

    def test_mosei_run_works(self, mosei_high, mosei_fit):
        from repro.sim.cluster import make_cluster

        test = mosei_high.content(seed=0, n_days=0.2, start_day=2.0)
        r = run_skyscraper(
            mosei_high, mosei_fit, make_cluster(16), test,
            cloud_budget_usd_per_day=1.0, seed=0, plan_days=0.2,
        )
        assert 0 < r.quality_pct <= 100
        assert not r.overflow
