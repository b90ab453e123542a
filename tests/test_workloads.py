"""Tests for the workload models (knobs, cost, quality, task graphs)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.workloads import ALL_WORKLOADS, get_workload
from repro.workloads.base import soft_quality


@pytest.fixture(params=ALL_WORKLOADS, scope="module")
def wl(request):
    return get_workload(request.param)


class TestRegistry:
    def test_all_workloads_instantiable(self):
        for name in ALL_WORKLOADS:
            assert get_workload(name).name == name

    def test_unknown_rejected(self):
        with pytest.raises(KeyError):
            get_workload("nope")

    def test_mosei_spike_validation(self):
        from repro.workloads.mosei import MoseiWorkload

        with pytest.raises(ValueError):
            MoseiWorkload("weird")


class TestKnobDomains:
    """Knob domains must match the paper verbatim (Section 5.2/App. J)."""

    def test_covid_knobs(self):
        wl = get_workload("covid")
        knobs = {k.name: k.domain for k in wl.knobs}
        assert knobs["fps"] == (30, 15, 10, 5, 1)
        assert knobs["det_interval"] == (1, 5, 30, 60)
        assert knobs["tiles"] == (1, 4)

    def test_mot_knobs(self):
        wl = get_workload("mot")
        knobs = {k.name: k.domain for k in wl.knobs}
        assert knobs["frame_stride"] == (1, 5, 30, 60)
        assert knobs["tiles"] == (1, 4)
        assert knobs["history"] == (1, 2, 3, 5)
        assert knobs["model_size"] == ("small", "medium", "large")

    def test_mosei_knobs(self):
        wl = get_workload("mosei-high")
        knobs = {k.name: k.domain for k in wl.knobs}
        assert knobs["skip_sentences"] == (0, 1, 2, 3, 4, 5, 6)
        assert len(knobs["frame_frac"]) == 6
        assert knobs["model_size"] == ("small", "medium", "large")
        assert len(knobs["stream_frac"]) == 4

    def test_config_counts(self):
        assert len(get_workload("covid").all_configs()) == 5 * 4 * 2
        assert len(get_workload("mot").all_configs()) == 4 * 2 * 4 * 3
        assert len(get_workload("mosei-high").all_configs()) == 7 * 6 * 3 * 4


class TestCostModel:
    def test_work_positive(self, wl):
        for cfg in wl.all_configs():
            assert wl.work_per_vs(cfg) > 0

    def test_cheapest_and_best_are_extremes(self, wl):
        works = [wl.work_per_vs(c) for c in wl.all_configs()]
        assert wl.work_per_vs(wl.cheapest_config()) == min(works)
        assert wl.work_per_vs(wl.best_config()) >= np.median(works)

    def test_work_range_spans_machines(self, wl):
        """The most expensive config must exceed a 32-core machine and
        the cheapest must run on a fraction of a core (DESIGN.md §5)."""
        w_max = max(wl.work_per_vs(c) for c in wl.all_configs())
        w_min = min(wl.work_per_vs(c) for c in wl.all_configs())
        if wl.name.startswith("mosei"):
            w_max *= 62  # peak concurrent streams
            w_min *= 1
        assert w_max > 32
        assert w_min < 1

    def test_config_dict_roundtrip(self, wl):
        cfg = wl.all_configs()[0]
        d = wl.config_dict(cfg)
        assert tuple(d[k.name] for k in wl.knobs) == cfg

    def test_work_curve_scales_with_multiplier(self, wl):
        tr = wl.content(seed=0, n_days=0.02)
        cfg = wl.cheapest_config()
        wc = wl.work_curve(cfg, tr)
        np.testing.assert_allclose(
            wc, wl.work_per_vs(cfg) * wl.seg_len * tr.work_multiplier
        )


class TestQualityModel:
    def test_capability_bounds(self, wl):
        for cfg in wl.all_configs():
            cap = wl.capability(cfg)
            assert cap.shape == (len(wl.dims),)
            assert (cap >= 0).all() and (cap <= 1.001).all()

    def test_soft_quality_monotone_in_capability(self):
        d = np.array([[0.5, 0.5]])
        lo = soft_quality(np.array([0.3, 0.3]), d)
        hi = soft_quality(np.array([0.9, 0.9]), d)
        assert hi > lo

    def test_soft_quality_bounds(self):
        d = np.random.default_rng(0).random((100, 3))
        q = soft_quality(np.array([0.5, 0.5, 0.5]), d)
        assert (q > 0).all() and (q <= 1).all()

    def test_accuracy_in_unit_interval(self, wl):
        tr = wl.content(seed=0, n_days=0.02)
        for cfg in (wl.cheapest_config(), wl.best_config()):
            acc = wl.accuracy_curve(cfg, tr)
            assert (acc >= 0).all() and (acc <= 1).all()

    def test_best_config_dominates_cheapest(self, wl):
        tr = wl.content(seed=0, n_days=0.1)
        q_best = wl.accuracy_curve(wl.best_config(), tr).mean()
        q_cheap = wl.accuracy_curve(wl.cheapest_config(), tr).mean()
        assert q_best > q_cheap

    def test_quality_includes_mass(self, wl):
        tr = wl.content(seed=0, n_days=0.02)
        cfg = wl.best_config()
        np.testing.assert_allclose(
            wl.quality_curve(cfg, tr),
            wl.mass(tr.difficulty, tr.work_multiplier)
            * wl.accuracy_curve(cfg, tr),
        )

    def test_observed_quality_noise_determinism(self, wl):
        tr = wl.content(seed=0, n_days=0.02)
        cfg = wl.best_config()
        a = wl.observed_quality_curve(cfg, tr, seed=1)
        b = wl.observed_quality_curve(cfg, tr, seed=1)
        np.testing.assert_array_equal(a, b)
        c = wl.observed_quality_curve(cfg, tr, seed=2)
        assert not np.allclose(a, c)

    def test_observed_quality_slice_invariant(self, wl):
        """Noise must not depend on how the trace is sliced (Spark
        partitioning invariance)."""
        tr = wl.content(seed=0, n_days=0.02)
        cfg = wl.cheapest_config()
        full = wl.observed_quality_curve(cfg, tr, seed=0)
        part = wl.observed_quality_curve(cfg, tr.slice(100, 200), seed=0)
        np.testing.assert_allclose(full[100:200], part)

    def test_noise_key_differs_per_config(self, wl):
        cfgs = wl.all_configs()
        keys = {wl.noise_key(c, 0) for c in cfgs}
        assert len(keys) == len(cfgs)


class TestMass:
    def test_mass_positive(self, wl):
        tr = wl.content(seed=0, n_days=0.02)
        m = wl.mass(tr.difficulty, tr.work_multiplier)
        assert (m > 0).all()

    def test_covid_mass_grows_with_crowding(self):
        wl = get_workload("covid")
        d = np.zeros((2, 3))
        d[1, 0] = 0.9
        m = wl.mass(d)
        assert m[1] > m[0]

    def test_mosei_mass_is_stream_count(self):
        wl = get_workload("mosei-high")
        d = np.zeros((3, 2))
        m = wl.mass(d, np.array([5.0, 20.0, 62.0]))
        np.testing.assert_array_equal(m, [5.0, 20.0, 62.0])


class TestTaskGraphs:
    def test_graph_valid_dag(self, wl):
        for cfg in [wl.cheapest_config(), wl.best_config()]:
            g = wl.task_graph(cfg)
            assert len(g.nodes) >= 3
            for a, b in g.edges:
                assert a < b

    def test_first_node_pinned(self, wl):
        g = wl.task_graph(wl.best_config())
        assert g.nodes[0].pin_onprem

    def test_graph_work_tracks_cost_model(self, wl):
        """Total on-premise seconds of the graph ~= work_per_vs * seg_len."""
        for cfg in [wl.cheapest_config(), wl.best_config()]:
            g = wl.task_graph(cfg)
            expected = wl.work_per_vs(cfg) * wl.seg_len
            assert g.total_onprem_s == pytest.approx(expected, rel=0.35)

    def test_widths_positive(self, wl):
        for cfg in wl.all_configs()[:20]:
            g = wl.task_graph(cfg)
            for nd in g.nodes:
                assert nd.width >= 1
                assert nd.onprem_s >= 0
                assert nd.cloud_s >= 0

    def test_invalid_edges_rejected(self):
        from repro.workloads.base import TaskGraph, TaskNode

        n = TaskNode("x", 1.0, 1.0, 0.0, 0.0)
        with pytest.raises(ValueError):
            TaskGraph((n, n), ((1, 0),))
        with pytest.raises(ValueError):
            TaskGraph((n,), ((0, 3),))
