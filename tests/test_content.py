"""Tests for the synthetic content process (repro.video.content)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.video.content import (
    SECONDS_PER_DAY,
    ContentParams,
    ContentTrace,
    diurnal_profile,
    generate,
    hash_normal,
    stream_count_trace,
)
from repro.workloads import ALL_WORKLOADS, get_workload


def simple_params(**over) -> ContentParams:
    kw = dict(
        dims=("a", "b"),
        base=(0.1, 0.2),
        diurnal_amp=(0.4, 0.2),
        diurnal_peaks=((12.0, 2.0, 1.0),),
        seg_len=2.0,
    )
    kw.update(over)
    return ContentParams(**kw)


class TestHashNormal:
    def test_deterministic(self):
        ids = np.arange(1000)
        a = hash_normal(42, ids)
        b = hash_normal(42, ids)
        np.testing.assert_array_equal(a, b)

    def test_key_changes_values(self):
        ids = np.arange(1000)
        assert not np.allclose(hash_normal(1, ids), hash_normal(2, ids))

    def test_slice_invariant(self):
        ids = np.arange(1000)
        full = hash_normal(7, ids)
        part = hash_normal(7, ids[300:400])
        np.testing.assert_array_equal(full[300:400], part)

    def test_approximately_standard_normal(self):
        x = hash_normal(3, np.arange(200_000))
        assert abs(x.mean()) < 0.01
        assert abs(x.std() - 1.0) < 0.01

    def test_no_extreme_correlation(self):
        x = hash_normal(5, np.arange(100_000))
        r = np.corrcoef(x[:-1], x[1:])[0, 1]
        assert abs(r) < 0.02


class TestDiurnalProfile:
    def test_peak_normalized(self):
        hours = np.linspace(0, 24, 2000)
        prof = diurnal_profile(hours, ((12.0, 2.0, 1.0),))
        assert prof.max() == pytest.approx(1.0, abs=1e-4)
        assert prof.min() >= 0.0

    def test_peak_location(self):
        hours = np.linspace(0, 24, 2401)
        prof = diurnal_profile(hours, ((8.0, 1.0, 1.0),))
        assert hours[prof.argmax()] == pytest.approx(8.0, abs=0.05)

    def test_circular_wraparound(self):
        hours = np.array([0.0, 23.9, 0.1])
        prof = diurnal_profile(hours, ((0.0, 1.0, 1.0),))
        assert prof[1] == pytest.approx(prof[2], abs=0.02)

    def test_multiple_peaks_superpose(self):
        hours = np.linspace(0, 24, 1000)
        p1 = diurnal_profile(hours, ((6.0, 1.0, 1.0),))
        p2 = diurnal_profile(hours, ((6.0, 1.0, 1.0), (18.0, 1.0, 1.0)))
        assert p2[hours > 15].max() > p1[hours > 15].max()


class TestGenerate:
    def test_shapes_and_bounds(self):
        tr = generate(simple_params(), seed=0, n_days=0.1)
        assert tr.difficulty.shape == (4320, 2)
        assert tr.difficulty.min() >= 0.0
        assert tr.difficulty.max() <= 1.0

    def test_deterministic(self):
        a = generate(simple_params(), seed=1, n_days=0.05)
        b = generate(simple_params(), seed=1, n_days=0.05)
        np.testing.assert_array_equal(a.difficulty, b.difficulty)

    def test_seed_matters(self):
        a = generate(simple_params(), seed=1, n_days=0.05)
        b = generate(simple_params(), seed=2, n_days=0.05)
        assert not np.allclose(a.difficulty, b.difficulty)

    def test_window_invariance(self):
        p = simple_params()
        full = generate(p, seed=5, n_days=2.0)
        w1 = generate(p, seed=5, n_days=1.0)
        w2 = generate(p, seed=5, n_days=1.0, start_day=1.0)
        joined = np.vstack([w1.difficulty, w2.difficulty])
        np.testing.assert_allclose(joined, full.difficulty, atol=1e-9)

    def test_gid0_snaps_to_grid(self):
        p = simple_params(seg_len=7.0)
        tr = generate(p, seed=0, n_days=0.5, start_day=1.0)
        assert tr.gid0 == round(SECONDS_PER_DAY / 7.0)

    def test_diurnal_signal_present(self):
        p = simple_params(noise_sigma=0.0, burst_rate_per_hour=0.0,
                          drift_sigma=1e-6)
        tr = generate(p, seed=0, n_days=1.0)
        hours = (np.arange(tr.n_segments) * 2.0 / 3600.0) % 24
        noon = tr.difficulty[(hours > 11) & (hours < 13), 0].mean()
        night = tr.difficulty[(hours > 2) & (hours < 4), 0].mean()
        assert noon > night + 0.2

    def test_bursts_raise_difficulty(self):
        quiet = generate(
            simple_params(burst_rate_per_hour=0.0), seed=3, n_days=0.25
        )
        bursty = generate(
            simple_params(burst_rate_per_hour=60.0), seed=3, n_days=0.25
        )
        assert bursty.difficulty[:, 0].mean() > quiet.difficulty[:, 0].mean()

    def test_drift_varies_across_days(self):
        p = simple_params(noise_sigma=0.0, burst_rate_per_hour=0.0,
                          drift_sigma=0.2, drift_rho=0.3)
        tr = generate(p, seed=11, n_days=6.0)
        per_day = tr.difficulty[:, 0].reshape(6, -1).mean(axis=1)
        assert per_day.std() > 0.01

    def test_param_validation(self):
        with pytest.raises(ValueError):
            ContentParams(
                dims=("a", "b"),
                base=(0.1,),
                diurnal_amp=(0.1, 0.1),
                diurnal_peaks=(),
            )


class TestContentTrace:
    def test_slice_consistency(self):
        tr = generate(simple_params(), seed=0, n_days=0.1)
        sub = tr.slice(100, 200)
        assert sub.n_segments == 100
        np.testing.assert_array_equal(
            sub.difficulty, tr.difficulty[100:200]
        )
        np.testing.assert_array_equal(
            sub.global_ids(), tr.global_ids()[100:200]
        )

    def test_take(self):
        tr = generate(simple_params(), seed=0, n_days=0.1)
        idx = np.array([5, 50, 500])
        sub = tr.take(idx)
        np.testing.assert_array_equal(sub.difficulty, tr.difficulty[idx])

    def test_times_and_duration(self):
        tr = generate(simple_params(), seed=0, n_days=0.25)
        t = tr.times_s()
        assert t[0] == 0.0
        assert t[1] - t[0] == tr.seg_len
        assert tr.duration_days == pytest.approx(0.25)

    def test_default_multiplier_is_one(self):
        tr = generate(simple_params(), seed=0, n_days=0.01)
        np.testing.assert_array_equal(
            tr.work_multiplier, np.ones(tr.n_segments)
        )


class TestStreamCount:
    def test_bounds_and_integrality(self):
        n = stream_count_trace(seed=0, n_segments=10000, seg_len=7.0)
        assert n.min() >= 1.0
        np.testing.assert_array_equal(n, np.round(n))

    def test_high_spikes_reach_62(self):
        n = stream_count_trace(
            seed=0, n_segments=5 * 12343, seg_len=7.0, spike="high"
        )
        assert n.max() >= 60.0

    def test_long_peak_sustained(self):
        n = stream_count_trace(
            seed=0, n_segments=2 * 12343, seg_len=7.0, spike="long"
        )
        # a >= 8h stretch at the long-peak height
        at_peak = n >= 44
        assert at_peak.sum() * 7.0 > 7.5 * 3600

    def test_no_spike_stays_moderate(self):
        n = stream_count_trace(seed=0, n_segments=12343, seg_len=7.0)
        assert n.max() <= 35

    def test_unknown_spike_rejected(self):
        with pytest.raises(ValueError):
            stream_count_trace(
                seed=0, n_segments=10, seg_len=7.0, spike="bogus"
            )

    def test_window_invariance(self):
        full = stream_count_trace(
            seed=4, n_segments=2 * 12343, seg_len=7.0, spike="high"
        )
        w1 = stream_count_trace(
            seed=4, n_segments=12343, seg_len=7.0, spike="high"
        )
        w2 = stream_count_trace(
            seed=4, n_segments=12343, seg_len=7.0, start_day=1.0,
            spike="high",
        )
        np.testing.assert_array_equal(np.concatenate([w1, w2]), full)


@pytest.mark.parametrize("name", ALL_WORKLOADS)
def test_workload_traces_deterministic(name):
    wl = get_workload(name)
    a = wl.content(seed=9, n_days=0.05)
    b = wl.content(seed=9, n_days=0.05)
    np.testing.assert_array_equal(a.difficulty, b.difficulty)
    np.testing.assert_array_equal(a.work_multiplier, b.work_multiplier)


@pytest.mark.parametrize("name", ALL_WORKLOADS)
def test_workload_trace_window_invariance(name):
    wl = get_workload(name)
    full = wl.content(seed=2, n_days=2.0)
    w1 = wl.content(seed=2, n_days=1.0)
    w2 = wl.content(seed=2, n_days=1.0, start_day=1.0)
    joined = np.vstack([w1.difficulty, w2.difficulty])
    n = len(joined)
    np.testing.assert_allclose(joined, full.difficulty[:n], atol=1e-8)
    np.testing.assert_allclose(
        np.concatenate([w1.work_multiplier, w2.work_multiplier]),
        full.work_multiplier[:n],
        atol=1e-8,
    )
