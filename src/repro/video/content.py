"""Synthetic video-stream content process.

The paper ingests real camera streams whose *content difficulty* (object
occlusions, small objects, motion, lighting) varies on three time scales:

* a diurnal pattern (rush hours / shopping hours vs. night),
* short stochastic bursts ("a large group of pedestrians randomly walking
  past a camera", Section 5.6) lasting tens of seconds — the paper reports
  content-category changes every 24-43 s on average,
* slow day-to-day drift ("traffic in the city worsens", Appendix E.2),
  which is what makes 8-day-ahead forecasts worse than 2-day-ahead ones
  (Table 5).

We reproduce exactly this structure as a latent per-segment *difficulty
vector* d(s) in [0, 1]^D.  Every downstream component (simulated CV
operators, quality model, content categories, forecaster) consumes only
d(s), so the reproduction exercises the same code paths as a real
deployment would.  Generation is vectorized numpy and deterministic in the
seed, so Spark workers can regenerate a trace from (params, seed) instead
of shipping data.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

SECONDS_PER_DAY = 86_400.0


@dataclass(frozen=True)
class ContentParams:
    """Parameters of the latent difficulty process for one workload.

    Attributes
    ----------
    dims:
        Names of the difficulty dimensions (e.g. crowding / small-object
        fraction / motion).
    base:
        Per-dimension base difficulty in [0, 1].
    diurnal_amp:
        Per-dimension amplitude of the shared diurnal profile.
    diurnal_peaks:
        Gaussian bumps of the diurnal profile as (hour, width_hours,
        height) triples; the profile is normalized to peak at 1.
    burst_rate_per_hour:
        Poisson arrival rate of content bursts.
    burst_scale:
        Per-dimension multiplier applied to the burst signal.
    burst_mag:
        (lo, hi) uniform range of a burst's magnitude.
    burst_dur_s:
        (lo, hi) uniform range of a burst's duration in seconds.
    drift_rho / drift_sigma:
        AR(1) day-level drift: level[d] = rho*level[d-1] + sigma*eps.
    drift_scale:
        Per-dimension multiplier applied to the day-level drift.
    noise_sigma:
        Std of smoothed white noise added per segment.
    seg_len:
        Segment length in seconds (granularity of knob switching).
    """

    dims: tuple[str, ...]
    base: tuple[float, ...]
    diurnal_amp: tuple[float, ...]
    diurnal_peaks: tuple[tuple[float, float, float], ...]
    burst_rate_per_hour: float = 40.0
    burst_scale: tuple[float, ...] = ()
    burst_mag: tuple[float, float] = (0.15, 0.45)
    burst_dur_s: tuple[float, float] = (15.0, 70.0)
    drift_rho: float = 0.75
    drift_sigma: float = 0.05
    drift_scale: tuple[float, ...] = ()
    noise_sigma: float = 0.02
    seg_len: float = 2.0

    def __post_init__(self) -> None:
        d = len(self.dims)
        for name in ("base", "diurnal_amp"):
            if len(getattr(self, name)) != d:
                raise ValueError(f"{name} must have {d} entries")
        if not self.burst_scale:
            object.__setattr__(self, "burst_scale", (1.0,) * d)
        if not self.drift_scale:
            object.__setattr__(self, "drift_scale", (1.0,) * d)


def hash_normal(key: int, ids: np.ndarray) -> np.ndarray:
    """Standard-normal noise as a pure function of (key, segment id).

    Counter-based (splitmix64 + Box-Muller) so the noise for a segment is
    identical no matter how the trace is sliced or partitioned across
    Spark workers — a stateful RNG stream would make observed qualities
    depend on batch boundaries.
    """
    def mix(x: np.ndarray) -> np.ndarray:
        z = x.copy()
        z ^= z >> np.uint64(30)
        z *= np.uint64(0xBF58476D1CE4E5B9)
        z ^= z >> np.uint64(27)
        z *= np.uint64(0x94D049BB133111EB)
        z ^= z >> np.uint64(31)
        return z

    with np.errstate(over="ignore"):
        base = np.asarray(ids, dtype=np.uint64) + np.uint64(
            (key * 0x9E3779B97F4A7C15) & 0xFFFFFFFFFFFFFFFF
        )
        h1 = mix(base)
        h2 = mix(base + np.uint64(0x632BE59BD9B4E019))
    u1 = (h1 >> np.uint64(11)).astype(np.float64) * 2.0**-53
    u2 = (h2 >> np.uint64(11)).astype(np.float64) * 2.0**-53
    u1 = np.clip(u1, 1e-12, 1.0)
    return np.sqrt(-2.0 * np.log(u1)) * np.cos(2.0 * np.pi * u2)


@dataclass(frozen=True)
class ContentTrace:
    """A realized difficulty trace: one row per video segment.

    ``gid0`` is the absolute index of the first segment (segments since
    day 0 of the stream), used to derive slice-invariant noise.
    """

    params: ContentParams
    seed: int
    start_day: float
    difficulty: np.ndarray  # (n_segments, D) float64 in [0, 1]
    work_multiplier: np.ndarray = field(default=None)  # (n_segments,), >= 0
    gid0: int = 0

    def __post_init__(self) -> None:
        if self.work_multiplier is None:
            object.__setattr__(
                self, "work_multiplier", np.ones(len(self.difficulty))
            )

    def global_ids(self) -> np.ndarray:
        return self.gid0 + np.arange(self.n_segments)

    @property
    def n_segments(self) -> int:
        return len(self.difficulty)

    @property
    def seg_len(self) -> float:
        return self.params.seg_len

    @property
    def duration_days(self) -> float:
        return self.n_segments * self.seg_len / SECONDS_PER_DAY

    def times_s(self) -> np.ndarray:
        """Arrival time (seconds since trace origin) of each segment."""
        return (
            self.start_day * SECONDS_PER_DAY
            + np.arange(self.n_segments) * self.seg_len
        )

    def slice(self, start: int, stop: int) -> "ContentTrace":
        """Sub-trace covering segments [start, stop)."""
        return ContentTrace(
            params=self.params,
            seed=self.seed,
            start_day=self.start_day
            + start * self.seg_len / SECONDS_PER_DAY,
            difficulty=self.difficulty[start:stop],
            work_multiplier=self.work_multiplier[start:stop],
            gid0=self.gid0 + start,
        )

    def take(self, idx: np.ndarray) -> "ContentTrace":
        """Sub-trace of arbitrary segment positions (keeps global ids via
        gid0 only when contiguous; callers needing noise for scattered
        samples should use ``global_ids()[idx]`` directly)."""
        idx = np.asarray(idx)
        return ContentTrace(
            params=self.params,
            seed=self.seed,
            start_day=self.start_day,
            difficulty=self.difficulty[idx],
            work_multiplier=self.work_multiplier[idx],
            gid0=self.gid0,
        )


def _raw_diurnal(hours: np.ndarray, peaks) -> np.ndarray:
    prof = np.zeros_like(hours, dtype=float)
    for hour, width, height in peaks:
        # circular distance on the 24h clock
        delta = np.abs(hours - hour)
        delta = np.minimum(delta, 24.0 - delta)
        prof += height * np.exp(-0.5 * (delta / width) ** 2)
    return prof


def diurnal_profile(hours: np.ndarray, peaks) -> np.ndarray:
    """Sum-of-Gaussians daily profile on a 24h circle, peak-normalized.

    Normalization uses the profile's maximum over a dense full-day grid
    (not the queried hours), so windows covering part of a day see the
    same values as the full trace.
    """
    prof = _raw_diurnal(np.asarray(hours, dtype=float), peaks)
    peak = _raw_diurnal(np.linspace(0.0, 24.0, 2881), peaks).max()
    return prof / peak if peak > 0 else prof


def generate(
    params: ContentParams,
    *,
    seed: int,
    n_days: float,
    start_day: float = 0.0,
) -> ContentTrace:
    """Generate a difficulty trace of ``n_days`` starting at ``start_day``.

    Two traces generated with the same seed but different (start_day,
    n_days) windows agree on overlapping days for the drift component;
    burst/noise realizations are seeded per absolute day so train/test
    splits of one long stream are consistent.
    """
    n = max(1, int(round(n_days * SECONDS_PER_DAY / params.seg_len)))
    d = len(params.dims)
    # Snap the window start to the global segment grid: segment k of the
    # stream always starts at k * seg_len, so windows with different
    # start days stay aligned (86400 need not be a multiple of seg_len).
    gid0 = int(round(start_day * SECONDS_PER_DAY / params.seg_len))
    t0 = gid0 * params.seg_len
    t = t0 + np.arange(n) * params.seg_len
    hours = (t / 3600.0) % 24.0
    day_idx = np.floor(t / SECONDS_PER_DAY).astype(int)

    prof = diurnal_profile(hours, params.diurnal_peaks)

    # Day-level AR(1) drift, simulated from absolute day 0 so that any
    # window of the same seed sees the same per-day levels.
    last_day = int(day_idx.max())
    rng_drift = np.random.default_rng((seed, 0xD21F7))
    levels = np.empty(last_day + 1)
    stat_sigma = params.drift_sigma / np.sqrt(1.0 - params.drift_rho**2)
    levels[0] = rng_drift.normal(0.0, stat_sigma)
    for i in range(1, last_day + 1):
        levels[i] = params.drift_rho * levels[i - 1] + rng_drift.normal(
            0.0, params.drift_sigma
        )
    drift = levels[day_idx]

    # Bursts: Poisson arrivals seeded *per absolute day*, so any window
    # of the same seed regenerates identical bursts — Spark partitions
    # covering different day ranges must agree with the full trace.
    burst_sig = np.zeros(n)
    t_end = t0 + n * params.seg_len
    # start one day early: a burst seeded on the previous day may spill
    # past midnight into this window
    day_lo = int(np.floor(t0 / SECONDS_PER_DAY)) - 1
    day_hi = int(np.ceil(t_end / SECONDS_PER_DAY + 1e-9))
    for day in range(day_lo, max(day_hi, day_lo + 1)):
        # +1_000_000 keeps the seed tuple non-negative for day -1
        rng_burst = np.random.default_rng((seed, 0xB0057, day + 1_000_000))
        n_bursts = rng_burst.poisson(params.burst_rate_per_hour * 24.0)
        if not n_bursts:
            continue
        starts = day * SECONDS_PER_DAY + rng_burst.uniform(
            0.0, SECONDS_PER_DAY, n_bursts
        )
        durs = rng_burst.uniform(*params.burst_dur_s, n_bursts)
        mags = rng_burst.uniform(*params.burst_mag, n_bursts)
        lo = np.clip(np.ceil((starts - t0) / params.seg_len), 0, n).astype(int)
        hi = np.clip(
            np.ceil((starts + durs - t0) / params.seg_len), 0, n
        ).astype(int)
        for a, b, m in zip(lo, hi, mags):
            if b > a:
                burst_sig[a:b] += m

    # Per-segment noise from the counter-based hash, smoothed over a
    # 5-segment window that extends past the window edges (the hash is
    # id-based, so the smoothed value is window-invariant too).
    ids_ext = gid0 - 2 + np.arange(n + 4)
    kernel = np.ones(5) / 5.0
    noise = np.column_stack(
        [
            np.convolve(
                params.noise_sigma * hash_normal((seed << 8) | j, ids_ext),
                kernel,
                mode="valid",
            )
            for j in range(d)
        ]
    )

    diff = np.empty((n, d))
    for j in range(d):
        diff[:, j] = (
            params.base[j]
            + params.diurnal_amp[j] * prof
            + params.burst_scale[j] * burst_sig
            + params.drift_scale[j] * drift
            + noise[:, j]
        )
    np.clip(diff, 0.0, 1.0, out=diff)
    return ContentTrace(
        params=params,
        seed=seed,
        start_day=start_day,
        difficulty=diff,
        gid0=gid0,
    )


def stream_count_trace(
    *,
    seed: int,
    n_segments: int,
    seg_len: float,
    start_day: float = 0.0,
    base_low: float = 6.0,
    base_high: float = 26.0,
    spike: str | None = None,
    spike_height: float = 62.0,
    spike_minutes: float = 6.0,
    spikes_per_day: float = 4.0,
    long_peak_hours: float = 9.0,
    long_peak_height: float = 46.0,
) -> np.ndarray:
    """Number of concurrently incoming streams over time (MOSEI workloads).

    Mimics the Twitch active-streamer diurnal curve, plus the paper's two
    synthetic spike patterns: ``spike='high'`` adds short peaks of 62
    concurrent streams (hard for cloud bursting: bandwidth-bound) and
    ``spike='long'`` adds one sustained multi-hour peak per two days (hard
    for buffering: the buffer fills early, Section 5.2).
    """
    gid0 = int(round(start_day * SECONDS_PER_DAY / seg_len))
    t = gid0 * seg_len + np.arange(n_segments) * seg_len
    hours = (t / 3600.0) % 24.0
    prof = diurnal_profile(hours, ((20.0, 4.5, 1.0), (14.0, 3.0, 0.55)))
    n_streams = base_low + (base_high - base_low) * prof

    n_days = n_segments * seg_len / SECONDS_PER_DAY
    if spike == "high":
        # per-absolute-day seeding so windows of the same seed agree
        day_lo = int(np.floor(start_day))
        day_hi = int(np.ceil(start_day + n_days + 1e-9))
        for day in range(day_lo, max(day_hi, day_lo + 1)):
            rng = np.random.default_rng((seed, 0x57E0A, day))
            count = rng.poisson(spikes_per_day)
            starts = day * SECONDS_PER_DAY + rng.uniform(
                0.0, SECONDS_PER_DAY, count
            )
            for s in starts:
                a = int(max(0, np.ceil((s - t[0]) / seg_len)))
                b = int(
                    min(
                        n_segments,
                        np.ceil((s + spike_minutes * 60.0 - t[0]) / seg_len),
                    )
                )
                if b > a:
                    n_streams[a:b] = spike_height
    elif spike == "long":
        # One long sustained peak per 2-day period, starting mid-morning.
        for day0 in np.arange(0.0, start_day + n_days, 2.0):
            s = (day0 + 10.0 / 24.0) * SECONDS_PER_DAY
            a = int(max(0, (s - t[0]) // seg_len))
            b = int(
                min(
                    n_segments,
                    (s + long_peak_hours * 3600.0 - t[0]) // seg_len,
                )
            )
            if b > a:
                n_streams[a:b] = np.maximum(
                    n_streams[a:b], long_peak_height
                )
    elif spike is not None:
        raise ValueError(f"unknown spike pattern: {spike!r}")
    n_streams += 0.6 * hash_normal(
        (seed << 8) | 0x5C, gid0 + np.arange(n_segments)
    )
    return np.clip(np.round(n_streams), 1.0, None)
