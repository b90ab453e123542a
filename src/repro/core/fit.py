"""Offline preparation phase (paper Section 3, Figure 2 left half).

``fit_skyscraper`` runs the full offline pipeline on historical data from
the ingested source and produces a :class:`Fitted` artifact that the
online phase consumes:

1. filter knob configurations (hill climbing on max-min sampled
   segments, Appendix A.1);
2. profile and Pareto-filter task placements on a reference cluster
   (Appendix A.2; placements are re-profiled per actual cluster at run
   time, as the runtime depends on the core count);
3. compute content categories: KMeans over quality vectors of a segment
   sample (Section 3.2) — the profiling runs as a Spark dataflow when a
   SparkSession is provided;
4. create forecast training data by classifying *all* training segments
   with the cheapest configuration (Appendix H) and aggregating
   histograms;
5. train the forecasting model (Appendix K architecture).

Wall-clock per step is recorded in ``Fitted.timings`` — this reproduces
Table 3 (offline-phase runtimes).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.core.categories import (
    Categories,
    fit_categories,
    quality_vectors_numpy,
    quality_vectors_spark,
    sample_segment_indices,
)
from repro.core.forecast import (
    ForecastSpec,
    build_training_pairs,
    histogram_series,
    histogram_series_spark,
    train_forecaster,
)
from repro.core.mlp import MLP
from repro.core.offline import filter_knob_configs
from repro.core.placement import pareto_placements
from repro.sim.cluster import make_cluster
from repro.video.content import ContentTrace
from repro.workloads.base import Config, Workload


@dataclass
class Fitted:
    """Everything the online phase needs, precomputed offline."""

    configs: list[Config]  # filtered set K, sorted by increasing work
    work: np.ndarray  # (K,) core-seconds per video-second
    categories: Categories  # cluster centers (C, K)
    forecaster: MLP | None
    spec: ForecastSpec
    quality_rank: list[int]  # config indices, most qualitative first
    mean_mult: float  # mean work multiplier in training data
    train_hists: np.ndarray  # (n_bins, C) training histogram series
    k_minus_idx: int  # index of the cheapest configuration in configs
    k_label_idx: int = 0  # discriminator config used for offline labeling
    timings: dict = field(default_factory=dict)

    @property
    def n_configs(self) -> int:
        return len(self.configs)


def default_n_categories(wl: Workload) -> int:
    """Appendix K.1: COVID and MOT use 3 categories, MOSEI uses 5."""
    return 5 if wl.name.startswith("mosei") else 3


def fit_skyscraper(
    wl: Workload,
    *,
    seed: int = 0,
    train_days: float | None = None,
    n_categories: int | None = None,
    sample_frac: float = 0.05,
    n_search: int = 4,
    plan_days: float = 2.0,
    in_days: float = 2.0,
    n_splits: int = 8,
    spark=None,
    train_forecast: bool = True,
    trace: ContentTrace | None = None,
) -> Fitted:
    """Run the offline phase on ``train_days`` of historical data."""
    timings: dict[str, float] = {}
    if train_days is None:
        train_days = wl.train_days
    if n_categories is None:
        n_categories = default_n_categories(wl)

    if trace is None:
        trace = wl.content(seed=seed, n_days=train_days, start_day=0.0)

    # 1. filter knob configurations -----------------------------------------
    t0 = time.perf_counter()
    configs = filter_knob_configs(
        wl, trace, n_search=n_search, seed=seed
    )
    work = np.array([wl.work_per_vs(c) for c in configs])
    timings["filter_knob_configs"] = time.perf_counter() - t0

    # 2. filter task placements (reference cluster; re-done per cluster
    #    online since runtimes depend on the core count) ---------------------
    t0 = time.perf_counter()
    ref_cluster = make_cluster(8)
    for cfg in configs:
        pareto_placements(wl.task_graph(cfg), ref_cluster)
    timings["filter_task_placements"] = time.perf_counter() - t0

    # 3. content categories ---------------------------------------------------
    t0 = time.perf_counter()
    idx = sample_segment_indices(trace, sample_frac=sample_frac, seed=seed)
    if spark is not None:
        q_vecs = quality_vectors_spark(
            spark, wl, trace, configs, idx, seed=seed
        )
    else:
        q_vecs = quality_vectors_numpy(wl, trace, configs, idx, seed=seed)
    categories = fit_categories(q_vecs, configs, n_categories, seed=seed)
    timings["compute_content_categories"] = time.perf_counter() - t0

    # ranking of configurations by expected quality (for the switcher's
    # "next less qualitative configuration" fallback, Section 4.2)
    mean_q = categories.centers.mean(axis=0)  # (K,)
    quality_rank = list(np.argsort(-mean_q))
    k_minus_idx = int(np.argmin(work))

    # Footnote 7: if k- achieves similar quality on all content
    # categories (not a good discriminator), pick the next cheapest
    # configuration that is one.  Discrimination = spread of the
    # configuration's column across the cluster centers.
    spreads = categories.centers.std(axis=0)  # (K,)
    k_label_idx = k_minus_idx
    if spreads.max() > 0:
        for j in np.argsort(work):
            if spreads[j] >= 0.5 * spreads.max():
                k_label_idx = int(j)
                break
        else:
            k_label_idx = int(np.argmax(spreads))

    # 4. create forecast training data (classify all training segments
    #    with k-, aggregate 15-min histograms) -------------------------------
    t0 = time.perf_counter()
    spec = ForecastSpec(
        n_categories=n_categories,
        in_days=in_days,
        n_splits=n_splits,
        out_days=plan_days,
    )
    obs_klabel = wl.observed_quality_curve(
        configs[k_label_idx], trace, seed=seed
    )
    labels = categories.classify_1d(k_label_idx, obs_klabel)
    if spark is not None:
        train_hists = histogram_series_spark(
            spark,
            labels,
            seg_len=wl.seg_len,
            n_categories=n_categories,
            bin_s=spec.bin_s,
        )
    else:
        train_hists = histogram_series(
            labels,
            seg_len=wl.seg_len,
            n_categories=n_categories,
            bin_s=spec.bin_s,
        )
    x, y = build_training_pairs(train_hists, spec)
    timings["create_forecast_training_data"] = time.perf_counter() - t0

    # 5. train the forecasting model -----------------------------------------
    t0 = time.perf_counter()
    forecaster = None
    if train_forecast and len(x):
        forecaster = train_forecaster(x, y, spec, seed=seed)
    timings["train_forecast_model"] = time.perf_counter() - t0

    return Fitted(
        configs=configs,
        work=work,
        categories=categories,
        forecaster=forecaster,
        spec=spec,
        quality_rank=quality_rank,
        mean_mult=float(trace.work_multiplier.mean()),
        train_hists=train_hists,
        k_minus_idx=k_minus_idx,
        k_label_idx=k_label_idx,
        timings=timings,
    )
