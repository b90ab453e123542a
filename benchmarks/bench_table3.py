"""Benchmark behind Table 3: offline-phase runtime per step.

Times the COVID offline phase (4 train days here; 16 in the job) and
checks the paper's shape: creating the forecast training data dominates
the offline runtime.
"""
from __future__ import annotations

from repro.core.fit import fit_skyscraper
from repro.workloads import get_workload


def test_offline_phase_runtime(benchmark):
    wl = get_workload("covid")

    fitted = benchmark.pedantic(
        lambda: fit_skyscraper(wl, seed=0, train_days=4.0),
        rounds=1,
        iterations=1,
    )
    t = fitted.timings
    # shape check (paper: the data-intensive steps — processing training
    # video for categories and forecast data — take 88% of the offline
    # phase and model training is negligible)
    total = sum(t.values())
    data_steps = (
        t["compute_content_categories"] + t["create_forecast_training_data"]
    )
    assert data_steps > 0.6 * total
    assert t["train_forecast_model"] < 0.2 * total
