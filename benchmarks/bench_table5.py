"""Benchmark behind Table 5: forecast MAE vs horizon (scaled).

The full 16-train/8-test-day sweep runs in ``jobs/run_table5.py``; here
a scaled version is timed and checked for sanity (MAE well below the
uniform-prediction baseline).
"""
from __future__ import annotations

import numpy as np

from repro.exp.table5 import run_table5


def test_table5_forecast_mae(benchmark):
    df = benchmark.pedantic(
        lambda: run_table5(
            workloads=("covid",),
            train_days=6.0,
            test_days=2.0,
            horizons=(0.5, 1.0, 2.0),
        ),
        rounds=1,
        iterations=1,
    )
    assert (df.mae.dropna() < 0.25).all()
    assert len(df) == 3
