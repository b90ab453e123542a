"""Benchmark behind Table 6: forecast MAE vs input featurization
(scaled grid; full grid in ``jobs/run_table6.py``)."""
from __future__ import annotations

from repro.exp.table5 import run_table6


def test_table6_featurization_grid(benchmark):
    df = benchmark.pedantic(
        lambda: run_table6(
            train_days=6.0,
            test_days=2.0,
            input_days=(0.5, 1.0),
            splits=(1, 8),
        ),
        rounds=1,
        iterations=1,
    )
    assert len(df) == 4
    # paper shape: 8-way splits never much worse than 1-way
    by = df.set_index(["input_days", "splits"]).mae
    assert by[(1.0, 8)] <= by[(1.0, 1)] + 0.05
