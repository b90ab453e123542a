"""Benchmark behind Table 4: switcher accuracy vs category count.

Runs the scaled |C| sweep and asserts the paper's shape: perfect
classification with one category, high (>90%) accuracy for small |C|,
monotone-ish decrease as categories multiply.
"""
from __future__ import annotations

from repro.exp.table4 import run_table4


def test_table4_accuracy_shape(benchmark):
    df = benchmark.pedantic(
        lambda: run_table4(None, vcpus=8, test_days=0.5),
        rounds=1,
        iterations=1,
    )
    acc = dict(zip(df.categories, df.accuracy_pct))
    assert acc[1] == 100.0
    assert acc[3] > 80.0
    assert acc[8] <= acc[1]
