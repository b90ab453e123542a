"""Table 4 (Appendix I.1, Section 5.6): knob-switcher classification
accuracy for a varying number of content categories (COVID).

For each |C| in {1, 2, 3, 4, 8} the offline phase is refitted and the
online run replayed; accuracy is the fraction of segments whose Eq.-5
(1-D, previous-segment) classification matches the full-vector
ground-truth category.  Expected shape: 100% at one category, slowly
decreasing as categories multiply.
"""
from __future__ import annotations

import pandas as pd

from repro.exp.paper_numbers import PAPER_TABLE4
from repro.exp.sweep import run_grid

CATEGORY_COUNTS = (1, 2, 3, 4, 8)


def build_grid(
    *, vcpus: int = 8, seed: int = 0, test_days: float | None = None
) -> list[dict]:
    grid = []
    for n_cat in CATEGORY_COUNTS:
        cell = {
            "workload": "covid",
            "method": "skyscraper",
            "vcpus": vcpus,
            "seed": seed,
            "n_categories": n_cat,
        }
        if test_days is not None:
            cell["test_days"] = test_days
        grid.append(cell)
    return grid


def run_table4(
    spark=None, *, vcpus: int = 8, seed: int = 0, test_days: float | None = None
) -> pd.DataFrame:
    df = run_grid(build_grid(vcpus=vcpus, seed=seed, test_days=test_days), spark)
    df = df.rename(columns={"n_categories": "categories"})
    df = df.sort_values("categories").reset_index(drop=True)
    df["accuracy_pct"] = (100.0 * df["switch_accuracy"]).round(1)
    df["paper_accuracy_pct"] = df["categories"].map(PAPER_TABLE4)
    return df[
        [
            "categories",
            "paper_accuracy_pct",
            "accuracy_pct",
            "quality_pct",
            "switch_accuracy_no_typeb",
        ]
    ]


def format_table4(df: pd.DataFrame) -> str:
    lines = [
        "| categories | paper accuracy | ours accuracy | ours quality% |",
        "|---|---|---|---|",
    ]
    for _, r in df.iterrows():
        lines.append(
            f"| {int(r.categories)} | {r.paper_accuracy_pct}% | "
            f"{r.accuracy_pct}% | {r.quality_pct:.1f} |"
        )
    return "\n".join(lines)
