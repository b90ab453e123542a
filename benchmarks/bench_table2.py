"""Benchmark behind Table 2: one ingestion-simulation cell per system.

Runs a scaled (half-day) version of the Table 2 cells; the full-duration
table is produced by ``jobs/run_table2.py``.  The benchmark asserts the
paper's qualitative ordering on the measured cells: Skyscraper beats
Static and Chameleon* at equal hardware.
"""
from __future__ import annotations

import pytest

from repro.exp.runs import run_one

# Full diurnal cycles: shorter windows cover only part of a day, which
# is unrepresentative for systems that ration resources over the day.
SCALE = {"train_days": 4.0, "test_days": 1.0}


@pytest.mark.parametrize("method", ["static", "chameleon", "skyscraper"])
def test_table2_cell_covid_8cores(benchmark, method):
    row = benchmark.pedantic(
        run_one,
        args=({"workload": "covid", "method": method, "vcpus": 8, **SCALE},),
        rounds=1,
        iterations=1,
    )
    assert 0 < row["quality_pct"] <= 100


@pytest.mark.parametrize(
    "workload", ["covid", "mot", "mosei-high", "mosei-long"]
)
def test_table2_skyscraper_beats_static(benchmark, workload):
    scale = dict(SCALE)
    if workload.startswith("mosei"):
        scale = {"train_days": 2.0, "test_days": 0.5}

    def cell():
        sky = run_one(
            {"workload": workload, "method": "skyscraper", "vcpus": 8, **scale}
        )
        static = run_one(
            {"workload": workload, "method": "static", "vcpus": 8, **scale}
        )
        return sky, static

    sky, static = benchmark.pedantic(cell, rounds=1, iterations=1)
    assert sky["quality_pct"] > static["quality_pct"]
    assert not sky["overflow"]
