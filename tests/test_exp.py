"""Tests for the experiment harness (sweeps and table reproductions)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.exp.paper_numbers import (
    PAPER_TABLE4,
    PAPER_TABLE5,
    PAPER_TABLE6,
    paper_table2,
)
from repro.exp.runs import run_one
from repro.exp.sweep import run_grid_local, run_grid_spark
from repro.exp.table2 import build_grid, format_table2, run_table2
from repro.exp.table5 import run_table5, run_table6

TINY = {"train_days": 1.0, "test_days": 0.25}


class TestRunOne:
    @pytest.mark.parametrize(
        "method", ["static", "chameleon", "videostorm", "optimum", "skyscraper"]
    )
    def test_methods_run(self, method):
        row = run_one(
            {"workload": "covid", "method": method, "vcpus": 8, **TINY}
        )
        assert row["method"] == method
        assert 0 <= row["quality_pct"] <= 100
        assert row["total_usd"] > 0

    def test_unknown_method(self):
        with pytest.raises(ValueError):
            run_one({"workload": "covid", "method": "magic", "vcpus": 4})

    def test_row_is_flat_and_json_safe(self):
        import json

        row = run_one(
            {"workload": "covid", "method": "static", "vcpus": 4, **TINY}
        )
        json.dumps(row, default=float)  # must not raise


class TestSweep:
    def test_local_grid(self):
        grid = [
            {"workload": "covid", "method": "static", "vcpus": v, **TINY}
            for v in (4, 8)
        ]
        df = run_grid_local(grid)
        assert len(df) == 2
        assert set(df.vcpus) == {4, 8}

    def test_spark_matches_local(self, spark):
        grid = [
            {"workload": "covid", "method": "static", "vcpus": v, **TINY}
            for v in (4, 8)
        ]
        local = run_grid_local(grid).sort_values("vcpus").reset_index(drop=True)
        dist = (
            run_grid_spark(spark, grid)
            .sort_values("vcpus")
            .reset_index(drop=True)
        )
        pd.testing.assert_series_equal(
            local["quality_pct"], dist["quality_pct"], rtol=1e-9
        )

    def test_empty_grid(self, spark):
        assert run_grid_spark(spark, []).empty


class TestTable2:
    def test_grid_mirrors_paper_rows(self):
        grid = build_grid()
        got = {(g["workload"], g["method"], g["vcpus"]) for g in grid}
        paper = {
            (r.workload, r.method, r.vcpus)
            for r in paper_table2().itertuples()
        }
        assert got == paper

    def test_paper_numbers_complete(self):
        p = paper_table2()
        assert len(p) == 51
        assert set(p.workload) == {"covid", "mot", "mosei-high", "mosei-long"}

    def test_tiny_run_and_format(self):
        df = run_table2(
            None, test_days_scale=0.02, workloads=["covid"]
        )
        assert len(df) == 11
        # cost columns are scaled back to the paper's full duration and
        # must match the paper's deterministic price model
        static = df[df.method == "static"]
        np.testing.assert_allclose(
            static.sort_values("vcpus").total_usd_full,
            static.sort_values("vcpus").paper_total_usd,
            rtol=0.01,
        )
        md = format_table2(df)
        assert md.count("\n") == len(df) + 1

    def test_cost_model_matches_paper_exactly(self):
        """onprem $/h = GC price / 1.8 over the test duration."""
        from repro.sim.cluster import GC_MACHINES

        for wl_days, wl in ((8.0, "covid"), (2.0, "mosei-high")):
            for name, (vcpus, price) in GC_MACHINES.items():
                expected = price * wl_days * 24 / 1.8
                paper_rows = paper_table2().query(
                    f"workload == '{wl}' and method == 'static' "
                    f"and vcpus == {vcpus}"
                )
                assert paper_rows.paper_total_usd.iloc[0] == pytest.approx(
                    expected, rel=0.01
                )


class TestTables56:
    def test_table5_tiny(self):
        df = run_table5(
            workloads=("covid",),
            train_days=2.0,
            test_days=1.0,
            horizons=(0.25, 0.5),
        )
        assert len(df) == 2
        assert (df.mae.dropna() >= 0).all()

    def test_table6_tiny(self):
        df = run_table6(
            train_days=2.0,
            test_days=1.0,
            input_days=(0.25,),
            splits=(1, 4),
        )
        assert len(df) == 2
        assert (df.mae.dropna() >= 0).all()

    def test_paper_constants_sane(self):
        assert PAPER_TABLE4[1] == 100.0
        assert PAPER_TABLE5["covid"][2] == 0.042
        assert min(PAPER_TABLE5["covid"], key=PAPER_TABLE5["covid"].get) == 2
        assert len(PAPER_TABLE6) == 20
