"""Shared benchmark fixtures: a mid-size fitted artifact per workload."""
from __future__ import annotations

import pytest

from repro.core.fit import fit_skyscraper
from repro.sim.cluster import make_cluster
from repro.workloads import get_workload


@pytest.fixture(scope="session")
def covid_wl():
    return get_workload("covid")


@pytest.fixture(scope="session")
def covid_fitted(covid_wl):
    """4 train days, 1-day planning horizon: representative but quick."""
    return fit_skyscraper(
        covid_wl, seed=0, train_days=4.0, plan_days=1.0, in_days=1.0,
        sample_frac=0.02,
    )


@pytest.fixture(scope="session")
def bench_cluster():
    return make_cluster(8)
