"""Tests for the hardware/pricing model (Appendix L, Section 5.3)."""
from __future__ import annotations

import pytest

from repro.sim.cluster import (
    CLOUD_TO_ONPREM_RATIO,
    CLOUD_USD_PER_CORE_S,
    GC_MACHINES,
    Cluster,
    make_cluster,
)


class TestPrices:
    def test_machine_catalogue_matches_paper(self):
        """Section 5.3 lists exactly these five Google Cloud machines."""
        assert GC_MACHINES == {
            "e2-standard-4": (4, 0.14),
            "e2-standard-8": (8, 0.27),
            "e2-standard-16": (16, 0.54),
            "e2-standard-32": (32, 1.07),
            "c2-standard-60": (60, 2.51),
        }

    def test_cloud_ratio_is_1_8(self):
        assert CLOUD_TO_ONPREM_RATIO == 1.8

    def test_lambda_core_second_price(self):
        """130.78 $/month for a 2-core Lambda kept on for 744 h."""
        assert CLOUD_USD_PER_CORE_S == pytest.approx(
            130.78 / (744 * 3600 * 2)
        )

    @pytest.mark.parametrize("vcpus", [4, 8, 16, 32, 60])
    def test_make_cluster(self, vcpus):
        cl = make_cluster(vcpus)
        assert cl.n_cores == vcpus
        assert cl.buffer_bytes == 4e9  # the paper's 4 GB buffer

    def test_unknown_size_rejected(self):
        with pytest.raises(KeyError):
            make_cluster(12)

    def test_paper_table2_costs_derive_from_price_model(self):
        """COVID/MOT total costs in Table 2 = price * 8 days / 1.8."""
        for vcpus, expected in [(4, 14.9), (8, 28.8), (16, 57.6),
                                (32, 114.1), (60, 267.7)]:
            cl = make_cluster(vcpus)
            assert cl.onprem_cost(8 * 86400.0) == pytest.approx(
                expected, abs=0.15
            )

    def test_onprem_cost_linear_in_time(self):
        cl = make_cluster(8)
        assert cl.onprem_cost(7200.0) == pytest.approx(
            2 * cl.onprem_cost(3600.0)
        )

    def test_overrides(self):
        cl = make_cluster(4, buffer_bytes=1e9, uplink_bps=1e8)
        assert cl.buffer_bytes == 1e9
        assert cl.uplink_bps == 1e8

    def test_per_core_second_cheaper_than_cloud(self):
        for vcpus in (4, 8, 16, 32, 60):
            cl = make_cluster(vcpus)
            assert cl.onprem_usd_per_core_s < cl.cloud_usd_per_core_s
