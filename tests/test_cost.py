"""Tests for the Figure 9 cost model."""
import numpy as np
import pytest

from repro.core.cost import T4_COST_MODEL, CostModel


class TestCostModel:
    def test_paper_constants(self):
        assert T4_COST_MODEL.oracle_fps == 4.0
        assert T4_COST_MODEL.proxy_fps == 12_600.0
        assert T4_COST_MODEL.dollars_per_hour == 0.526

    def test_oracle_seconds(self):
        assert T4_COST_MODEL.query_seconds(oracle_calls=4000) == 1000.0

    def test_proxy_seconds(self):
        assert np.isclose(
            T4_COST_MODEL.query_seconds(oracle_calls=0, proxy_calls=12_600), 1.0
        )

    def test_combined(self):
        m = CostModel(oracle_fps=2.0, proxy_fps=100.0, dollars_per_hour=3600.0)
        assert m.query_seconds(oracle_calls=10, proxy_calls=100) == 6.0
        assert np.isclose(m.query_dollars(oracle_calls=10, proxy_calls=100), 6.0)

    def test_dollars_scale_with_rate(self):
        assert np.isclose(
            T4_COST_MODEL.query_dollars(oracle_calls=4 * 3600), 0.526
        )

    @pytest.mark.parametrize("oracle,proxy", [(-1, 0), (0, -5)])
    def test_negative_counts_raise(self, oracle, proxy):
        with pytest.raises(ValueError):
            T4_COST_MODEL.query_seconds(oracle_calls=oracle, proxy_calls=proxy)

    def test_proxy_much_cheaper_than_oracle(self):
        # The premise of the whole paper: scoring the proxy on 500k
        # records costs less than ~160 oracle invocations.
        proxy_cost = T4_COST_MODEL.query_seconds(oracle_calls=0, proxy_calls=500_000)
        oracle_cost = T4_COST_MODEL.query_seconds(oracle_calls=160)
        assert proxy_cost < oracle_cost
