"""Unit tests for the peak-trough cost model (§V-C / Fig 9)."""
import pytest

from repro.cost.model import (
    CostParams,
    PeakTrough,
    airphant_cost,
    asymptotic_ratio,
    cost_ratio,
    elastic_cost,
    vm_cost_factor,
)

A = 154.08  # one Elasticsearch server's throughput (paper)
WL = PeakTrough(peak_ops=A, trough_ops=A / 20, tau=0.1)


class TestPaperConstants:
    def test_asymptotic_ratio_is_3_29(self):
        # "we would asymptotically save ~3.29x"
        assert asymptotic_ratio() == pytest.approx(3.29, abs=0.01)

    def test_vm_cost_factor_is_13_48(self):
        # "AIRPHANT's cost would be A/(13.48a) times over Elasticsearch's"
        assert vm_cost_factor() == pytest.approx(13.48, abs=0.05)

    def test_airphant_throughput_consistent(self):
        # 175 ms/op == 5.71 ops/s
        p = CostParams()
        assert 1000 / p.airphant_ops_per_s == pytest.approx(175, abs=1)
        assert 1000 / p.elastic_ops_per_s == pytest.approx(6.49, abs=0.01)


class TestCostFunctions:
    def test_elastic_ignores_trough(self):
        wl_busy = PeakTrough(peak_ops=A, trough_ops=A, tau=0.5)
        wl_idle = PeakTrough(peak_ops=A, trough_ops=0.0, tau=0.5)
        assert elastic_cost(10, wl_busy) == elastic_cost(10, wl_idle)

    def test_airphant_scales_with_mean(self):
        wl_idle = PeakTrough(peak_ops=A, trough_ops=0.0, tau=0.0)
        wl_busy = PeakTrough(peak_ops=A, trough_ops=A, tau=1.0)
        assert airphant_cost(0, wl_idle) < airphant_cost(0, wl_busy)

    def test_storage_prices(self):
        # pure storage: no workload
        wl0 = PeakTrough(peak_ops=0, trough_ops=0, tau=0.5)
        assert airphant_cost(100, wl0) == pytest.approx(100 * 1.008 * 0.02)
        assert elastic_cost(100, wl0) == pytest.approx(100 * 0.3316 * 0.2)

    def test_mean_ops(self):
        assert WL.mean_ops == pytest.approx(0.1 * A + 0.9 * A / 20)

    def test_validation(self):
        with pytest.raises(ValueError):
            PeakTrough(peak_ops=1, trough_ops=2, tau=0.5)
        with pytest.raises(ValueError):
            PeakTrough(peak_ops=2, trough_ops=1, tau=1.5)


class TestFig9Shape:
    def test_airphant_wins_at_large_data(self):
        # bottom-to-top lines of Fig 9: larger N -> higher C_E/C_A
        small = cost_ratio(1, WL)
        large = cost_ratio(100_000, WL)
        assert large > small
        assert large == pytest.approx(asymptotic_ratio(), rel=0.05)

    def test_airphant_wins_at_skewed_workload(self):
        # smaller tau (rarer peaks) favors the decoupled design
        spiky = PeakTrough(peak_ops=A, trough_ops=A / 20, tau=0.01)
        flat = PeakTrough(peak_ops=A, trough_ops=A / 20, tau=0.99)
        assert cost_ratio(10, spiky) > cost_ratio(10, flat)

    def test_crossover_exists(self):
        # at tau -> 1 and tiny data, always-on Elasticsearch is cheaper
        flat = PeakTrough(peak_ops=A, trough_ops=A, tau=1.0)
        assert cost_ratio(0.001, flat) < 1.0
        # at tau -> 0 with rare peaks, Airphant is cheaper
        spiky = PeakTrough(peak_ops=A, trough_ops=A / 20, tau=0.0)
        assert cost_ratio(0.001, spiky) > 1.0

    def test_vm_only_rule_matches_factor(self):
        # with tau=0: C_A/C_E (VM only) == a / (13.48 A) ... i.e. the
        # paper's A > 13.48a break-even rule.
        a = A / 20
        wl = PeakTrough(peak_ops=A, trough_ops=a, tau=0.0)
        ratio_vm = airphant_cost(0, wl) / elastic_cost(0, wl)
        assert ratio_vm == pytest.approx((13.48 * a) / A, rel=0.01)
