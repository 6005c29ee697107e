"""Unit tests for Algorithm 1 and Lemmas 1-3 (§IV-A)."""
import math

import numpy as np
import pytest

from repro.core.optimizer import (
    InfeasibleError,
    feasibility_lower_bound,
    l_star_i,
    minimize_layers,
)
from repro.core.sketch import expected_false_positives, q_hat_i


class TestLemma1:
    def test_l_star_formula(self):
        assert l_star_i(100, 10) == pytest.approx(10 * math.log(2))

    def test_l_star_minimizes_q_hat(self):
        B, w = 400, 8
        ls = l_star_i(B, w)
        assert q_hat_i(ls, B, w) < q_hat_i(ls * 0.8, B, w)
        assert q_hat_i(ls, B, w) < q_hat_i(ls * 1.2, B, w)

    def test_lower_bound_below_f(self):
        counts = np.array([5, 10, 20], dtype=float)
        c = np.ones(3)
        lb = feasibility_lower_bound(200, counts, c)
        for L in (1, 2, 5, 10, 20):
            assert expected_false_positives(L, 200, counts) >= lb

    def test_lower_bound_value(self):
        # single doc: lb = 2^{-B ln2 / w}
        lb = feasibility_lower_bound(100, np.array([10.0]), np.array([1.0]))
        assert lb == pytest.approx(2 ** -(100 / 10 * math.log(2)))


class TestLemma2And3Regions:
    def test_decreasing_in_fast_region(self):
        counts = [10] * 100
        B = 1000
        l_min = l_star_i(B, 10)
        f_vals = [expected_false_positives(L, B, counts, approx=True)
                  for L in range(1, int(l_min))]
        assert all(a > b for a, b in zip(f_vals, f_vals[1:]))

    def test_increasing_after_l_max(self):
        counts = [10] * 100
        B = 200
        l_max = l_star_i(B, 10)
        ls = np.linspace(l_max * 1.05, B * 0.9, 10)
        f_vals = [expected_false_positives(L, B, counts, approx=True) for L in ls]
        assert all(a < b for a, b in zip(f_vals, f_vals[1:]))

    def test_exponential_decay_bound(self):
        # Lemma 2: F_hat(L) <= n 2^-L in the fast region
        counts = [10] * 50
        B = 2000
        for L in range(1, 20):
            assert expected_false_positives(L, B, counts, approx=True) <= 50 * 2**-L


class TestAlgorithm1:
    def test_returns_minimal_feasible_l(self):
        counts = [13] * 11_000
        res = minimize_layers(1365, 1.0, counts)
        assert expected_false_positives(res.n_layers, 1365, counts) <= 1.0
        assert expected_false_positives(res.n_layers - 1, 1365, counts) > 1.0

    def test_f_at_result_matches(self):
        counts = [13] * 11_000
        res = minimize_layers(1365, 1.0, counts)
        assert res.expected_fp == pytest.approx(
            expected_false_positives(res.n_layers, 1365, counts)
        )

    @pytest.mark.parametrize("f0", [10.0, 1.0, 0.01, 1e-4])
    def test_tighter_f0_needs_more_layers(self, f0):
        # Fig 17a: L* increases only slightly as F0 tightens by orders
        # of magnitude (exponential decay in L).
        counts = [13] * 11_000
        res = minimize_layers(4000, f0, counts)
        assert expected_false_positives(res.n_layers, 4000, counts) <= f0

    def test_f17_l_star_grows_slowly(self):
        counts = [13] * 11_000
        l1 = minimize_layers(4000, 1.0, counts).n_layers
        l2 = minimize_layers(4000, 1e-4, counts).n_layers
        assert l1 <= l2 <= l1 + 4

    def test_paper_full_scale_hdfs_regime(self):
        # B=1e5, n=1.1e7 docs, |W_i|=13: the paper's optimizer picks L*=2.
        counts = [13] * 1000  # proxy: scale c_i instead of materializing 1.1e7
        c = [11_000.0] * 1000  # each proxy doc stands for 1.1e4 docs
        res = minimize_layers(100_000, 1.0, counts, c=c)
        assert res.n_layers == 2

    def test_monotone_in_b(self):
        counts = [10] * 5000
        l_small = minimize_layers(800, 1.0, counts).n_layers
        l_big = minimize_layers(8000, 1.0, counts).n_layers
        assert l_big <= l_small

    def test_reject_when_infeasible(self):
        # tiny B, huge docs: even the best L cannot reach F0
        with pytest.raises(InfeasibleError):
            minimize_layers(20, 1e-6, [15] * 1000)

    def test_lower_bound_rejection_is_cheap_and_correct(self):
        counts = [50] * 100
        lb = feasibility_lower_bound(60, np.asarray(counts, dtype=float), np.ones(100))
        with pytest.raises(InfeasibleError):
            minimize_layers(60, lb / 2, counts)

    def test_slow_region_search(self):
        # F0 between the fast-region boundary and the best achievable
        # integer-L value forces the iterative branch.
        counts = [30] * 200
        B = 300
        l_min = math.floor((B / 30) * math.log(2))
        l_max = math.ceil((B / 30) * math.log(2))
        f_at_lmin = expected_false_positives(l_min, B, counts)
        best = min(
            expected_false_positives(L, B, counts) for L in range(l_min, l_max + 1)
        )
        assert best < f_at_lmin  # the slow region genuinely improves here
        f0 = best * 1.001
        res = minimize_layers(B, f0, counts)
        assert res.region == "slow"
        assert res.expected_fp <= f0

    def test_l_one_when_easy(self):
        res = minimize_layers(10_000, 100.0, [2] * 10)
        assert res.n_layers == 1

    def test_input_validation(self):
        with pytest.raises(ValueError):
            minimize_layers(0, 1.0, [5])
        with pytest.raises(ValueError):
            minimize_layers(10, 0.0, [5])
        with pytest.raises(ValueError):
            minimize_layers(10, 1.0, [])
        with pytest.raises(ValueError):
            minimize_layers(10, 1.0, [0])
        with pytest.raises(ValueError):
            minimize_layers(10, 1.0, [5, 5], c=[1.0])

    def test_uniform_prior_reduces_layers_needed(self):
        counts = [40] * 500
        worst = minimize_layers(900, 0.5, counts)
        unif = minimize_layers(900, 0.5, counts, n_terms=50)
        assert unif.n_layers <= worst.n_layers

    def test_diagnostics_populated(self):
        res = minimize_layers(1000, 1.0, [10] * 100)
        assert res.l_min == pytest.approx((1000 / 10) * math.log(2))
        assert res.l_max == res.l_min  # all docs same length
        assert res.lower_bound > 0
        assert res.region in ("fast", "slow")
