"""Unit tests for top-K sampling (Eq 6, §IV-D)."""
import numpy as np
import pytest

from repro.core.topk import sample_size


class TestSampleSize:
    def test_paper_setting_is_about_23(self):
        # §V-A: "the conservative setting ... selects about 23 samples to
        # answer top-10 query" at F0=1, delta=1e-6.
        assert sample_size(10, 10_000, 1.0, 1e-6) == 23

    def test_fetch_all_when_k_exceeds_relevant(self):
        assert sample_size(10, 8, 1.0, 1e-6) == 8
        assert sample_size(5, 5, 1.0, 1e-6) == 5

    def test_fetch_all_when_fp_dominates(self):
        # p <= 0 regime (HashTable's world): must fetch everything
        assert sample_size(10, 100, 95.0, 1e-6) == 100

    def test_at_least_k(self):
        for r in (50, 500, 5000):
            assert sample_size(10, r, 1.0, 1e-6) >= 10

    def test_never_exceeds_r(self):
        for r in (11, 24, 100):
            assert sample_size(10, r, 1.0, 1e-6) <= r

    def test_monotone_in_k(self):
        sizes = [sample_size(k, 10_000, 1.0, 1e-6) for k in (1, 5, 10, 50)]
        assert sizes == sorted(sizes)

    def test_monotone_in_delta(self):
        loose = sample_size(10, 10_000, 1.0, 1e-3)
        tight = sample_size(10, 10_000, 1.0, 1e-9)
        assert tight >= loose

    def test_more_fp_needs_more_samples(self):
        a = sample_size(10, 100, 1.0, 1e-6)
        b = sample_size(10, 100, 50.0, 1e-6)
        assert b > a

    def test_validation(self):
        with pytest.raises(ValueError):
            sample_size(0, 10, 1.0, 1e-6)
        with pytest.raises(ValueError):
            sample_size(1, -1, 1.0, 1e-6)
        with pytest.raises(ValueError):
            sample_size(1, 10, 1.0, 0.0)
        with pytest.raises(ValueError):
            sample_size(1, 10, -1.0, 0.5)

    @pytest.mark.parametrize("k,f0,delta", [(10, 1.0, 1e-6), (5, 3.0, 1e-4), (20, 0.5, 1e-8)])
    def test_guarantee_holds_empirically(self, k, f0, delta):
        # Sampling R_K postings from a list with F0 expected irrelevant
        # entries yields >= k relevant ones (failure prob <= delta, so
        # 2000 seeded trials should never fail).
        r = 2000
        rk = sample_size(k, r, f0, delta)
        g = np.random.default_rng(0)
        relevant = np.ones(r, dtype=bool)
        fails = 0
        for _ in range(2000):
            rel = relevant.copy()
            # plant F0 irrelevant postings in expectation
            rel[g.random(r) < f0 / r] = False
            sample = g.choice(r, size=rk, replace=False)
            if rel[sample].sum() < k:
                fails += 1
        assert fails == 0
