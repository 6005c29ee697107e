"""Unit tests for IoU Sketch semantics and the accuracy analysis (§IV-A/B)."""
import math
import random

import numpy as np
import pytest

from repro.core.sketch import (
    IoUSketch,
    deviation_bound,
    expected_false_positives,
    q_hat_derivative,
    q_hat_i,
    q_i,
    sigma_x,
)


class TestFigure4Example:
    """The paper's worked example: 5 documents, 4 words, 3 layers."""

    def _sketch_like_fig4(self):
        # Reproduce the *structure* of Fig 4 with explicit bins: we place
        # words manually by monkey-patching the family mapping. Per the
        # paper: w2 shares a bin with w3 in layer 1, with w4 in layer 2,
        # and with both w1 and w3 in layer 3; w1 sits alone in layer 1.
        sk = IoUSketch.create(3, 3, seed=0)
        mapping = {  # word -> bin per layer, copied from Fig 4
            "w1": [0, 0, 0],
            "w2": [1, 1, 0],
            "w3": [1, 0, 0],
            "w4": [2, 1, 1],
        }
        object.__setattr__(sk.family, "bins", lambda w: mapping[w])  # type: ignore
        return sk

    def test_fig4_false_positive(self):
        sk = self._sketch_like_fig4()
        sk.insert("w1", {"d1"})
        sk.insert("w2", {"d2", "d3"})
        sk.insert("w3", {"d2", "d3", "d4"})
        sk.insert("w4", {"d2", "d4", "d5"})
        # the paper: querying w2 yields {d2,d3,d4} — one false positive d4
        assert sk.query("w2") == {"d2", "d3", "d4"}
        # and querying w1 is exact despite shared bins
        assert sk.query("w1") == {"d1"}


class TestInsertQuery:
    @pytest.mark.parametrize("n_layers,bins", [(1, 4), (2, 8), (3, 16), (5, 7)])
    def test_no_false_negatives(self, n_layers, bins):
        rng = random.Random(0)
        sk = IoUSketch.create(n_layers, bins, seed=1)
        truth = {}
        for i in range(50):
            word = f"w{i}"
            docs = {f"d{rng.randrange(30)}" for _ in range(rng.randrange(1, 6))}
            truth[word] = docs
            sk.insert(word, docs)
        for word, docs in truth.items():
            assert sk.query(word) >= docs  # never misses a relevant doc

    def test_more_layers_fewer_false_positives(self):
        # Fig 5's core observation at fixed B: L=1 is far worse than L=3.
        rng = random.Random(1)
        corpus = {f"w{i}": {f"d{rng.randrange(200)}" for _ in range(3)} for i in range(300)}
        B = 60

        def total_fp(layers):
            bins = max(1, B // layers)
            sk = IoUSketch.create(layers, bins, seed=2)
            for w, docs in corpus.items():
                sk.insert(w, docs)
            return sum(len(sk.query(w) - docs) for w, docs in corpus.items())

        assert total_fp(3) < total_fp(1) / 3

    def test_insert_accumulates(self):
        sk = IoUSketch.create(2, 4, seed=0)
        sk.insert("w", {"a"})
        sk.insert("w", {"b"})
        assert sk.query("w") >= {"a", "b"}

    def test_unseen_word_query_is_set(self):
        sk = IoUSketch.create(2, 4, seed=0)
        sk.insert("w", {"a"})
        assert isinstance(sk.query("zzz"), set)

    def test_superpost_is_union(self):
        sk = IoUSketch.create(1, 1, seed=0)  # everything merges into 1 bin
        sk.insert("x", {"d1"})
        sk.insert("y", {"d2"})
        assert sk.superpost(0, 0) == {"d1", "d2"}


class TestQi:
    def test_exact_formula_small_case(self):
        # one layer, B bins: q = 1 - (1 - 1/B)^w
        assert q_i(1, 10, 3) == pytest.approx(1 - (1 - 0.1) ** 3)

    def test_approx_close_to_exact_when_b_large(self):
        for w in (5, 20, 80):
            assert q_hat_i(2, 10_000, w) == pytest.approx(q_i(2, 10_000, w), rel=0.01)

    def test_decreasing_before_lstar(self):
        B, w = 1000, 10
        l_star = B / w * math.log(2)
        ls = np.linspace(1, l_star * 0.9, 20)
        qs = [q_hat_i(l, B, w) for l in ls]
        assert all(a > b for a, b in zip(qs, qs[1:]))

    def test_increasing_after_lstar(self):
        B, w = 100, 10
        l_star = B / w * math.log(2)
        ls = np.linspace(l_star * 1.1, B / 2, 20)
        qs = [q_hat_i(l, B, w) for l in ls]
        assert all(a < b for a, b in zip(qs, qs[1:]))

    def test_qhat_at_lstar_is_2_to_minus_lstar(self):
        # Lemma 1's closed form
        B, w = 500, 7
        l_star = B / w * math.log(2)
        assert q_hat_i(l_star, B, w) == pytest.approx(2**-l_star, rel=1e-9)

    def test_derivative_sign(self):
        B, w = 1000, 10
        l_star = B / w * math.log(2)
        assert q_hat_derivative(l_star * 0.5, B, w) < 0
        assert q_hat_derivative(l_star * 1.5, B, w) > 0
        assert abs(q_hat_derivative(l_star, B, w)) < 1e-12

    def test_probability_bounds(self):
        for L in (1, 2, 8):
            for B in (10, 1000):
                for w in (1, 5, 100):
                    assert 0.0 <= q_i(L, B, w) <= 1.0
                    assert 0.0 <= q_hat_i(L, B, w) <= 1.0


class TestExpectedFalsePositives:
    def test_linear_in_documents(self):
        f1 = expected_false_positives(2, 100, [5] * 10)
        f2 = expected_false_positives(2, 100, [5] * 20)
        assert f2 == pytest.approx(2 * f1)

    def test_uniform_prior_coefficients(self):
        # c_i = (|W| - |W_i|)/|W| shrinks F relative to c_i = 1
        worst = expected_false_positives(2, 100, [5] * 10)
        unif = expected_false_positives(2, 100, [5] * 10, n_terms=10)
        assert unif == pytest.approx(worst * (10 - 5) / 10)

    def test_explicit_c_override(self):
        f = expected_false_positives(2, 100, [5, 5], c=[1.0, 0.0])
        assert f == pytest.approx(expected_false_positives(2, 100, [5]))

    def test_approx_flag(self):
        exact = expected_false_positives(2, 5000, [10] * 50)
        approx = expected_false_positives(2, 5000, [10] * 50, approx=True)
        assert approx == pytest.approx(exact, rel=0.02)

    def test_mismatched_c_rejected(self):
        with pytest.raises(ValueError):
            expected_false_positives(2, 100, [5, 5], c=[1.0])

    def test_matches_monte_carlo(self):
        # Empirical FP frequency over random sketches ~ q_i formula
        # (the claim behind Fig 5's overlay of expectation and average).
        B_total, L, w = 60, 2, 8
        docs = [f"d{i}" for i in range(30)]
        trials, fp = 300, 0
        rng = random.Random(3)
        for t in range(trials):
            sk = IoUSketch.create(L, B_total // L, seed=t)
            target_words = [f"t{t}_{j}" for j in range(w)]
            for tw in target_words:
                sk.insert(tw, {"dTARGET"})
            fp += "dTARGET" in sk.query("irrelevant")
        expected = q_i(L, B_total, w)
        assert fp / trials == pytest.approx(expected, abs=0.05)


class TestSigmaX:
    """sigma_X must reproduce Table II's analytic column."""

    @pytest.mark.parametrize(
        "n,terms,sum_wi,expected",
        [
            (10**8, 10**8, 10**8, 1.00),  # diag(8,8,0)
            (10**8, 10**8, 10 * 10**8 * 0.9999, 1.00),  # unif(8,8,1)
            (10**8, int(5.0e7), 9.5e8, 1.41),  # zipf(8,8,1)
            (int(1.1e8), int(8.3e5), 1.1e8 * 14, 11.51),  # Windows
        ],
    )
    def test_table2_values(self, n, terms, sum_wi, expected):
        assert sigma_x(n, terms, sum_wi=sum_wi) == pytest.approx(expected, abs=0.3)

    def test_cranfield_from_counts(self):
        counts = [86] * 1398  # ~86 distinct words per abstract
        assert sigma_x(1398, 5300, doc_word_counts=counts) == pytest.approx(0.51, abs=0.03)

    def test_requires_some_input(self):
        with pytest.raises(ValueError):
            sigma_x(10, 10)


class TestDeviationBound:
    def test_formula(self):
        assert deviation_bound(2.0, math.exp(-1)) == pytest.approx(math.sqrt(0.5 * 4))

    def test_smaller_delta_wider_bound(self):
        assert deviation_bound(1.0, 1e-6) > deviation_bound(1.0, 1e-2)

    def test_bad_delta(self):
        with pytest.raises(ValueError):
            deviation_bound(1.0, 0.0)
        with pytest.raises(ValueError):
            deviation_bound(1.0, 1.0)
