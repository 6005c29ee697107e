"""Algorithm 1: minimize the number of layers subject to accuracy (§IV-A).

Given the bin budget B, a false-positive target F0 and the corpus profile
{|W_i|}, find the smallest integer L with F(L; B) <= F0, or reject when
no L in [1, B] can satisfy it.

The three lemmas structure the search:

* Lemma 1 — per-document minimizer L_i* = (B / |W_i|) ln 2, giving the
  cheap feasibility lower bound F(L) > sum_i c_i 2^{-L_i*}.
* Lemma 2 — on [1, L_min = min_i L_i*], F̂ is strictly decreasing (and
  O(n 2^{-L})): the *fast region*, solved by binary search.
* Lemma 3 — beyond L_max = max_i L_i*, F̂ is strictly increasing, so the
  *slow region* (L_min, L_max] is scanned iteratively and anything past
  L_max cannot newly satisfy the constraint.
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Iterable

import numpy as np

from repro.core.sketch import expected_false_positives


class InfeasibleError(ValueError):
    """Raised when no L in [1, B] meets the false-positive target (rejection)."""


@dataclass(frozen=True)
class OptimizationResult:
    """Outcome of Algorithm 1 plus the diagnostics the experiments report."""

    n_layers: int
    expected_fp: float
    region: str  # "fast" | "slow"
    l_min: float
    l_max: float
    lower_bound: float


def l_star_i(B: float, w_i: int) -> float:
    """Lemma 1: the L minimizing q̂_i for a document with |W_i| = w_i."""
    return (B / w_i) * math.log(2.0)


def feasibility_lower_bound(
    B: float, doc_word_counts: np.ndarray, c: np.ndarray
) -> float:
    """Lemma 1's bound: F(L) > sum_i c_i 2^{-L_i*} for all L."""
    l_stars = (B / doc_word_counts) * math.log(2.0)
    return float(np.sum(c * np.exp2(-l_stars)))


def minimize_layers(
    B: int,
    f0: float,
    doc_word_counts: Iterable[int],
    n_terms: int | None = None,
    c: Iterable[float] | None = None,
    max_layers: int | None = None,
) -> OptimizationResult:
    """Algorithm 1. Returns the minimal L (with diagnostics) or raises
    :class:`InfeasibleError` (the paper's "reject").

    ``max_layers`` additionally caps the iterative search (defaults to
    min(B, L_max) as in the paper; a practical deployment would rarely
    exceed a few dozen layers).
    """
    counts = np.asarray(list(doc_word_counts), dtype=float)
    if counts.size == 0:
        raise ValueError("empty corpus profile")
    if np.any(counts < 1):
        raise ValueError("every document must contain at least one word")
    if B < 1:
        raise ValueError("B must be >= 1")
    if f0 <= 0:
        raise ValueError("F0 must be positive")
    if c is not None:
        cs = np.asarray(list(c), dtype=float)
        if cs.shape != counts.shape:
            raise ValueError("c must align with doc_word_counts")
    elif n_terms is not None:
        cs = (n_terms - counts) / n_terms
    else:
        cs = np.ones_like(counts)

    def F(L: float) -> float:
        return expected_false_positives(L, B, counts, c=cs)

    lb = feasibility_lower_bound(B, counts, cs)
    l_min = float((B / counts.max()) * math.log(2.0))
    l_max = float((B / counts.min()) * math.log(2.0))
    if lb > f0:
        raise InfeasibleError(
            f"lower bound {lb:.4g} exceeds F0={f0:.4g} for B={B}; "
            "increase B or relax F0"
        )

    # Fast region: F is strictly decreasing on [1, L_min] — binary search
    # the smallest integer L with F(L) <= F0.
    l_min_int = max(1, math.floor(l_min))
    if F(l_min_int) <= f0:
        lo, hi = 1, l_min_int  # invariant: F(hi) <= F0
        while lo < hi:
            mid = (lo + hi) // 2
            if F(mid) <= f0:
                hi = mid
            else:
                lo = mid + 1
        return OptimizationResult(
            n_layers=lo, expected_fp=F(lo), region="fast",
            l_min=l_min, l_max=l_max, lower_bound=lb,
        )

    # Slow region: (L_min, L_max] has no monotonicity guarantee — scan.
    cap = min(int(math.ceil(l_max)), B)
    if max_layers is not None:
        cap = min(cap, max_layers)
    for L in range(l_min_int + 1, cap + 1):
        if F(L) <= f0:
            return OptimizationResult(
                n_layers=L, expected_fp=F(L), region="slow",
                l_min=l_min, l_max=l_max, lower_bound=lb,
            )
    raise InfeasibleError(
        f"no L in [1, {cap}] satisfies F(L) <= {f0:.4g} at B={B} "
        f"(lower bound {lb:.4g})"
    )
