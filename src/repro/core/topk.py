"""Top-K query sampling (§IV-D, Eq 6).

When a user wants only K relevant documents out of a final postings list
of size R that contains F0 false positives in expectation, each posting
is relevant with probability p = 1 - F0/R. Fetching a sample of size R_K
(Eq 6) guarantees, with probability >= 1 - delta (Hoeffding), that the
sample holds at least K relevant documents — so the Searcher can bound
its document-fetch fan-out independent of result size.
"""
from __future__ import annotations

import math


def sample_size(k: int, r: int, f0: float, delta: float) -> int:
    """R_K of Eq 6: number of postings to sample for a top-``k`` query.

    Parameters mirror the paper: ``r`` is the final postings list size,
    ``f0`` the expected false positives, ``delta`` the failure
    probability. When ``k >= r - f0`` the whole list must be fetched.
    """
    if k < 1:
        raise ValueError("k must be >= 1")
    if r < 0:
        raise ValueError("r must be >= 0")
    if not 0 < delta < 1:
        raise ValueError("delta must be in (0, 1)")
    if f0 < 0:
        raise ValueError("f0 must be >= 0")
    if k >= r - f0:
        return r
    p = 1.0 - f0 / r
    half_log = 0.5 * math.log(1.0 / delta)
    a = 2.0 * p * k + half_log
    disc = a * a - 4.0 * p * p * k * k
    rk = (a + math.sqrt(disc)) / (2.0 * p * p)
    return min(r, math.ceil(rk))
