"""Table II benchmark: the Builder's single-pass corpus profiling."""
import pytest

from repro.core.builder import profile_corpus
from repro.core.sketch import sigma_x


@pytest.mark.benchmark(group="table2")
def test_bench_profile_pass(benchmark, bench_world):
    _, corpus, _, _ = bench_world

    def profile():
        p = profile_corpus(corpus.df)
        return sigma_x(p.n_docs, p.n_terms, p.doc_word_counts)

    sigma = benchmark.pedantic(profile, rounds=3, iterations=1)
    assert sigma > 0
