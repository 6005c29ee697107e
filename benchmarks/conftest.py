"""Shared fixtures for the per-table benchmarks.

Benchmarks measure the real wall-clock cost of each reproduced table's
workload slice (build, lookup, search, optimize) at SF-small scale; the
full-scale numbers land in EXPERIMENTS.md via jobs/. A single prebuilt
"world" (one corpus + all five engines) is shared across benchmarks so
`pytest benchmarks/ --benchmark-only` stays in the minutes range.
"""
import pytest

from repro.cloud.blobstore import BlobStore
from repro.corpora import generators as gen
from repro.harness import build_all_engines, sample_query_words


@pytest.fixture(scope="session")
def bench_world(spark, tmp_path_factory):
    """hdfs-like corpus (SF ~= benchmarks' 5e3 docs) + all five engines."""
    store = BlobStore(tmp_path_factory.mktemp("bench"))
    corpus = gen.hdfs_like(spark, store, n_docs=5_000, seed=1)
    engines = build_all_engines(spark, store, corpus)
    words = sample_query_words(corpus.df, 30, seed=2)
    return store, corpus, engines, words
