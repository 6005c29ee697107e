"""Spark tests for the experiment harness."""
import pytest
from pyspark.sql import functions as F

from repro.cloud.blobstore import BlobStore
from repro.corpora import generators as gen
from repro import harness


@pytest.fixture()
def store(tmp_path):
    return BlobStore(tmp_path)


class TestQuickProfile:
    def test_matches_full_profile(self, spark, store):
        from repro.core.builder import profile_corpus

        h = gen.zipf(spark, store, 150, 120, 6, seed=1)
        quick = harness.quick_profile(h.df)
        full = profile_corpus(h.df)
        assert quick.n_docs == full.n_docs
        assert quick.n_terms == full.n_terms
        assert quick.total_words == full.total_words
        assert quick.mean_wi == pytest.approx(full.sum_wi / full.n_docs)


class TestCorpusRegistry:
    @pytest.mark.parametrize("name", harness.CORPUS_ORDER)
    def test_make_corpus_known_names(self, name):
        # only validates dispatch; generation itself is covered elsewhere
        assert name in harness.CORPUS_ORDER

    def test_unknown_name_rejected(self, spark, store):
        with pytest.raises(ValueError):
            harness.make_corpus(spark, store, "nope")


class TestSampling:
    def test_uniform_words_come_from_vocab(self, spark, store):
        h = gen.zipf(spark, store, 100, 80, 5, seed=2)
        words = harness.sample_query_words(h.df, 30, seed=1)
        vocab = {
            r["w"]
            for r in h.df.select(F.explode(F.split("text", " ")).alias("w"))
            .distinct()
            .collect()
        }
        assert len(words) == 30
        assert set(words) <= vocab

    def test_deterministic(self, spark, store):
        h = gen.zipf(spark, store, 100, 80, 5, seed=2)
        a = harness.sample_query_words(h.df, 10, seed=3)
        b = harness.sample_query_words(h.df, 10, seed=3)
        assert a == b

    def test_uniform_not_frequency_weighted(self, spark, store):
        # zipf text is dominated by w0; a uniform *vocabulary* sample
        # must not be.
        h = gen.zipf(spark, store, 300, 500, 10, seed=4)
        words = harness.sample_query_words(h.df, 200, seed=5)
        assert sum(w == "w0" for w in words) < 20


class TestEngineFactory:
    def test_all_kinds_constructible(self, spark, store):
        for kind in harness.ENGINE_ORDER:
            eng = harness.make_engine(kind, spark, store)
            assert eng.client.threads == 32

    def test_jitter_streams_differ_by_engine(self, spark, store):
        a = harness.make_engine("airphant", spark, store)
        b = harness.make_engine("lucene", spark, store)
        assert a.client.model.seed != b.client.model.seed

    def test_jitter_deterministic(self, spark, store):
        a = harness.make_engine("airphant", spark, store, jitter_seed=5)
        b = harness.make_engine("airphant", spark, store, jitter_seed=5)
        assert a.client.model.seed == b.client.model.seed

    def test_cache_only_for_file_backed(self, spark, store):
        lu = harness.make_engine("lucene", spark, store, cache_bytes=1000)
        air = harness.make_engine("airphant", spark, store, cache_bytes=1000)
        assert lu.client.cache_bytes == 1000
        assert air.client.cache_bytes == 0

    def test_region_presets(self, spark, store):
        us = harness.make_engine("sqlite", spark, store, region="us")
        sg = harness.make_engine("sqlite", spark, store, region="singapore")
        assert sg.client.model.first_byte_ms > us.client.model.first_byte_ms


class TestEndToEnd:
    def test_build_and_query_three_engines(self, spark, store):
        corpus = gen.zipf(spark, store, 120, 100, 6, seed=7)
        engines = harness.build_all_engines(
            spark, store, corpus, engines=["airphant", "sqlite", "hashtable"]
        )
        words = harness.sample_query_words(corpus.df, 8, seed=0)
        for eng in engines.values():
            stats = harness.run_queries(eng, words, k=5)
            assert len(stats) == 8
            assert (stats.total_ms > 0).all()
        summary = harness.summarize(harness.run_queries(engines["airphant"], words))
        assert 0 < summary["mean_ms"] <= summary["p99_ms"]

    def test_run_lookups(self, spark, store):
        corpus = gen.zipf(spark, store, 100, 80, 5, seed=8)
        engines = harness.build_all_engines(spark, store, corpus, engines=["sqlite"])
        stats = harness.run_lookups(engines["sqlite"], ["w1", "w2"])
        assert len(stats) == 2
        assert (stats.doc_ms == 0).all()  # lookup only, no documents
