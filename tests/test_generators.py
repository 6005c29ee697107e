"""Spark tests for the corpus generators (Table II stand-ins)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.cloud.blobstore import BlobStore
from repro.corpora import generators as gen
from repro.corpora.parsers import parse_blob
from repro.oracle import assert_equivalent


@pytest.fixture()
def store(tmp_path):
    return BlobStore(tmp_path)


class TestWriteCorpus:
    def test_schema(self, spark, store):
        h = gen.write_corpus(spark, store, "c", ["a b", "c d e"])
        assert set(h.df.columns) == {"doc_id", "blob", "offset", "length", "text"}
        assert h.n_docs == 2

    def test_byte_ranges_recover_documents(self, spark, store):
        texts = ["hello world", "second doc here", "third"]
        h = gen.write_corpus(spark, store, "c", texts)
        for row in h.df.collect():
            raw = store.get_range(row["blob"], row["offset"], row["length"])
            assert raw.decode() == row["text"] == texts[row["doc_id"]]

    def test_blob_packing(self, spark, store):
        h = gen.write_corpus(spark, store, "c", [f"doc {i}" for i in range(25)], docs_per_blob=10)
        blobs = {r["blob"] for r in h.df.select("blob").distinct().collect()}
        assert len(blobs) == 3

    def test_blob_is_newline_delimited(self, spark, store):
        texts = ["a a", "b", "c c c"]
        gen.write_corpus(spark, store, "nd", texts, docs_per_blob=10)
        docs = parse_blob(store.get("nd/corpus-00000.txt"))
        assert [t for _, _, t in docs] == texts

    def test_newline_rejected(self, spark, store):
        with pytest.raises(ValueError):
            gen.write_corpus(spark, store, "c", ["bad\ndoc"])

    def test_doc_count_matches_oracle(self, spark, store):
        h = gen.write_corpus(spark, store, "c", [f"w{i}" for i in range(50)])
        got = h.df.agg(F.count("*").alias("n"))
        assert_equivalent(got, "SELECT count(*) AS n FROM corpus", corpus=h.df)


class TestSyntheticFamilies:
    def test_diag_one_word_per_doc(self, spark, store):
        h = gen.diag(spark, store, 100)
        rows = h.df.collect()
        assert len(rows) == 100
        words = {r["text"] for r in rows}
        assert len(words) == 100  # nd == nw, one distinct word each

    def test_unif_vocabulary_bounded(self, spark, store):
        h = gen.unif(spark, store, 200, 50, 10, seed=1)
        n_terms = (
            h.df.select(F.explode(F.split("text", " ")).alias("w"))
            .distinct()
            .count()
        )
        assert n_terms <= 50
        assert n_terms > 35  # coupon collector: most of the vocab seen

    def test_unif_line_length(self, spark, store):
        h = gen.unif(spark, store, 50, 20, 7, seed=1)
        sizes = h.df.select(F.size(F.split("text", " ")).alias("s")).collect()
        assert all(r["s"] == 7 for r in sizes)

    def test_zipf_skew(self, spark, store):
        h = gen.zipf(spark, store, 500, 1000, 10, alpha=1.07, seed=2)
        counts = (
            h.df.select(F.explode(F.split("text", " ")).alias("w"))
            .groupBy("w")
            .count()
            .orderBy(F.desc("count"))
            .collect()
        )
        # head word much more frequent than the tail (Zipf signature)
        assert counts[0]["count"] > 20 * counts[-1]["count"]

    def test_zipf_under_generates_vocab(self, spark, store):
        # the paper notes zipf yields ~half the nominal vocabulary
        h = gen.zipf(spark, store, 500, 2000, 10, seed=0)
        n_terms = (
            h.df.select(F.explode(F.split("text", " ")).alias("w")).distinct().count()
        )
        assert n_terms < 2000 * 0.8

    def test_determinism(self, spark, tmp_path):
        a = gen.zipf(spark, BlobStore(tmp_path / "a"), 50, 100, 5, seed=7)
        b = gen.zipf(spark, BlobStore(tmp_path / "b"), 50, 100, 5, seed=7)
        assert [r["text"] for r in a.df.orderBy("doc_id").collect()] == [
            r["text"] for r in b.df.orderBy("doc_id").collect()
        ]


class TestRealCorpusStandIns:
    """Each stand-in must keep its Table II signature ratios (scaled)."""

    def _stats(self, h):
        pairs = h.df.select(
            "doc_id", F.explode(F.split("text", " ")).alias("w")
        )
        n_terms = pairs.select("w").distinct().count()
        words_per_doc = pairs.count() / h.n_docs
        return n_terms, words_per_doc

    def test_cranfield_signature(self, spark, store):
        h = gen.cranfield_like(spark, store, n_docs=1398, seed=0)
        n_terms, wpd = self._stats(h)
        # Table II: 5.3e3 terms, 1.2e5/1398 ~= 86 words per doc
        assert n_terms == pytest.approx(5300, rel=0.25)
        assert wpd == pytest.approx(86, rel=0.25)

    def test_hdfs_signature(self, spark, store):
        h = gen.hdfs_like(spark, store, n_docs=3000, seed=1)
        n_terms, wpd = self._stats(h)
        assert n_terms / h.n_docs == pytest.approx(0.33, rel=0.35)
        assert wpd == pytest.approx(13, rel=0.25)

    def test_windows_signature(self, spark, store):
        h = gen.windows_like(spark, store, n_docs=20_000, seed=2)
        n_terms, wpd = self._stats(h)
        assert n_terms / h.n_docs < 0.1  # few terms relative to docs
        assert wpd == pytest.approx(15, rel=0.25)

    def test_spark_signature(self, spark, store):
        h = gen.spark_like(spark, store, n_docs=5000, seed=3)
        n_terms, wpd = self._stats(h)
        assert n_terms / h.n_docs == pytest.approx(0.157, rel=0.5)
        assert wpd == pytest.approx(11, rel=0.3)

    @pytest.mark.parametrize("maker", [gen.hdfs_like, gen.windows_like, gen.spark_like])
    def test_log_corpora_have_common_words(self, spark, store, maker):
        # INFO/WARN/ERROR must be extremely common (common-word bins, §IV-E)
        h = maker(spark, store, n_docs=1000)
        info = h.df.filter(F.col("text").contains("INFO")).count()
        assert info > 0.2 * h.n_docs
