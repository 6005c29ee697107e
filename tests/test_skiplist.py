"""Unit tests for the blob-persisted skip list (Lucene stand-in)."""
import pytest

from repro.baselines.skiplist import (
    SkipListReader,
    SkipNode,
    build_skiplist,
    decode_node,
    encode_node,
    node_blob_name,
    tower_height,
)
from repro.cloud.blobstore import BlobStore
from repro.cloud.client import CloudClient
from repro.cloud.latency import LatencyModel
from repro.core.superpost import BinPointer


def _client(tmp_path, **kw):
    return CloudClient(
        BlobStore(tmp_path),
        LatencyModel(first_byte_ms=30.0, stream_mbps=40.0, link_mbps=240.0,
                     jitter_sigma=0.0, seed=0),
        **kw,
    )


def _terms(n):
    return [(f"t{i:05d}", BinPointer(0, i * 10, 10)) for i in range(n)]


class TestNodeCodec:
    @pytest.mark.parametrize(
        "nexts",
        [(), (None,), ((5, 10),), ((5, 10), None, (7, 3))],
    )
    def test_roundtrip(self, nexts):
        node = SkipNode(term="hello", postings=BinPointer(1, 2, 3), nexts=nexts)
        assert decode_node(encode_node(node)) == node

    def test_unicode_term(self):
        node = SkipNode(term="wörd", postings=BinPointer(0, 0, 1), nexts=(None,))
        assert decode_node(encode_node(node)).term == "wörd"

    def test_trailing_bytes_rejected(self):
        node = SkipNode(term="x", postings=BinPointer(0, 0, 1), nexts=(None,))
        with pytest.raises(ValueError):
            decode_node(encode_node(node) + b"\x00")


class TestTowerHeight:
    def test_deterministic(self):
        assert tower_height("abc", 0) == tower_height("abc", 0)

    def test_geometric_distribution(self):
        heights = [tower_height(f"w{i}", 0) for i in range(20_000)]
        frac2 = sum(h >= 2 for h in heights) / len(heights)
        assert frac2 == pytest.approx(0.25, abs=0.02)  # p = 1/4

    def test_bounded(self):
        assert all(1 <= tower_height(f"w{i}", 1) <= 12 for i in range(1000))


class TestBuildAndFind:
    def test_finds_every_term(self, tmp_path):
        c = _client(tmp_path)
        terms = _terms(300)
        layout = build_skiplist(c.store, "sl", terms, seed=0)
        reader = SkipListReader(c, "sl", layout.heads, cache_levels=0)
        c.begin_query()
        for term, ptr in terms[::7]:
            assert reader.find(term) == ptr

    def test_absent_terms_return_none(self, tmp_path):
        c = _client(tmp_path)
        layout = build_skiplist(c.store, "sl", _terms(100), seed=0)
        reader = SkipListReader(c, "sl", layout.heads, cache_levels=0)
        assert reader.find("zzzz") is None  # beyond all
        assert reader.find("a") is None  # before all
        assert reader.find("t00050x") is None  # between

    def test_empty_skiplist(self, tmp_path):
        c = _client(tmp_path)
        layout = build_skiplist(c.store, "sl", [], seed=0)
        reader = SkipListReader(c, "sl", layout.heads)
        assert reader.find("x") is None

    def test_single_term(self, tmp_path):
        c = _client(tmp_path)
        layout = build_skiplist(c.store, "sl", [("only", BinPointer(0, 0, 5))])
        reader = SkipListReader(c, "sl", layout.heads, cache_levels=0)
        assert reader.find("only") == BinPointer(0, 0, 5)

    def test_unsorted_terms_rejected(self, tmp_path):
        c = _client(tmp_path)
        with pytest.raises(ValueError):
            build_skiplist(c.store, "sl", [("b", BinPointer(0, 0, 1)), ("a", BinPointer(0, 1, 1))])

    def test_duplicate_terms_rejected(self, tmp_path):
        c = _client(tmp_path)
        with pytest.raises(ValueError):
            build_skiplist(c.store, "sl", [("a", BinPointer(0, 0, 1))] * 2)


class TestAccessPattern:
    """The property the paper's comparison rests on: sequential dependent
    reads that grow with corpus size."""

    def test_lookup_uses_multiple_dependent_reads(self, tmp_path):
        c = _client(tmp_path)
        layout = build_skiplist(c.store, "sl", _terms(2000), seed=0)
        reader = SkipListReader(c, "sl", layout.heads, cache_levels=0)
        c.begin_query()
        reader.find("t01000")
        assert c.ledger.round_trips >= 4
        assert c.ledger.batches == c.ledger.round_trips  # all sequential

    def test_round_trips_grow_with_n(self, tmp_path):
        def avg_rt(n, sub):
            c = _client(tmp_path / sub)
            layout = build_skiplist(c.store, "sl", _terms(n), seed=0)
            reader = SkipListReader(c, "sl", layout.heads, cache_levels=0)
            total = 0
            probes = [f"t{i:05d}" for i in range(0, n, max(1, n // 20))]
            for t in probes:
                c.begin_query()
                reader.find(t)
                total += c.ledger.round_trips
            return total / len(probes)

        assert avg_rt(4000, "big") > avg_rt(100, "small") + 2

    def test_warm_cache_reduces_reads(self, tmp_path):
        c1 = _client(tmp_path)
        layout = build_skiplist(c1.store, "sl", _terms(2000), seed=0)
        cold = SkipListReader(c1, "sl", layout.heads, cache_levels=0)
        c1.begin_query()
        cold.find("t01234")
        cold_rt = c1.ledger.round_trips

        warm = SkipListReader(c1, "sl", layout.heads, cache_levels=3)
        c1.begin_query()
        warm.warm_cache()
        c1.begin_query()
        warm.find("t01234")
        assert c1.ledger.round_trips < cold_rt

    def test_query_cache_no_refetch_within_query(self, tmp_path):
        c = _client(tmp_path)
        layout = build_skiplist(c.store, "sl", _terms(500), seed=0)
        reader = SkipListReader(c, "sl", layout.heads, cache_levels=0)
        c.begin_query()
        reader.find("t00400")
        # every charged round trip must be a distinct node
        assert c.ledger.round_trips <= layout.n_nodes
