"""Unit tests for the paged B-tree (SQLite stand-in)."""
import pytest

from repro.baselines.btree import (
    PAGE_SIZE,
    BTreeReader,
    PageEntry,
    build_btree,
    decode_page,
    encode_page,
)
from repro.cloud.blobstore import BlobStore
from repro.cloud.client import CloudClient
from repro.cloud.latency import LatencyModel
from repro.core.superpost import BinPointer


def _client(tmp_path):
    return CloudClient(
        BlobStore(tmp_path),
        LatencyModel(first_byte_ms=30.0, stream_mbps=40.0, link_mbps=240.0,
                     jitter_sigma=0.0, seed=0),
    )


def _terms(n):
    return [(f"k{i:06d}", BinPointer(0, i, 1)) for i in range(n)]


class TestPageCodec:
    def test_roundtrip(self):
        entries = [PageEntry(f"t{i}", BinPointer(1, i, 2)) for i in range(10)]
        buf = encode_page(True, entries)
        assert len(buf) == PAGE_SIZE
        is_leaf, got = decode_page(buf)
        assert is_leaf and got == entries

    def test_internal_flag(self):
        buf = encode_page(False, [PageEntry("a", BinPointer(3, 0, 0))])
        is_leaf, _ = decode_page(buf)
        assert not is_leaf

    def test_overflow_rejected(self):
        entries = [PageEntry("x" * 100, BinPointer(0, 0, 0)) for _ in range(50)]
        with pytest.raises(ValueError):
            encode_page(True, entries)

    def test_empty_page(self):
        is_leaf, got = decode_page(encode_page(True, []))
        assert is_leaf and got == []


class TestBuildAndFind:
    @pytest.mark.parametrize("n", [1, 5, 150, 2000])
    def test_finds_every_term(self, tmp_path, n):
        c = _client(tmp_path)
        terms = _terms(n)
        layout = build_btree(c.store, "bt", terms)
        reader = BTreeReader(c, "bt", layout.root_page)
        c.begin_query()
        for t, ptr in terms[:: max(1, n // 25)]:
            assert reader.find(t) == ptr

    def test_absent_terms(self, tmp_path):
        c = _client(tmp_path)
        layout = build_btree(c.store, "bt", _terms(500))
        reader = BTreeReader(c, "bt", layout.root_page)
        assert reader.find("a") is None
        assert reader.find("k000250z") is None
        assert reader.find("zzz") is None

    def test_depth_grows_logarithmically(self, tmp_path):
        small = build_btree(BlobStore(tmp_path / "s"), "bt", _terms(50))
        big = build_btree(BlobStore(tmp_path / "b"), "bt", _terms(20_000))
        assert small.depth == 1
        assert 2 <= big.depth <= 3  # fan-out ~190 at 4 KiB pages

    def test_unsorted_rejected(self, tmp_path):
        with pytest.raises(ValueError):
            build_btree(BlobStore(tmp_path), "bt", list(reversed(_terms(5))))

    def test_pages_are_page_sized(self, tmp_path):
        store = BlobStore(tmp_path)
        layout = build_btree(store, "bt", _terms(1000))
        assert store.size("bt/btree.bin") == layout.n_pages * PAGE_SIZE


class TestAccessPattern:
    def test_root_cached_saves_one_read(self, tmp_path):
        c = _client(tmp_path)
        layout = build_btree(c.store, "bt", _terms(20_000))
        reader = BTreeReader(c, "bt", layout.root_page)
        c.begin_query()
        reader.find("k010000")
        cold = c.ledger.round_trips
        reader.warm_root()
        c.begin_query()
        reader.find("k010000")
        assert c.ledger.round_trips == cold - 1

    def test_reads_equal_depth(self, tmp_path):
        c = _client(tmp_path)
        layout = build_btree(c.store, "bt", _terms(20_000))
        reader = BTreeReader(c, "bt", layout.root_page)
        c.begin_query()
        reader.find("k010000")
        assert c.ledger.round_trips == layout.depth

    def test_dependent_reads_are_sequential(self, tmp_path):
        c = _client(tmp_path)
        layout = build_btree(c.store, "bt", _terms(20_000))
        reader = BTreeReader(c, "bt", layout.root_page)
        c.begin_query()
        reader.find("k000123")
        # each page read is its own blocking round trip
        assert c.ledger.batches == c.ledger.round_trips
        assert c.ledger.elapsed_ms >= 30.0 * c.ledger.round_trips
