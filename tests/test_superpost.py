"""Unit tests for superpost compaction and the header block codec (§IV-C)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.cloud.blobstore import BlobStore
from repro.core.postings import StringTable
from repro.core.superpost import (
    EMPTY_BIN,
    BinPointer,
    IndexHeader,
    SuperpostWriter,
    block_blob_name,
    decode_header,
    encode_header,
    header_blob_name,
)


@pytest.fixture()
def store(tmp_path):
    return BlobStore(tmp_path)


class TestWriter:
    def test_single_range_read_recovers_payload(self, store):
        w = SuperpostWriter(store, "idx", block_size=1024)
        payloads = [bytes([i]) * (10 + i) for i in range(20)]
        ptrs = [w.append(p) for p in payloads]
        w.finish()
        for ptr, p in zip(ptrs, payloads):
            got = store.get_range(block_blob_name("idx", ptr.block_id), ptr.offset, ptr.length)
            assert got == p

    def test_block_cut_at_size(self, store):
        w = SuperpostWriter(store, "idx", block_size=100)
        ptrs = [w.append(b"x" * 60) for _ in range(4)]
        n = w.finish()
        assert n == 4  # 60 bytes each, no two fit per 100-byte block
        assert {p.block_id for p in ptrs} == {0, 1, 2, 3}

    def test_packs_multiple_per_block(self, store):
        w = SuperpostWriter(store, "idx", block_size=1000)
        ptrs = [w.append(b"y" * 100) for _ in range(5)]
        assert w.finish() == 1
        assert all(p.block_id == 0 for p in ptrs)
        assert [p.offset for p in ptrs] == [0, 100, 200, 300, 400]

    def test_superpost_never_spans_blocks(self, store):
        w = SuperpostWriter(store, "idx", block_size=150)
        for _ in range(10):
            ptr = w.append(b"z" * 100)
            assert ptr.offset + ptr.length <= 150
        w.finish()

    def test_empty_payload_gives_empty_bin(self, store):
        w = SuperpostWriter(store, "idx")
        assert w.append(b"") == EMPTY_BIN
        assert w.finish() == 0

    def test_finish_twice_rejected(self, store):
        w = SuperpostWriter(store, "idx")
        w.append(b"a")
        w.finish()
        with pytest.raises(RuntimeError):
            w.finish()

    def test_append_after_finish_rejected(self, store):
        w = SuperpostWriter(store, "idx")
        w.finish()
        with pytest.raises(RuntimeError):
            w.append(b"a")

    def test_oversized_payload_gets_own_block(self, store):
        w = SuperpostWriter(store, "idx", block_size=50)
        w.append(b"s" * 10)
        big = w.append(b"B" * 200)  # exceeds block size: flushed alone
        w.finish()
        got = store.get_range(block_blob_name("idx", big.block_id), big.offset, big.length)
        assert got == b"B" * 200


def _header(**over):
    kw = dict(
        seeds=(11, 22, 33),
        bins_per_layer=4,
        pointers=[BinPointer(i % 2, i * 10, 5) for i in range(12)],
        common={"the": BinPointer(0, 0, 9), "a": BinPointer(1, 5, 3)},
        string_table=StringTable(["c/one.txt", "c/two.txt"]),
        n_blocks=2,
        n_docs=100,
        n_terms=50,
        total_words=1000,
        f0=1.0,
        meta={"expected_fp": 0.25, "base_layers": 3.0},
    )
    kw.update(over)
    return IndexHeader(**kw)


class TestHeaderCodec:
    def test_roundtrip(self):
        h = _header()
        h2 = decode_header(encode_header(h))
        assert h2.seeds == h.seeds
        assert h2.bins_per_layer == h.bins_per_layer
        assert h2.pointers == h.pointers
        assert h2.common == h.common
        assert h2.string_table.names() == h.string_table.names()
        assert (h2.n_blocks, h2.n_docs, h2.n_terms, h2.total_words) == (2, 100, 50, 1000)
        assert h2.f0 == 1.0
        assert h2.meta == h.meta

    def test_pointer_accessor(self):
        h = _header()
        assert h.pointer(2, 3) == h.pointers[2 * 4 + 3]
        assert h.n_layers == 3

    def test_bad_magic_rejected(self):
        with pytest.raises(ValueError):
            decode_header(b"XXXX" + encode_header(_header())[4:])

    def test_trailing_bytes_rejected(self):
        with pytest.raises(ValueError):
            decode_header(encode_header(_header()) + b"\x01")

    def test_pointer_count_validated(self):
        with pytest.raises(ValueError):
            encode_header(_header(pointers=[EMPTY_BIN] * 3))

    def test_empty_common_and_meta(self):
        h = _header(common={}, meta={})
        h2 = decode_header(encode_header(h))
        assert h2.common == {} and h2.meta == {}

    @given(st.floats(min_value=1e-9, max_value=1e6, allow_nan=False))
    @settings(max_examples=50)
    def test_f0_precision_preserved(self, f0):
        h2 = decode_header(encode_header(_header(f0=f0)))
        assert h2.f0 == f0

    def test_unicode_common_word(self):
        h = _header(common={"wörd→": BinPointer(0, 1, 2)})
        assert "wörd→" in decode_header(encode_header(h)).common

    def test_blob_names(self):
        assert block_blob_name("idx", 3) == "idx/superposts-00003.bin"
        assert header_blob_name("idx") == "idx/header.bin"
