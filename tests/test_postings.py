"""Unit tests for postings, the varint codec, and the string table."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.postings import (
    Posting,
    StringTable,
    decode_postings,
    encode_postings,
    intersect,
    read_uvarint,
    union,
    write_uvarint,
)


class TestUvarint:
    @pytest.mark.parametrize("v", [0, 1, 127, 128, 300, 2**32, 2**63 - 1])
    def test_roundtrip(self, v):
        buf = bytearray()
        write_uvarint(buf, v)
        got, pos = read_uvarint(bytes(buf), 0)
        assert got == v and pos == len(buf)

    def test_negative_rejected(self):
        with pytest.raises(ValueError):
            write_uvarint(bytearray(), -1)

    def test_truncated_rejected(self):
        buf = bytearray()
        write_uvarint(buf, 300)
        with pytest.raises(ValueError):
            read_uvarint(bytes(buf[:-1]), 0)

    def test_single_byte_for_small(self):
        buf = bytearray()
        write_uvarint(buf, 100)
        assert len(buf) == 1

    @given(st.lists(st.integers(0, 2**62), max_size=30))
    @settings(max_examples=100)
    def test_stream_roundtrip(self, values):
        buf = bytearray()
        for v in values:
            write_uvarint(buf, v)
        pos = 0
        got = []
        for _ in values:
            v, pos = read_uvarint(bytes(buf), pos)
            got.append(v)
        assert got == values and pos == len(buf)


_postings = st.lists(
    st.builds(
        Posting,
        blob_id=st.integers(0, 50),
        offset=st.integers(0, 10_000),
        length=st.integers(0, 500),
    ),
    max_size=60,
)


class TestPostingsCodec:
    def test_empty(self):
        assert decode_postings(encode_postings([])) == []

    def test_roundtrip_sorted_dedup(self):
        ps = [Posting(1, 10, 5), Posting(0, 0, 3), Posting(1, 10, 5)]
        assert decode_postings(encode_postings(ps)) == sorted(set(ps))

    @given(_postings)
    @settings(max_examples=150)
    def test_roundtrip_property(self, ps):
        assert decode_postings(encode_postings(ps)) == sorted(set(ps))

    def test_compression_beats_naive(self):
        # delta+varint must be far smaller than 3x8-byte fixed width
        ps = [Posting(0, i * 100, 90) for i in range(1000)]
        assert len(encode_postings(ps)) < 1000 * 24 / 4

    def test_trailing_bytes_rejected(self):
        buf = encode_postings([Posting(0, 1, 2)]) + b"\x00"
        with pytest.raises(ValueError):
            decode_postings(buf)

    def test_posting_ordering(self):
        assert Posting(0, 5, 1) < Posting(0, 6, 0) < Posting(1, 0, 0)


class TestSetOps:
    def test_intersect_basic(self):
        a = [Posting(0, 0, 1), Posting(0, 1, 1)]
        b = [Posting(0, 1, 1), Posting(0, 2, 1)]
        assert intersect([a, b]) == [Posting(0, 1, 1)]

    def test_intersect_empty_input(self):
        assert intersect([]) == []

    def test_intersect_single_list(self):
        a = [Posting(0, 1, 1), Posting(0, 0, 1)]
        assert intersect([a]) == sorted(a)

    def test_intersect_disjoint(self):
        assert intersect([[Posting(0, 0, 1)], [Posting(1, 0, 1)]]) == []

    def test_union_basic(self):
        a = [Posting(0, 0, 1)]
        b = [Posting(0, 1, 1)]
        assert union([a, b]) == [Posting(0, 0, 1), Posting(0, 1, 1)]

    def test_union_empty(self):
        assert union([]) == []

    @given(_postings, _postings)
    @settings(max_examples=50)
    def test_intersect_matches_sets(self, a, b):
        assert set(intersect([a, b])) == set(a) & set(b)

    @given(_postings, _postings)
    @settings(max_examples=50)
    def test_union_matches_sets(self, a, b):
        assert set(union([a, b])) == set(a) | set(b)


class TestStringTable:
    def test_intern_stable(self):
        t = StringTable()
        assert t.intern("a") == t.intern("a") == 0
        assert t.intern("b") == 1

    def test_name_lookup(self):
        t = StringTable(["x", "y"])
        assert t.name(0) == "x" and t.id("y") == 1

    def test_contains_len(self):
        t = StringTable(["x"])
        assert "x" in t and "y" not in t and len(t) == 1

    def test_names_copy(self):
        t = StringTable(["x"])
        t.names().append("z")
        assert len(t) == 1
