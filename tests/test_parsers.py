"""Unit tests for corpus-document and document-word parsers (§III-C)."""
import pytest

from repro.corpora.parsers import parse_blob, tokenize


class TestParseBlob:
    def test_basic_split(self):
        docs = parse_blob(b"hello world\nsecond doc\n")
        assert docs == [(0, 11, "hello world"), (12, 10, "second doc")]

    def test_offsets_are_byte_ranges(self):
        blob = b"abc\nde\nfgh\n"
        for off, ln, text in parse_blob(blob):
            assert blob[off : off + ln].decode() == text

    def test_no_trailing_newline(self):
        assert parse_blob(b"only") == [(0, 4, "only")]

    def test_empty_lines_skipped(self):
        docs = parse_blob(b"a\n\nb\n")
        assert [t for _, _, t in docs] == ["a", "b"]
        # offsets still account for the skipped line
        assert docs[1][0] == 3

    def test_empty_blob(self):
        assert parse_blob(b"") == []

    def test_utf8(self):
        docs = parse_blob("héllo wörld\n".encode())
        assert docs[0][2] == "héllo wörld"


class TestTokenize:
    def test_whitespace_split(self):
        assert tokenize("a b  c\td") == ["a", "b", "c", "d"]

    def test_empty(self):
        assert tokenize("") == []
        assert tokenize("   ") == []

    def test_single(self):
        assert tokenize("word") == ["word"]

    def test_preserves_punctuation_tokens(self):
        # whitespace analyzer semantics: punctuation stays inside tokens
        assert tokenize("dfs.DataNode: blk_123") == ["dfs.DataNode:", "blk_123"]
