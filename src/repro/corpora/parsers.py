"""Corpus-document and document-word parsers (§III-C).

The Builder "uses a corpus-document parser to unwrap a blob into
documents and generate postings that refer to their documents' byte
ranges" and "a document-word parser to extract words". The defaults
mirror the paper's evaluation setup: newline-delimited documents inside
each blob, whitespace tokenization (Lucene's ``WhitespaceAnalyzer`` /
Elasticsearch's whitespace analyzer).
"""
from __future__ import annotations

from pyspark.sql import Column
from pyspark.sql import functions as F


def parse_blob(data: bytes) -> list[tuple[int, int, str]]:
    """Corpus-document parser: split a newline-delimited blob into
    ``(offset, length, text)`` byte ranges (one per document).

    The byte span excludes the trailing newline so a range read returns
    exactly the document body. Empty lines are skipped (they hold no
    document).
    """
    docs = []
    offset = 0
    for raw in data.split(b"\n"):
        if raw:
            docs.append((offset, len(raw), raw.decode("utf-8")))
        offset += len(raw) + 1
    return docs


def tokenize(text: str) -> list[str]:
    """Document-word parser: whitespace tokenization, empty tokens dropped."""
    return [w for w in text.split() if w]


def tokenize_col(col: Column | str) -> Column:
    """The same tokenizer as a Catalyst expression (Builder side): split on
    whitespace runs and drop empties, so executors and the Python searcher
    agree on the extracted words."""
    c = F.col(col) if isinstance(col, str) else col
    words = F.split(F.trim(c), r"\s+")
    return F.filter(words, lambda w: w != F.lit(""))
