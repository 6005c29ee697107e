"""Blob-persisted paged B-tree term index — the SQLite stand-in.

The paper uses SQLite as "a practical B-tree implementation": a two
column (keyword, postings) table with a B-tree index on the keyword,
its database file living on the cloud-mounted directory. What matters
for the comparison is the access pattern: fixed-size pages (SQLite's
default 4096 bytes), each level a *dependent* range read, with the root
page cached after the first touch.

This module builds the B-tree bottom-up from the sorted term dictionary:
leaf pages hold (term → postings pointer) entries, internal pages hold
(first-term-of-child → child page id) separators. Pages are padded to
``PAGE_SIZE`` and stored consecutively in one ``btree.bin`` blob, so a
child pointer is just a page number (offset = page_id * PAGE_SIZE),
exactly like SQLite's file format.
"""
from __future__ import annotations

import struct
from dataclasses import dataclass

from repro.cloud.client import CloudClient
from repro.core.superpost import BinPointer

PAGE_SIZE = 4096
_PTR = struct.Struct("<IQI")  # postings ptr / child page id (block,offset,length)
_HDR = struct.Struct("<BH")  # is_leaf, n_entries


def tree_blob_name(prefix: str) -> str:
    return f"{prefix}/btree.bin"


@dataclass(frozen=True)
class PageEntry:
    """Leaf: term → postings pointer. Internal: first term → child page id
    (stored in the pointer's block_id field)."""

    term: str
    ptr: BinPointer


def _entry_size(term: str) -> int:
    return 2 + len(term.encode("utf-8")) + _PTR.size


def encode_page(is_leaf: bool, entries: list[PageEntry]) -> bytes:
    out = bytearray()
    out.extend(_HDR.pack(1 if is_leaf else 0, len(entries)))
    for e in entries:
        tb = e.term.encode("utf-8")
        out.extend(struct.pack("<H", len(tb)))
        out.extend(tb)
        out.extend(_PTR.pack(e.ptr.block_id, e.ptr.offset, e.ptr.length))
    if len(out) > PAGE_SIZE:
        raise ValueError(f"page overflow ({len(out)} > {PAGE_SIZE})")
    out.extend(b"\x00" * (PAGE_SIZE - len(out)))
    return bytes(out)


def decode_page(buf: bytes) -> tuple[bool, list[PageEntry]]:
    is_leaf, n = _HDR.unpack_from(buf, 0)
    pos = _HDR.size
    entries = []
    for _ in range(n):
        (tlen,) = struct.unpack_from("<H", buf, pos)
        pos += 2
        term = buf[pos : pos + tlen].decode("utf-8")
        pos += tlen
        blk, off, ln = _PTR.unpack_from(buf, pos)
        pos += _PTR.size
        entries.append(PageEntry(term, BinPointer(blk, off, ln)))
    return bool(is_leaf), entries


@dataclass
class BTreeLayout:
    """Build output persisted by the engine's header."""

    root_page: int
    n_pages: int
    depth: int
    blob_bytes: int


def _pack_level(entries: list[PageEntry], is_leaf: bool) -> list[list[PageEntry]]:
    """Greedy fill: pack entries into pages without exceeding PAGE_SIZE."""
    pages: list[list[PageEntry]] = []
    cur: list[PageEntry] = []
    used = _HDR.size
    for e in entries:
        sz = _entry_size(e.term)
        if cur and used + sz > PAGE_SIZE:
            pages.append(cur)
            cur, used = [], _HDR.size
        cur.append(e)
        used += sz
    if cur or not pages:
        pages.append(cur)
    return pages


def build_btree(
    store, prefix: str, terms: list[tuple[str, BinPointer]]
) -> BTreeLayout:
    """Build bottom-up and persist; ``terms`` must be strictly sorted."""
    if any(terms[i][0] >= terms[i + 1][0] for i in range(len(terms) - 1)):
        raise ValueError("terms must be strictly sorted")
    pages_bytes: list[bytes] = []
    level_entries = [PageEntry(t, p) for t, p in terms]
    is_leaf = True
    depth = 0
    while True:
        depth += 1
        level_pages = _pack_level(level_entries, is_leaf)
        first_id = len(pages_bytes)
        parents: list[PageEntry] = []
        for i, page in enumerate(level_pages):
            pages_bytes.append(encode_page(is_leaf, page))
            first_term = page[0].term if page else ""
            parents.append(PageEntry(first_term, BinPointer(first_id + i, 0, 0)))
        if len(level_pages) == 1:
            root = first_id
            break
        level_entries = parents
        is_leaf = False
    blob = b"".join(pages_bytes)
    store.put(tree_blob_name(prefix), blob)
    return BTreeLayout(
        root_page=root, n_pages=len(pages_bytes), depth=depth, blob_bytes=len(blob)
    )


class BTreeReader:
    """Root-to-leaf traversal; root page cached at open, every deeper page
    a charged dependent read (per-query page cache avoids re-reads)."""

    def __init__(self, client: CloudClient, prefix: str, root_page: int):
        self.client = client
        self.blob = tree_blob_name(prefix)
        self.root_page = root_page
        self._root: tuple[bool, list[PageEntry]] | None = None

    def _fetch_page(self, page_id: int) -> tuple[bool, list[PageEntry]]:
        buf = self.client.fetch(self.blob, page_id * PAGE_SIZE, PAGE_SIZE)
        return decode_page(buf)

    def warm_root(self) -> None:
        """Cache the root page (charged once, at engine open)."""
        self._root = self._fetch_page(self.root_page)

    @staticmethod
    def _descend(entries: list[PageEntry], word: str) -> PageEntry | None:
        """Rightmost entry with term <= word (binary search)."""
        lo, hi = 0, len(entries)
        while lo < hi:
            mid = (lo + hi) // 2
            if entries[mid].term <= word:
                lo = mid + 1
            else:
                hi = mid
        return entries[lo - 1] if lo else None

    def find(self, word: str) -> BinPointer | None:
        """Locate ``word``'s postings pointer, or None when absent."""
        if self._root is not None:
            is_leaf, entries = self._root
        else:
            is_leaf, entries = self._fetch_page(self.root_page)
        while True:
            hit = self._descend(entries, word)
            if hit is None:
                return None
            if is_leaf:
                return hit.ptr if hit.term == word else None
            is_leaf, entries = self._fetch_page(hit.ptr.block_id)
