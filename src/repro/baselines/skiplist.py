"""Blob-persisted skip list term index — the Apache Lucene stand-in.

Lucene's term index is a skip-list-like structure: finding a term's
postings requires traversing nodes whose addresses are only known after
reading their predecessors — *sequential dependent reads*, the access
pattern §II-B identifies as the cloud bottleneck. This module persists a
classic skip list (Pugh, p = 1/4) over the sorted term dictionary:

* node records live consecutively in one ``skiplist.bin`` blob; each
  record is fetched with a range read and carries the term, the pointer
  to its exact postings list (compacted via the shared
  :class:`SuperpostWriter` blocks), and its forward pointers;
* tower heights are deterministic in the term hash, so builds are
  reproducible;
* the head tower plus the top ``cache_levels`` node records are kept in
  Searcher memory after ``open()`` (Lucene keeps its top-level term
  index in RAM), every deeper hop is a charged dependent read; nodes
  already visited within a query are not re-fetched.

Fixed-width next-pointers keep record sizes computable before layout, so
the single-pass builder can resolve forward addresses without
backpatching.
"""
from __future__ import annotations

import struct
from dataclasses import dataclass

from repro.cloud.client import CloudClient
from repro.core.hashing import hash64
from repro.core.superpost import BinPointer

_PTR = struct.Struct("<IQI")  # postings pointer: block_id, offset, length
_NEXT = struct.Struct("<QI")  # forward pointer: node offset, node length
_NO_NEXT = (0xFFFFFFFFFFFFFFFF, 0)
MAX_HEIGHT = 12


def node_blob_name(prefix: str) -> str:
    return f"{prefix}/skiplist.bin"


def tower_height(term: str, seed: int, p_shift: int = 2, max_height: int = MAX_HEIGHT) -> int:
    """Deterministic tower height: geometric with p = 2**-p_shift (1/4)."""
    h = 1
    x = hash64(term, seed ^ 0x5C1B)
    while h < max_height and (x & ((1 << p_shift) - 1)) == 0:
        h += 1
        x >>= p_shift
    return h


@dataclass(frozen=True)
class SkipNode:
    """One decoded node record."""

    term: str
    postings: BinPointer
    nexts: tuple[tuple[int, int] | None, ...]  # per level: (offset, length)


def _node_size(term: str, height: int) -> int:
    return 2 + len(term.encode("utf-8")) + _PTR.size + 1 + height * _NEXT.size


def encode_node(node: SkipNode) -> bytes:
    term_b = node.term.encode("utf-8")
    if len(term_b) > 0xFFFF:
        raise ValueError("term too long")
    out = bytearray()
    out.extend(struct.pack("<H", len(term_b)))
    out.extend(term_b)
    out.extend(_PTR.pack(node.postings.block_id, node.postings.offset, node.postings.length))
    out.append(len(node.nexts))
    for nxt in node.nexts:
        out.extend(_NEXT.pack(*(nxt if nxt is not None else _NO_NEXT)))
    return bytes(out)


def decode_node(buf: bytes) -> SkipNode:
    (tlen,) = struct.unpack_from("<H", buf, 0)
    pos = 2
    term = buf[pos : pos + tlen].decode("utf-8")
    pos += tlen
    blk, off, ln = _PTR.unpack_from(buf, pos)
    pos += _PTR.size
    height = buf[pos]
    pos += 1
    nexts = []
    for _ in range(height):
        n_off, n_len = _NEXT.unpack_from(buf, pos)
        pos += _NEXT.size
        nexts.append(None if (n_off, n_len) == _NO_NEXT else (n_off, n_len))
    if pos != len(buf):
        raise ValueError("trailing bytes in skip node")
    return SkipNode(term=term, postings=BinPointer(blk, off, ln), nexts=tuple(nexts))


@dataclass
class SkipListLayout:
    """Build output: head tower and node addresses (persisted by the engine)."""

    heads: list[tuple[int, int] | None]  # per level: first node (offset, length)
    n_nodes: int
    blob_bytes: int


def build_skiplist(
    store, prefix: str, terms: list[tuple[str, BinPointer]], seed: int = 0
) -> SkipListLayout:
    """Lay out and persist the skip list for sorted ``(term, postings_ptr)``.

    Single pass: record sizes are position-independent, so offsets are
    prefix sums; forward pointers are then resolved by a reverse sweep.
    """
    if any(terms[i][0] >= terms[i + 1][0] for i in range(len(terms) - 1)):
        raise ValueError("terms must be strictly sorted")
    heights = [tower_height(t, seed) for t, _ in terms]
    sizes = [_node_size(t, h) for (t, _), h in zip(terms, heights)]
    offsets = [0] * len(terms)
    for i in range(1, len(terms)):
        offsets[i] = offsets[i - 1] + sizes[i - 1]
    max_h = max(heights, default=1)
    # reverse sweep: last-seen node per level is the forward target
    last: list[tuple[int, int] | None] = [None] * max_h
    nexts_per_node: list[tuple] = [()] * len(terms)
    for i in range(len(terms) - 1, -1, -1):
        h = heights[i]
        nexts_per_node[i] = tuple(last[l] for l in range(h))
        for l in range(h):
            last[l] = (offsets[i], sizes[i])
    blob = bytearray()
    for (term, ptr), nexts in zip(terms, nexts_per_node):
        blob.extend(encode_node(SkipNode(term=term, postings=ptr, nexts=nexts)))
    store.put(node_blob_name(prefix), bytes(blob))
    heads = [last[l] for l in range(max_h)]
    return SkipListLayout(heads=heads, n_nodes=len(terms), blob_bytes=len(blob))


class SkipListReader:
    """Query-side traversal with dependent reads over the cloud client."""

    def __init__(
        self,
        client: CloudClient,
        prefix: str,
        heads: list[tuple[int, int] | None],
        cache_levels: int = 2,
    ):
        self.client = client
        self.blob = node_blob_name(prefix)
        self.heads = heads
        self.cache_levels = cache_levels
        self._warm: dict[tuple[int, int], SkipNode] = {}

    def warm_cache(self) -> int:
        """Prefetch the top ``cache_levels`` levels' node records (done at
        engine open; Lucene holds its upper term index in memory).
        Returns the number of cached nodes."""
        top = len(self.heads)
        for level in range(max(0, top - self.cache_levels), top):
            addr = self.heads[level]
            while addr is not None and addr not in self._warm:
                node = decode_node(self.client.fetch(self.blob, addr[0], addr[1]))
                self._warm[addr] = node
                addr = node.nexts[level]
            # already-cached suffix: follow in-memory
            while addr is not None:
                node = self._warm[addr]
                addr = node.nexts[level]
        return len(self._warm)

    def _get(self, addr: tuple[int, int], query_cache: dict) -> SkipNode:
        if addr in self._warm:
            return self._warm[addr]
        if addr in query_cache:
            return query_cache[addr]
        node = decode_node(self.client.fetch(self.blob, addr[0], addr[1]))
        query_cache[addr] = node
        return node

    def find(self, word: str) -> BinPointer | None:
        """Locate ``word``'s postings pointer; dependent reads are charged
        to the client's active ledger. Returns None when absent."""
        if not self.heads:
            return None
        query_cache: dict[tuple[int, int], SkipNode] = {}
        node: SkipNode | None = None  # conceptual -inf head tower
        for level in range(len(self.heads) - 1, -1, -1):
            nxt = self.heads[level] if node is None else node.nexts[level]
            while nxt is not None:
                cand = self._get(nxt, query_cache)
                if cand.term <= word:
                    node = cand
                    nxt = node.nexts[level]
                else:
                    break
        if node is not None and node.term == word:
            return node.postings
        return None
