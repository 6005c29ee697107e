"""Postings and their compressed binary codec.

A posting identifies a document by its physical location in cloud
storage — ``(blob name, byte offset, byte length)`` (§III-A) — so the
Searcher can range-read the document directly, with no per-document
metadata lookup.

Serialization follows the paper's compaction notes (§IV-C):

* repeated blob-name strings are compressed into integer keys through a
  :class:`StringTable` persisted once in the header block;
* postings are sorted and delta/varint encoded (LEB128), which is what
  keeps superposts small enough that fetching L of them in parallel
  beats one B-tree traversal.

The paper uses Protocol Buffers; a hand-rolled varint codec reproduces
the same wire-size characteristics without the dependency (DESIGN.md §2).
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True, order=True)
class Posting:
    """A document reference: which blob, and the byte span inside it."""

    blob_id: int
    offset: int
    length: int


class StringTable:
    """Bidirectional blob-name ↔ integer-id map (string compression)."""

    def __init__(self, names: list[str] | None = None):
        self._names: list[str] = []
        self._ids: dict[str, int] = {}
        for n in names or []:
            self.intern(n)

    def intern(self, name: str) -> int:
        """Return the id for ``name``, assigning a new one if unseen."""
        if name not in self._ids:
            self._ids[name] = len(self._names)
            self._names.append(name)
        return self._ids[name]

    def name(self, blob_id: int) -> str:
        return self._names[blob_id]

    def id(self, name: str) -> int:
        return self._ids[name]

    def names(self) -> list[str]:
        return list(self._names)

    def __len__(self) -> int:
        return len(self._names)

    def __contains__(self, name: str) -> bool:
        return name in self._ids


# -- varint primitives -----------------------------------------------------


def write_uvarint(out: bytearray, value: int) -> None:
    """Append LEB128 unsigned varint."""
    if value < 0:
        raise ValueError("uvarint cannot encode negative values")
    while True:
        b = value & 0x7F
        value >>= 7
        if value:
            out.append(b | 0x80)
        else:
            out.append(b)
            return


def read_uvarint(buf: bytes, pos: int) -> tuple[int, int]:
    """Read LEB128 unsigned varint at ``pos``; returns (value, new_pos)."""
    result = 0
    shift = 0
    while True:
        if pos >= len(buf):
            raise ValueError("truncated uvarint")
        b = buf[pos]
        pos += 1
        result |= (b & 0x7F) << shift
        if not b & 0x80:
            return result, pos
        shift += 7
        if shift > 63:
            raise ValueError("uvarint too long")


# -- postings codec ----------------------------------------------------------


def encode_postings(postings: list[Posting]) -> bytes:
    """Serialize a (super)postings list.

    Layout: count, then per posting (delta-encoded, sorted order):
    blob_id delta, offset delta (within same blob) or absolute (new blob),
    length. Sorting both canonicalizes set semantics and makes deltas small.
    """
    out = bytearray()
    ordered = sorted(set(postings))
    write_uvarint(out, len(ordered))
    prev_blob = 0
    prev_off = 0
    for p in ordered:
        db = p.blob_id - prev_blob
        write_uvarint(out, db)
        if db:
            prev_off = 0
        write_uvarint(out, p.offset - prev_off)
        write_uvarint(out, p.length)
        prev_blob, prev_off = p.blob_id, p.offset
    return bytes(out)


def decode_postings(buf: bytes) -> list[Posting]:
    """Inverse of :func:`encode_postings`; returns sorted postings."""
    n, pos = read_uvarint(buf, 0)
    postings: list[Posting] = []
    blob = 0
    off = 0
    for _ in range(n):
        db, pos = read_uvarint(buf, pos)
        blob += db
        if db:
            off = 0
        d_off, pos = read_uvarint(buf, pos)
        off += d_off
        length, pos = read_uvarint(buf, pos)
        postings.append(Posting(blob, off, length))
    if pos != len(buf):
        raise ValueError(f"trailing bytes after postings list ({len(buf) - pos})")
    return postings


def intersect(lists: list[list[Posting]]) -> list[Posting]:
    """Set intersection of postings lists — the IoU query's final step."""
    if not lists:
        return []
    acc = set(lists[0])
    for lst in lists[1:]:
        acc &= set(lst)
    return sorted(acc)


def union(lists: list[list[Posting]]) -> list[Posting]:
    """Set union of postings lists — used by boolean OR queries (§IV-F)."""
    acc: set[Posting] = set()
    for lst in lists:
        acc |= set(lst)
    return sorted(acc)
