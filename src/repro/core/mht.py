"""Multilayer Hash Table — the in-memory half of IoU Sketch (§IV-A).

The MHT holds O(L) hash seeds and O(B) bin pointers; it maps a query
word to the L pointers of the superposts that must be fetched. It stores
no original keywords (except the 1% common-word dictionary, §IV-E), so
its footprint is configurable via B — ~2 MB at B=1e5 in the paper.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.hashing import HashFamily
from repro.core.superpost import BinPointer, IndexHeader


@dataclass
class MultilayerHashTable:
    """L layers of bin-pointer arrays plus the reconstructed hash family."""

    family: HashFamily
    pointers: list[BinPointer]  # layer-major
    common: dict[str, BinPointer]

    @classmethod
    def from_header(cls, header: IndexHeader) -> "MultilayerHashTable":
        """Reconstruct the MHT from a downloaded header block."""
        family = HashFamily(seeds=header.seeds, bins_per_layer=header.bins_per_layer)
        return cls(family=family, pointers=list(header.pointers), common=dict(header.common))

    @property
    def n_layers(self) -> int:
        return self.family.n_layers

    @property
    def bins_per_layer(self) -> int:
        return self.family.bins_per_layer

    def lookup(self, word: str) -> list[BinPointer]:
        """Pointers to the word's superposts — one per layer, or the single
        exact-postings pointer when the word is in the common dictionary.

        Empty-bin pointers are kept (the caller treats them as empty
        postings lists: a word hashing to an empty bin occurs nowhere).
        """
        if word in self.common:
            return [self.common[word]]
        bpl = self.family.bins_per_layer
        return [
            self.pointers[layer * bpl + b]
            for layer, b in enumerate(self.family.bins(word))
        ]

    def memory_bytes(self) -> int:
        """Approximate resident size: 8B per seed, 12B per pointer, plus the
        common-word dictionary — the quantity the paper bounds to ~2 MB."""
        ptr_bytes = 12 * len(self.pointers)
        seed_bytes = 8 * self.n_layers
        common_bytes = sum(len(w.encode()) + 12 for w in self.common)
        return ptr_bytes + seed_bytes + common_bytes
