"""Unit tests for the Multilayer Hash Table (§IV-A)."""
import pytest

from repro.core.hashing import HashFamily
from repro.core.mht import MultilayerHashTable
from repro.core.postings import StringTable
from repro.core.superpost import BinPointer, EMPTY_BIN, IndexHeader


def _mht(n_layers=3, bins=8, common=None):
    fam = HashFamily.create(n_layers, bins, base_seed=1)
    pointers = [BinPointer(0, i, 1) for i in range(n_layers * bins)]
    return MultilayerHashTable(family=fam, pointers=pointers, common=common or {})


class TestLookup:
    def test_one_pointer_per_layer(self):
        mht = _mht(n_layers=4)
        assert len(mht.lookup("word")) == 4

    def test_lookup_matches_family_bins(self):
        mht = _mht(n_layers=3, bins=8)
        ptrs = mht.lookup("hello")
        for layer, b in enumerate(mht.family.bins("hello")):
            assert ptrs[layer] == mht.pointers[layer * 8 + b]

    def test_common_word_single_exact_pointer(self):
        special = BinPointer(9, 9, 9)
        mht = _mht(common={"the": special})
        assert mht.lookup("the") == [special]

    def test_empty_bins_preserved(self):
        fam = HashFamily.create(2, 4, base_seed=1)
        mht = MultilayerHashTable(family=fam, pointers=[EMPTY_BIN] * 8, common={})
        assert all(p.empty for p in mht.lookup("x"))

    def test_deterministic(self):
        a, b = _mht(), _mht()
        for w in ("x", "y", "zebra"):
            assert a.lookup(w) == b.lookup(w)


class TestFromHeader:
    def test_reconstruction(self):
        fam = HashFamily.create(2, 4, base_seed=7)
        header = IndexHeader(
            seeds=fam.seeds,
            bins_per_layer=4,
            pointers=[BinPointer(0, i, 2) for i in range(8)],
            common={"hot": BinPointer(1, 0, 3)},
            string_table=StringTable(),
            n_blocks=2,
            n_docs=10,
            n_terms=5,
            total_words=50,
            f0=1.0,
        )
        mht = MultilayerHashTable.from_header(header)
        assert mht.n_layers == 2
        assert mht.bins_per_layer == 4
        assert mht.lookup("hot") == [BinPointer(1, 0, 3)]
        # same seeds -> same word mapping as a directly-created family
        assert mht.family.bins("w") == fam.bins("w")


class TestMemory:
    def test_memory_scales_with_bins(self):
        small = _mht(n_layers=2, bins=10)
        big = _mht(n_layers=2, bins=1000)
        assert big.memory_bytes() > 50 * small.memory_bytes()

    def test_paper_scale_fits_2mb(self):
        # B=1e5 total pointers -> the paper's ~2 MB Searcher footprint
        fam = HashFamily.create(2, 50_000, base_seed=0)
        mht = MultilayerHashTable(
            family=fam, pointers=[EMPTY_BIN] * 100_000, common={}
        )
        assert mht.memory_bytes() < 2 << 20
