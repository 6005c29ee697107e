"""Tests for the experiment drivers (cheap slices; full runs live in jobs/)."""
import pytest

from repro.experiments import fig9, table2
from repro.experiments.sweep import corpus_truth


class TestTable2Analytics:
    @pytest.mark.parametrize(
        "name,paper_sigma",
        [(n, row[3]) for n, row in table2.PAPER_ROWS.items()],
    )
    def test_analytic_sigma_matches_paper(self, name, paper_sigma):
        # the closed form at the paper's published sizes reproduces the
        # published sigma_X within a few percent for every corpus
        assert table2.analytic_paper_sigma(name) == pytest.approx(
            paper_sigma, rel=0.07
        )


class TestFig9Driver:
    def test_grid_and_constants(self):
        df = fig9.run()
        assert len(df) == len(fig9.SIZES_GB) * len(fig9.TAUS)
        # monotone in S for fixed tau (bottom-to-top lines of Fig 9)
        for tau in fig9.TAUS:
            col = df[df.tau == tau].sort_values("size_gb").cost_ratio_E_over_A
            assert col.is_monotonic_increasing

    def test_monotone_in_tau(self):
        df = fig9.run()
        for size in fig9.SIZES_GB:
            row = df[df.size_gb == size].sort_values("tau").cost_ratio_E_over_A
            assert row.is_monotonic_decreasing


class TestSweepHelpers:
    def test_corpus_truth_counts(self, spark, tmp_path):
        from repro.cloud.blobstore import BlobStore
        from repro.corpora import generators as gen

        store = BlobStore(tmp_path)
        h = gen.write_corpus(spark, store, "t", ["a b", "a c", "b"])
        truth = corpus_truth(h.df, ["a", "b", "c", "zzz"])
        assert truth == {"a": 2, "b": 2, "c": 1, "zzz": 0}
