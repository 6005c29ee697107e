"""Fig 5 benchmark: measured-vs-expected false positives on one (B, L)
point of the Cranfield-style sweep."""
import pytest

from repro.cloud.blobstore import BlobStore
from repro.corpora import generators as gen
from repro.experiments.sweep import structure_sweep


@pytest.mark.benchmark(group="fig5")
def test_bench_fp_sweep_point(benchmark, spark, tmp_path_factory):
    store = BlobStore(tmp_path_factory.mktemp("fig5"))
    corpus = gen.cranfield_like(spark, store, n_docs=300, seed=5)

    def sweep_point():
        return structure_sweep(
            spark, store, corpus, bins_list=[800], layers_list=[2],
            n_queries=15, k=None,
        )

    df = benchmark.pedantic(sweep_point, rounds=1, iterations=1)
    # measured FPs track the expectation (Fig 5's overlay claim)
    row = df.iloc[0]
    assert row.avg_false_pos <= max(10.0, 6 * row.expected_fp + 3)
