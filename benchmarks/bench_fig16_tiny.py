"""Fig 16 benchmark: a tiny-structure point on a Cranfield-style corpus,
including the storage-vs-L measurement."""
import pytest

from repro.cloud.blobstore import BlobStore
from repro.corpora import generators as gen
from repro.experiments.sweep import structure_sweep


@pytest.mark.benchmark(group="fig16")
def test_bench_tiny_structure(benchmark, spark, tmp_path_factory):
    store = BlobStore(tmp_path_factory.mktemp("fig16"))
    corpus = gen.cranfield_like(spark, store, n_docs=250, seed=16)

    def sweep():
        return structure_sweep(
            spark, store, corpus, bins_list=[600], layers_list=[1, 4],
            n_queries=10, k=10,
        )

    df = benchmark.pedantic(sweep, rounds=1, iterations=1)
    # Fig 16d: storage grows with L (sublinearly)
    s1 = df[df.layers == 1].iloc[0].index_bytes
    s4 = df[df.layers == 4].iloc[0].index_bytes
    assert s1 < s4 < 4.5 * s1
