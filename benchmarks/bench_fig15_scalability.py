"""Fig 15 benchmark: full index-build throughput at one sweep size."""
import pytest

from repro.cloud.blobstore import BlobStore
from repro.core.builder import AirphantBuilder, BuilderConfig
from repro.corpora import generators as gen


@pytest.mark.benchmark(group="fig15")
def test_bench_index_build(benchmark, spark, tmp_path_factory):
    store = BlobStore(tmp_path_factory.mktemp("fig15"))
    corpus = gen.zipf(spark, store, 2_000, 2_000, 10, seed=15, name="zipfb")
    counter = iter(range(1000))

    def build():
        cfg = BuilderConfig(bins=300, f0=1.0, seed=1)
        return AirphantBuilder(spark, store, cfg).build(
            corpus.df, f"zb-{next(counter)}"
        )

    report = benchmark.pedantic(build, rounds=2, iterations=1)
    assert report.index_bytes > 0
