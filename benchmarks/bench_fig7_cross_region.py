"""Fig 7 benchmark: the cross-region query path (model swap + search)."""
import pytest

from repro.cloud.latency import REGIONS


@pytest.mark.parametrize("region", ["us", "london", "singapore"])
@pytest.mark.benchmark(group="fig7-region")
def test_bench_region_search(benchmark, bench_world, region):
    _, _, engines, words = bench_world
    eng = engines["airphant"]
    eng.client.model = REGIONS[region].fork(seed=7)

    def run_all():
        return sum(eng.search(w, k=10)[1].total_ms for w in words)

    sim_ms = benchmark.pedantic(run_all, rounds=3, iterations=1)
    assert sim_ms > 0
