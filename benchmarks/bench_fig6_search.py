"""Fig 6 benchmark: end-to-end search, one benchmark per engine.

Wall-clock here measures the engine's real algorithmic work (hashing,
decoding, intersection, filtering); the simulated network latencies of
the reproduced table come from jobs/fig6_end_to_end.py.
"""
import pytest

from repro.harness import ENGINE_ORDER


@pytest.mark.parametrize("engine_name", ENGINE_ORDER)
@pytest.mark.benchmark(group="fig6-search")
def test_bench_search(benchmark, bench_world, engine_name):
    _, _, engines, words = bench_world
    eng = engines[engine_name]

    def run_all():
        total = 0
        for w in words:
            results, stats = eng.search(w, k=10)
            total += stats.n_results
        return total

    total = benchmark.pedantic(run_all, rounds=3, iterations=1)
    assert total >= 0
