"""Fig 8 benchmark: per-query wait/download ledger accounting."""
import pytest

from repro.harness import run_queries


@pytest.mark.benchmark(group="fig8")
def test_bench_breakdown_accounting(benchmark, bench_world):
    _, _, engines, words = bench_world
    eng = engines["airphant"]

    def run_and_split():
        stats = run_queries(eng, words, k=10)
        return stats.wait_ms.mean(), stats.download_ms.mean()

    wait, download = benchmark.pedantic(run_and_split, rounds=3, iterations=1)
    assert wait > 0 and download >= 0
