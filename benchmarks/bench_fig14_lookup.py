"""Fig 14 benchmark: term-index lookup, Airphant vs SQLite."""
import pytest


@pytest.mark.parametrize("engine_name", ["airphant", "sqlite"])
@pytest.mark.benchmark(group="fig14-lookup")
def test_bench_lookup(benchmark, bench_world, engine_name):
    _, _, engines, words = bench_world
    eng = engines[engine_name]

    def run_all():
        return sum(eng.lookup(w)[1].lookup_ms for w in words)

    sim_ms = benchmark.pedantic(run_all, rounds=3, iterations=1)
    assert sim_ms > 0
