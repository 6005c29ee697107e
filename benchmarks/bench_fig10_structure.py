"""Fig 10 benchmark: one (B, L) structure build + measurement point on
the HDFS-like corpus."""
import pytest

from repro.experiments.sweep import structure_sweep


@pytest.mark.benchmark(group="fig10")
def test_bench_structure_point(benchmark, bench_world, spark):
    store, corpus, _, _ = bench_world

    def sweep_point():
        return structure_sweep(
            spark, store, corpus, bins_list=[400], layers_list=[1, 2],
            n_queries=10, k=10,
        )

    df = benchmark.pedantic(sweep_point, rounds=1, iterations=1)
    # Fig 10a's claim at fixed B: L=1 has (far) more FPs than L=2
    l1 = df[df.layers == 1].iloc[0].avg_false_pos
    l2 = df[df.layers == 2].iloc[0].avg_false_pos
    assert l1 >= l2
