"""Fig 17 benchmark: Algorithm 1 across the paper's accuracy grid."""
import numpy as np
import pytest

from repro.core.optimizer import minimize_layers


@pytest.mark.benchmark(group="fig17")
def test_bench_optimizer(benchmark):
    g = np.random.default_rng(17)
    counts = g.integers(5, 40, size=100_000).tolist()  # 1e5-doc profile

    def optimize_all():
        return [
            minimize_layers(4000, f0, counts, n_terms=30_000).n_layers
            for f0 in (1.0, 0.01, 0.0001)
        ]

    layers = benchmark(optimize_all)
    # Fig 17a: L* increases only slightly over 4 orders of magnitude of F0
    assert layers == sorted(layers)
    assert layers[-1] - layers[0] <= 4
