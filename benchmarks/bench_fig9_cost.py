"""Fig 9 benchmark: the full cost-ratio grid (pure model evaluation)."""
import pytest

from repro.experiments import fig9


@pytest.mark.benchmark(group="fig9")
def test_bench_cost_grid(benchmark):
    df = benchmark(fig9.run)
    assert len(df) == len(fig9.SIZES_GB) * len(fig9.TAUS)
    # the shape claims are cheap enough to assert on every run
    big = df[(df.size_gb == 100_000) & (df.tau == 0.01)].iloc[0]
    assert big.cost_ratio_E_over_A == pytest.approx(3.29, abs=0.05)
