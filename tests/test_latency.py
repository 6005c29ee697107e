"""Unit tests for the simulated latency model (the paper's Fig 2 shape)."""
import numpy as np
import pytest

from repro.cloud.latency import REGIONS, LatencyModel


def _model(**kw):
    defaults = dict(first_byte_ms=30.0, stream_mbps=40.0, link_mbps=240.0,
                    jitter_sigma=0.0, seed=0)
    defaults.update(kw)
    return LatencyModel(**defaults)


class TestRequestCost:
    def test_small_request_is_wait_dominated(self):
        wait, dl = _model().request_cost(1_000)
        assert wait == pytest.approx(30.0)
        assert dl < 1.0

    def test_download_scales_linearly(self):
        m = _model()
        _, d1 = m.request_cost(1_000_000)
        _, d2 = m.request_cost(2_000_000)
        assert d2 == pytest.approx(2 * d1)
        assert d1 == pytest.approx(25.0)  # 1 MB at 40 MB/s

    def test_affine_knee_near_paper_fig2(self):
        # Fig 2: latency ~flat until ~2 MB then linear. At 2 MB download
        # time should be comparable to the first-byte latency.
        m = _model()
        wait, dl = m.request_cost(2_000_000)
        assert dl == pytest.approx(50.0)
        assert wait < dl < 3 * wait

    def test_zero_bytes(self):
        wait, dl = _model().request_cost(0)
        assert wait > 0 and dl == 0.0

    def test_jitter_deterministic_in_seed(self):
        a = LatencyModel(jitter_sigma=0.3, seed=7)
        b = LatencyModel(jitter_sigma=0.3, seed=7)
        seq_a = [a.request_cost(100)[0] for _ in range(10)]
        seq_b = [b.request_cost(100)[0] for _ in range(10)]
        assert seq_a == seq_b

    def test_jitter_varies_across_requests(self):
        m = LatencyModel(jitter_sigma=0.3, seed=7)
        waits = {round(m.request_cost(100)[0], 6) for _ in range(20)}
        assert len(waits) > 10

    def test_jitter_mean_near_one(self):
        m = LatencyModel(first_byte_ms=30.0, jitter_sigma=0.25, seed=3)
        waits = np.array([m.request_cost(0)[0] for _ in range(3000)])
        assert waits.mean() == pytest.approx(30.0, rel=0.05)

    def test_fork_gives_independent_stream(self):
        m = _model(jitter_sigma=0.3)
        f = m.fork(seed=99)
        assert f.seed == 99
        assert f.first_byte_ms == m.first_byte_ms
        assert f._counter == 0


class TestRegions:
    def test_all_regions_present(self):
        assert set(REGIONS) == {"us", "london", "singapore"}

    def test_distance_ordering(self):
        # Fig 7: farther VM -> higher first-byte latency, lower bandwidth.
        assert (
            REGIONS["us"].first_byte_ms
            < REGIONS["london"].first_byte_ms
            < REGIONS["singapore"].first_byte_ms
        )
        assert (
            REGIONS["us"].stream_mbps
            > REGIONS["london"].stream_mbps
            > REGIONS["singapore"].stream_mbps
        )

    def test_link_floor(self):
        m = _model()
        assert m.link_floor_ms(240_000) == pytest.approx(1.0)
