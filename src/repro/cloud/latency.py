"""Simulated network-latency model for cloud-storage requests.

Reproduces the affine request-cost behaviour the paper measures in Fig 2:
end-to-end retrieval latency is ~flat (dominated by first-byte network
latency) until the payload reaches a few megabytes, after which it grows
linearly with size (bandwidth-bound). Each logical request is charged

    wait_ms     = first_byte_ms * jitter          (time blocked, 0 bytes)
    download_ms = nbytes / bandwidth              (time streaming)

with multiplicative lognormal jitter so tail percentiles (p99 bars in
Figs 6/7/14) are meaningful. ``REGIONS`` presets calibrate first-byte
latency and bandwidth to the paper's Iowa/London/Singapore setups
(Fig 7): cross-continent round-trips are several times slower while
bandwidth degrades more mildly.

The model is deterministic in ``seed``: a fresh ``numpy`` generator is
derived per (model, request-ordinal), so replaying the same workload
yields the same latencies.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class LatencyModel:
    """Affine request cost with lognormal first-byte jitter.

    Parameters
    ----------
    first_byte_ms:
        Median time-to-first-byte of a single request (network RTT +
        service time). The paper observes ~30-50 ms within-region.
    stream_mbps:
        Per-request (per-TCP-stream) throughput in MB/s once bytes flow.
    link_mbps:
        Shared NIC/link throughput in MB/s across all concurrent
        requests — the source of the bandwidth contention the paper
        reports when fetching many superposts at once (§V-D).
    jitter_sigma:
        Sigma of the lognormal multiplier on first-byte latency
        (0 disables jitter).
    seed:
        Base seed; request ``k`` draws from ``default_rng((seed, k))``.
    """

    first_byte_ms: float = 30.0
    stream_mbps: float = 40.0
    link_mbps: float = 240.0
    jitter_sigma: float = 0.25
    seed: int = 0
    _counter: int = field(default=0, repr=False)

    def _jitter(self) -> float:
        if self.jitter_sigma <= 0:
            return 1.0
        g = np.random.default_rng((self.seed, self._counter))
        # mean-1 lognormal so calibrated medians stay put
        return float(g.lognormal(mean=-self.jitter_sigma**2 / 2, sigma=self.jitter_sigma))

    def request_cost(self, nbytes: int) -> tuple[float, float]:
        """(wait_ms, download_ms) for one request of ``nbytes``."""
        self._counter += 1
        wait = self.first_byte_ms * self._jitter()
        download = nbytes / (self.stream_mbps * 1e3)  # MB/s -> bytes/ms
        return wait, download

    def link_floor_ms(self, total_bytes: int) -> float:
        """Minimum streaming time for ``total_bytes`` through the shared link."""
        return total_bytes / (self.link_mbps * 1e3)

    def fork(self, seed: int) -> "LatencyModel":
        """A copy with an independent jitter stream (per-query isolation)."""
        return LatencyModel(
            first_byte_ms=self.first_byte_ms,
            stream_mbps=self.stream_mbps,
            link_mbps=self.link_mbps,
            jitter_sigma=self.jitter_sigma,
            seed=seed,
        )


#: Region presets calibrated to the paper's Fig 2 / Fig 7 setup: the VM is
#: moved across continents while the bucket stays in multi-region US.
#: First-byte latency grows with physical distance (~RTT), per-stream
#: bandwidth shrinks with the long fat pipe.
REGIONS: dict[str, LatencyModel] = {
    "us": LatencyModel(first_byte_ms=30.0, stream_mbps=40.0, link_mbps=240.0),
    "london": LatencyModel(first_byte_ms=95.0, stream_mbps=18.0, link_mbps=110.0),
    "singapore": LatencyModel(first_byte_ms=210.0, stream_mbps=8.0, link_mbps=50.0),
}
