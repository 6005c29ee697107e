"""Unit tests for CloudClient: dependent vs batched request accounting."""
import pytest

from repro.cloud.blobstore import BlobStore
from repro.cloud.client import CloudClient, FetchRequest, Ledger, _makespan
from repro.cloud.latency import LatencyModel


def _client(tmp_path, threads=32, cache_bytes=0, **model_kw):
    defaults = dict(first_byte_ms=30.0, stream_mbps=40.0, link_mbps=240.0,
                    jitter_sigma=0.0, seed=0)
    defaults.update(model_kw)
    store = BlobStore(tmp_path)
    return CloudClient(store, LatencyModel(**defaults), threads=threads,
                       cache_bytes=cache_bytes)


class TestMakespan:
    def test_empty(self):
        assert _makespan([], 4) == 0.0

    def test_single_thread_sums(self):
        assert _makespan([1.0, 2.0, 3.0], 1) == pytest.approx(6.0)

    def test_enough_threads_takes_max(self):
        assert _makespan([1.0, 2.0, 3.0], 3) == pytest.approx(3.0)

    def test_lpt_balances(self):
        # 4 jobs of 1 on 2 threads -> 2 per thread
        assert _makespan([1.0] * 4, 2) == pytest.approx(2.0)

    @pytest.mark.parametrize("n,threads", [(10, 3), (100, 32), (7, 7)])
    def test_bounds(self, n, threads):
        times = [1.0] * n
        span = _makespan(times, threads)
        assert max(times) <= span <= sum(times)


class TestFetch:
    def test_sequential_fetches_add_up(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("a", b"x" * 100)
        c.begin_query()
        c.fetch("a")
        one = c.ledger.elapsed_ms
        c.fetch("a")
        assert c.ledger.elapsed_ms == pytest.approx(2 * one)
        assert c.ledger.round_trips == 2

    def test_range_fetch_returns_bytes(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("a", b"0123456789")
        c.begin_query()
        assert c.fetch("a", 2, 3) == b"234"
        assert c.ledger.bytes_fetched == 3

    def test_wait_plus_download_decomposition(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("big", b"x" * 4_000_000)
        c.begin_query()
        c.fetch("big")
        led = c.ledger
        assert led.wait_ms == pytest.approx(30.0)
        assert led.download_ms == pytest.approx(100.0)  # 4MB @ 40MB/s
        assert led.elapsed_ms == pytest.approx(led.wait_ms + led.download_ms)


class TestFetchBatch:
    def test_batch_is_one_round_of_waits(self, tmp_path):
        # The paper's core claim: L concurrent requests cost ~1 RTT, not L.
        c = _client(tmp_path)
        c.store.put("a", b"y" * 100)
        c.begin_query()
        c.fetch_batch([FetchRequest("a", 0, 100)] * 8)
        assert c.ledger.elapsed_ms < 8 * 30.0
        assert c.ledger.elapsed_ms >= 30.0
        assert c.ledger.batches == 1
        assert c.ledger.round_trips == 8

    def test_batch_faster_than_sequential(self, tmp_path):
        c1 = _client(tmp_path)
        c1.store.put("a", b"z" * 1000)
        c1.begin_query()
        for _ in range(6):
            c1.fetch("a", 0, 1000)
        seq = c1.ledger.elapsed_ms
        c2 = _client(tmp_path)
        c2.begin_query()
        c2.fetch_batch([FetchRequest("a", 0, 1000)] * 6)
        assert c2.ledger.elapsed_ms < seq / 3

    def test_thread_cap_forces_rounds(self, tmp_path):
        c = _client(tmp_path, threads=2)
        c.store.put("a", b"q" * 10)
        c.begin_query()
        c.fetch_batch([FetchRequest("a", 0, 10)] * 8)
        # 8 requests over 2 threads = 4 serial rounds per thread
        assert c.ledger.elapsed_ms == pytest.approx(4 * 30.0, rel=0.01)

    def test_link_contention_floor(self, tmp_path):
        # many large parallel downloads are bounded by the shared link —
        # the bandwidth contention of §V-D.
        c = _client(tmp_path, threads=32)
        c.store.put("big", b"x" * 2_000_000)
        c.begin_query()
        c.fetch_batch([FetchRequest("big", 0, 2_000_000)] * 16)
        # link floor: 32 MB over 240 MB/s = 133 ms (+30 wait)
        assert c.ledger.elapsed_ms >= 30.0 + 32_000_000 / 240_000
        assert c.ledger.bytes_fetched == 32_000_000

    def test_empty_batch(self, tmp_path):
        c = _client(tmp_path)
        c.begin_query()
        assert c.fetch_batch([]) == []
        assert c.ledger.elapsed_ms == 0.0

    def test_results_order_matches_requests(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("a", b"abcdef")
        got = c.fetch_batch([FetchRequest("a", i, 1) for i in range(6)])
        assert b"".join(got) == b"abcdef"


class TestFirstL:
    def test_takes_fastest_l(self, tmp_path):
        c = _client(tmp_path, jitter_sigma=0.4, seed=5)
        c.store.put("a", b"m" * 50)
        c.begin_query()
        got = c.fetch_batch_first_l([FetchRequest("a", 0, 50)] * 5, 3)
        assert len(got) == 3
        assert c.ledger.round_trips == 5

    def test_replication_cuts_tail(self, tmp_path):
        # §IV-G: awaiting L of L+ requests is never slower than awaiting all.
        full_times, repl_times = [], []
        for seed in range(20):
            c = _client(tmp_path, jitter_sigma=0.6, seed=seed)
            c.store.put("a", b"m" * 50)
            c.begin_query()
            c.fetch_batch([FetchRequest("a", 0, 50)] * 5)
            full_times.append(c.ledger.elapsed_ms)
            c2 = _client(tmp_path, jitter_sigma=0.6, seed=seed)
            c2.begin_query()
            c2.fetch_batch_first_l([FetchRequest("a", 0, 50)] * 5, 3)
            repl_times.append(c2.ledger.elapsed_ms)
        assert sum(repl_times) < sum(full_times)

    def test_wait_for_all_equivalent(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("a", b"m" * 50)
        got = c.fetch_batch_first_l([FetchRequest("a", 0, 50)] * 4, 4)
        assert len(got) == 4

    def test_l_out_of_range(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("a", b"m")
        with pytest.raises(ValueError):
            c.fetch_batch_first_l([FetchRequest("a", 0, 1)], 2)


class TestPageCache:
    def test_hit_is_free(self, tmp_path):
        c = _client(tmp_path, cache_bytes=1 << 20)
        c.store.put("f", b"n" * 1000)
        c.begin_query()
        c.fetch("f", 0, 10)
        first = c.ledger.elapsed_ms
        c.fetch("f", 500, 10)  # same blob, different range: readahead hit
        assert c.ledger.elapsed_ms == first
        assert c.ledger.round_trips == 1

    def test_blob_larger_than_budget_not_cached(self, tmp_path):
        c = _client(tmp_path, cache_bytes=100)
        c.store.put("big", b"n" * 1000)
        c.begin_query()
        c.fetch("big", 0, 10)
        c.fetch("big", 0, 10)
        assert c.ledger.round_trips == 2

    def test_lru_eviction(self, tmp_path):
        c = _client(tmp_path, cache_bytes=150)
        c.store.put("a", b"a" * 100)
        c.store.put("b", b"b" * 100)
        c.begin_query()
        c.fetch("a", 0, 1)
        c.fetch("b", 0, 1)  # evicts a
        c.fetch("a", 0, 1)  # miss again
        assert c.ledger.round_trips == 3

    def test_batch_all_cached_is_free(self, tmp_path):
        c = _client(tmp_path, cache_bytes=1 << 20)
        c.store.put("f", b"n" * 100)
        c.begin_query()
        c.fetch("f", 0, 100)
        before = c.ledger.elapsed_ms
        got = c.fetch_batch([FetchRequest("f", 0, 10), FetchRequest("f", 90, 10)])
        assert got == [b"n" * 10, b"n" * 10]
        assert c.ledger.elapsed_ms == before

    def test_cache_disabled_by_default(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("f", b"n" * 100)
        c.begin_query()
        c.fetch("f", 0, 10)
        c.fetch("f", 0, 10)
        assert c.ledger.round_trips == 2


class TestLedger:
    def test_merge(self):
        a = Ledger(elapsed_ms=1, wait_ms=2, download_ms=3, round_trips=4,
                   bytes_fetched=5, batches=6)
        b = Ledger(elapsed_ms=10, wait_ms=20, download_ms=30, round_trips=40,
                   bytes_fetched=50, batches=60)
        a.merge(b)
        assert (a.elapsed_ms, a.wait_ms, a.download_ms) == (11, 22, 33)
        assert (a.round_trips, a.bytes_fetched, a.batches) == (44, 55, 66)

    def test_begin_query_resets(self, tmp_path):
        c = _client(tmp_path)
        c.store.put("a", b"1")
        c.fetch("a")
        c.begin_query()
        assert c.ledger.elapsed_ms == 0.0

    def test_charge(self, tmp_path):
        c = _client(tmp_path)
        c.begin_query()
        c.charge(100.0, 20.0, nbytes=5)
        assert c.ledger.elapsed_ms == 120.0
        assert c.ledger.wait_ms == 100.0
        assert c.ledger.bytes_fetched == 5
