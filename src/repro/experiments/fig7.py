"""Fig 7 — end-to-end search latency across regions (Windows corpus).

The VM moves from Iowa (us) to London to Singapore while the bucket
stays in the US. The paper's headline: Airphant's slowdown is milder
(2.4x London / 6.5x Singapore) than Lucene's (3.3x / 8.2x) and SQLite's
(3.2x / 8.0x), because one batched round trip amortizes the grown RTT
better than a chain of dependent reads.
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.harness import (
    ENGINE_ORDER,
    build_all_engines,
    make_corpus,
    run_queries,
    sample_query_words,
    summarize,
)
from repro.experiments._util import print_table, workdir

PAPER_SLOWDOWN = {  # mean-latency multipliers vs us (Windows, Fig 7)
    "airphant": {"london": 2.4, "singapore": 6.5},
    "lucene": {"london": 3.3, "singapore": 8.2},
    "sqlite": {"london": 3.2, "singapore": 8.0},
}

REGIONS_ORDER = ["us", "london", "singapore"]


def run(
    spark,
    corpus_name: str = "windows",
    engines: list[str] | None = None,
    n_queries: int = 40,
    k: int = 10,
) -> pd.DataFrame:
    from repro.cloud.latency import REGIONS
    from repro.core.hashing import hash64

    store = BlobStore(workdir(f"fig7/{corpus_name}"))
    corpus = make_corpus(spark, store, corpus_name)
    # engines are built once (the index is region-independent); only the
    # query-side latency model changes per region.
    built = build_all_engines(spark, store, corpus, engines=engines or ENGINE_ORDER)
    words = sample_query_words(corpus.df, n_queries, seed=7)
    rows = []
    means: dict[tuple[str, str], float] = {}
    for region in REGIONS_ORDER:
        for ename, eng in built.items():
            eng.client.model = REGIONS[region].fork(
                seed=hash64(f"{ename}|{region}|fig7", 0) & 0x7FFFFFFF
            )
            stats = run_queries(eng, words, k=k)
            s = summarize(stats)
            means[(ename, region)] = s["mean_ms"]
            rows.append(
                {
                    "region": region,
                    "engine": ename,
                    "mean_ms": round(s["mean_ms"], 1),
                    "p99_ms": round(s["p99_ms"], 1),
                }
            )
    corpus.df.unpersist()
    df = pd.DataFrame(rows)
    df["x_vs_us"] = [
        round(means[(r.engine, r.region)] / means[(r.engine, "us")], 2)
        for r in df.itertuples()
    ]
    df["paper_x_vs_us"] = [
        PAPER_SLOWDOWN.get(r.engine, {}).get(r.region) for r in df.itertuples()
    ]
    print_table(f"Fig 7: cross-region latency ({corpus_name})", df)
    return df
