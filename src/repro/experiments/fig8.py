"""Fig 8 / Fig 11 — search latency breakdown: wait vs download time.

The paper captures TCP packets on the Spark corpus (32 sampled queries)
and splits each search into *wait* (blocked, <10 kB/s traffic) and
*download* time. Our simulated client natively accounts the same split.
The paper's reading: Lucene/SQLite are wait-heavy (dependent reads),
HashTable is download-heavy (false-positive documents), Elasticsearch is
bad at both; Airphant minimizes both at once (220 ms wait + 117 ms
download on average in the paper's tcpdump-slowed setup).
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.experiments._util import print_table, workdir
from repro.harness import (
    ENGINE_ORDER,
    build_all_engines,
    make_corpus,
    run_queries,
    sample_query_words,
)

PAPER_NOTE = {
    "airphant": "low wait + low download",
    "lucene": "wait-heavy (dependent reads)",
    "elasticsearch": "wait- and download-heavy",
    "sqlite": "wait-heavy (B-tree traversal)",
    "hashtable": "download-heavy (false positives)",
}


def run(
    spark,
    corpus_name: str = "spark",
    engines: list[str] | None = None,
    n_queries: int = 32,
    k: int = 10,
) -> pd.DataFrame:
    store = BlobStore(workdir(f"fig8/{corpus_name}"))
    corpus = make_corpus(spark, store, corpus_name)
    built = build_all_engines(spark, store, corpus, engines=engines or ENGINE_ORDER)
    words = sample_query_words(corpus.df, n_queries, seed=8)
    rows = []
    for ename, eng in built.items():
        stats = run_queries(eng, words, k=k)
        rows.append(
            {
                "engine": ename,
                "wait_ms": round(stats.wait_ms.mean(), 1),
                "download_ms": round(stats.download_ms.mean(), 1),
                "total_ms": round(stats.total_ms.mean(), 1),
                "wait_share": round(
                    stats.wait_ms.mean() / max(1e-9, stats.total_ms.mean()), 2
                ),
                "avg_mb": round(stats.bytes_fetched.mean() / 1e6, 3),
                "paper_pattern": PAPER_NOTE[ename],
            }
        )
    corpus.df.unpersist()
    df = pd.DataFrame(rows)
    print_table(f"Fig 8: wait vs download breakdown ({corpus_name})", df)
    return df
