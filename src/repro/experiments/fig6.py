"""Fig 6 — end-to-end search latencies, 5 engines x 7 corpora (within
region). Solid bars = means, error bars = 99th percentiles; the paper
truncates at 1.1 s. Also reproduces the inline speedup claims:
Airphant 1.45-8.97x vs Lucene (except Cranfield, where Lucene is ~8x
*faster*), 1.09-113.39x vs Elasticsearch, 1.12-3.15x vs SQLite,
1.15-378.59x vs HashTable.
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.experiments._util import print_table, workdir
from repro.harness import (
    CORPUS_ORDER,
    ENGINE_ORDER,
    build_all_engines,
    make_corpus,
    run_queries,
    sample_query_words,
    summarize,
)

#: Paper Fig 6, eyeballed means in ms (x = truncated beyond 1.1 s in the
#: figure; exact values unpublished). Used for the EXPERIMENTS.md diff.
PAPER_MEANS_MS = {
    "airphant": {"diag": 150, "unif": 200, "zipf": 180, "cranfield": 100,
                 "hdfs": 130, "windows": 300, "spark": 160},
    "lucene": {"diag": 400, "unif": 500, "zipf": 450, "cranfield": 13,
               "hdfs": 600, "windows": 900, "spark": 700},
}


def run(
    spark,
    corpora: list[str] | None = None,
    engines: list[str] | None = None,
    n_queries: int = 60,
    k: int = 10,
    region: str = "us",
) -> pd.DataFrame:
    rows = []
    for cname in corpora or CORPUS_ORDER:
        store = BlobStore(workdir(f"fig6/{cname}"))
        corpus = make_corpus(spark, store, cname)
        built = build_all_engines(
            spark, store, corpus, engines=engines or ENGINE_ORDER, region=region
        )
        words = sample_query_words(corpus.df, n_queries, seed=42)
        base_mean = None
        for ename in engines or ENGINE_ORDER:
            stats = run_queries(built[ename], words, k=k)
            s = summarize(stats)
            if ename == "airphant":
                base_mean = s["mean_ms"]
            rows.append(
                {
                    "corpus": cname,
                    "engine": ename,
                    "mean_ms": round(s["mean_ms"], 1),
                    "p99_ms": round(s["p99_ms"], 1),
                    "x_vs_airphant": round(s["mean_ms"] / base_mean, 2),
                    "avg_round_trips": round(stats.round_trips.mean(), 1),
                    "avg_mb": round(stats.bytes_fetched.mean() / 1e6, 3),
                    "avg_false_pos": round(stats.n_false_positives.mean(), 1),
                }
            )
        corpus.df.unpersist()
    df = pd.DataFrame(rows)
    print_table(f"Fig 6: end-to-end search latency ({region})", df)
    return df
