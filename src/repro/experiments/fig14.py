"""Fig 14 — term-index lookup latencies: Airphant vs SQLite.

Paper claims (Appendix B-A): Airphant's single-round-trip lookup beats
SQLite's cached B-tree traversal by up to 2.79x on average and 2.81x at
the 99th percentile; both share the identical document-retrieval
routine, so lookup is exactly where the architectures differ.
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.experiments._util import print_table, workdir
from repro.harness import (
    build_all_engines,
    make_corpus,
    run_lookups,
    sample_query_words,
    summarize,
)

CORPORA = ["cranfield", "hdfs", "windows", "spark"]
PAPER_BEST_SPEEDUP = {"mean": 2.79, "p99": 2.81}


def run(
    spark,
    corpora: list[str] | None = None,
    n_queries: int = 40,
) -> pd.DataFrame:
    rows = []
    for cname in corpora or CORPORA:
        store = BlobStore(workdir(f"fig14/{cname}"))
        corpus = make_corpus(spark, store, cname)
        built = build_all_engines(
            spark, store, corpus, engines=["airphant", "sqlite"]
        )
        words = sample_query_words(corpus.df, n_queries, seed=14)
        per_engine = {}
        for ename, eng in built.items():
            stats = run_lookups(eng, words)
            per_engine[ename] = summarize(stats, col="lookup_ms")
        for ename, s in per_engine.items():
            rows.append(
                {
                    "corpus": cname,
                    "engine": ename,
                    "lookup_mean_ms": round(s["mean_ms"], 1),
                    "lookup_p99_ms": round(s["p99_ms"], 1),
                    "sqlite_over_airphant_mean": round(
                        per_engine["sqlite"]["mean_ms"]
                        / per_engine["airphant"]["mean_ms"],
                        2,
                    ),
                }
            )
        corpus.df.unpersist()
    df = pd.DataFrame(rows)
    print_table("Fig 14: term-index lookup latency (Airphant vs SQLite)", df)
    return df
