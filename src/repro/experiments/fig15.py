"""Fig 15 — scalability with corpus size: average search latency (top)
and index storage (bottom) as zipf(x, x, 1) grows.

Paper claims: baselines win on small corpora (their indexes get cached /
are trivially small), Airphant relatively outperforms more and more as
the corpus grows; index sizes all grow along the same log-log trend with
Airphant up to 2.85x Lucene's in the worst setting. The paper sweeps
N = 10^3..10^8; we sweep 10^3..10^5 (DESIGN.md §5).
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.corpora import generators as gen
from repro.experiments._util import print_table, workdir
from repro.harness import (
    build_all_engines,
    run_queries,
    sample_query_words,
    summarize,
)

SIZES = [1_000, 10_000, 100_000]
ENGINES = ["airphant", "lucene", "sqlite"]


def run(
    spark,
    sizes: list[int] | None = None,
    engines: list[str] | None = None,
    n_queries: int = 30,
    k: int = 10,
) -> pd.DataFrame:
    rows = []
    for n in sizes or SIZES:
        store = BlobStore(workdir(f"fig15/zipf-{n}"))
        corpus = gen.zipf(spark, store, n, n, 10, seed=15, name=f"zipf{n}")
        # fixed page-cache budget across the sweep (a real VM's RAM does
        # not grow with the corpus): small corpora cache fully — the
        # paper's "baselines are faster when the corpus is small" — and
        # large ones outgrow it, flipping the ordering to Airphant.
        built = build_all_engines(
            spark, store, corpus, engines=engines or ENGINES, cache_bytes=512 << 10
        )
        words = sample_query_words(corpus.df, n_queries, seed=15)
        for ename, eng in built.items():
            s = summarize(run_queries(eng, words, k=k))
            rows.append(
                {
                    "n_docs": n,
                    "engine": ename,
                    "search_mean_ms": round(s["mean_ms"], 1),
                    "index_mb": round(eng.index_bytes() / 1e6, 3),
                }
            )
        corpus.df.unpersist()
    df = pd.DataFrame(rows)
    print_table("Fig 15: scalability with corpus size (zipf(x,x,1))", df)
    return df
