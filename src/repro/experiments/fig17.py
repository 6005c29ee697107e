"""Fig 17 — tighter accuracy requirements: F0 in {1, 0.01, 1e-4}.

Paper claims: tightening F0 by four orders of magnitude increases the
optimal L* only slightly (FPs decay exponentially in L), so search and
lookup latencies grow only mildly.
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.core.builder import BuilderConfig, auto_bins
from repro.experiments._util import print_table, workdir
from repro.harness import (
    make_corpus,
    make_engine,
    quick_profile,
    run_lookups,
    run_queries,
    sample_query_words,
    summarize,
)

F0S = [1.0, 0.01, 0.0001]


def run(
    spark,
    corpus_name: str = "hdfs",
    f0s: list[float] | None = None,
    n_queries: int = 30,
    k: int = 10,
) -> pd.DataFrame:
    store = BlobStore(workdir(f"fig17/{corpus_name}"))
    corpus = make_corpus(spark, store, corpus_name)
    corpus.df.cache()
    stats = quick_profile(corpus.df)
    # fixed B (the paper pins B=1e5): size it so the tightest F0 is feasible
    bins = auto_bins(stats.n_docs, stats.mean_wi, f0=min(f0s or F0S))
    words = sample_query_words(corpus.df, n_queries, seed=17)
    rows = []
    for f0 in f0s or F0S:
        cfg = BuilderConfig(bins=bins, f0=f0, seed=3)
        eng = make_engine("airphant", spark, store, config=cfg)
        eng.build(corpus.df, f"{corpus_name}--f{f0}")
        eng.open()
        search = summarize(run_queries(eng, words, k=k))
        lookup = summarize(run_lookups(eng, words), col="lookup_ms")
        rows.append(
            {
                "f0": f0,
                "l_star": eng.report.n_layers,
                "expected_fp": round(eng.report.optimization.expected_fp, 6),
                "search_mean_ms": round(search["mean_ms"], 1),
                "search_p99_ms": round(search["p99_ms"], 1),
                "lookup_mean_ms": round(lookup["mean_ms"], 1),
                "lookup_p99_ms": round(lookup["p99_ms"], 1),
            }
        )
    corpus.df.unpersist()
    df = pd.DataFrame(rows)
    print_table(f"Fig 17: accuracy constraint sweep on {corpus_name} (B={bins})", df)
    return df
