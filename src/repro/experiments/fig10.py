"""Fig 10 — effect of (B, L) on HDFS: expected/observed false positives,
average search latency, average term-lookup latency.

Paper claims: FPs are enormous at L=1 ((B=50k, L=1) averages 3,556 ms
search latency), fall below 1 at L=2 (the optimizer's choice L*=2), and
hit exactly zero by L=4; beyond that, added layers only raise lookup
latency (bandwidth contention across the parallel superpost reads).
B values are scaled from the paper's {50k, 100k, 200k, 400k} by the
corpus scale-down (DESIGN.md §5): {0.5, 1, 2, 4} x auto_bins.
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.core.builder import auto_bins
from repro.experiments._util import print_table, workdir
from repro.experiments.sweep import structure_sweep
from repro.harness import make_corpus, quick_profile

LAYERS = [1, 2, 4, 8, 16]


def run(
    spark,
    corpus_name: str = "hdfs",
    layers_list: list[int] | None = None,
    n_queries: int = 30,
    k: int = 10,
) -> pd.DataFrame:
    store = BlobStore(workdir(f"fig10/{corpus_name}"))
    corpus = make_corpus(spark, store, corpus_name)
    stats = quick_profile(corpus.df)
    base = auto_bins(stats.n_docs, stats.mean_wi)
    bins_list = [base // 2, base, 2 * base, 4 * base]
    df = structure_sweep(
        spark,
        store,
        corpus,
        bins_list=bins_list,
        layers_list=layers_list or LAYERS,
        n_queries=n_queries,
        k=k,
    )
    print_table(
        f"Fig 10: (B, L) sweep on {corpus_name} "
        f"(B scaled from paper's 50k-400k; base={base})",
        df[["bins", "layers", "avg_false_pos", "expected_fp",
            "avg_search_ms", "avg_lookup_ms"]],
    )
    return df
