"""Fig 16 — tiny IoU Sketch structures on Cranfield: average false
positives, search latency, lookup latency, and index storage size over
B in {1000..3000} and an excessively wide L in {1..16}.

Paper claims: a B-dependent optimal L* exists; FPs fall as B grows;
lookup latency grows ~linearly in L but far sub-L x (concurrency);
storage grows sublinearly in L (hash collisions share postings).
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.experiments._util import print_table, workdir
from repro.experiments.sweep import structure_sweep
from repro.harness import make_corpus

BINS = [1000, 1500, 2000, 2500, 3000]
LAYERS = [1, 2, 4, 6, 8, 12, 16]


def run(
    spark,
    bins_list: list[int] | None = None,
    layers_list: list[int] | None = None,
    n_queries: int = 40,
    k: int = 10,
) -> pd.DataFrame:
    store = BlobStore(workdir("fig16/cranfield"))
    corpus = make_corpus(spark, store, "cranfield")
    df = structure_sweep(
        spark,
        store,
        corpus,
        bins_list=bins_list or BINS,
        layers_list=layers_list or LAYERS,
        n_queries=n_queries,
        k=k,
    )
    print_table("Fig 16: tiny IoU structures on Cranfield", df)
    return df
