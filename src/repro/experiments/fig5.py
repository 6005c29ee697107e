"""Fig 5 — average and expected false positives vs (B, L) on Cranfield.

The figure's claims: (1) FP count drops rapidly as L grows from 1, then
rises again once bins-per-layer get too small; (2) the measured average
tracks the analytic expectation F(L) (Eq 2). One line per B.
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.experiments._util import print_table, workdir
from repro.experiments.sweep import structure_sweep
from repro.harness import make_corpus

BINS = [1000, 1500, 2000, 3000]
LAYERS = [1, 2, 4, 6, 8, 12, 16]


def run(
    spark,
    corpus_name: str = "cranfield",
    bins_list: list[int] | None = None,
    layers_list: list[int] | None = None,
    n_queries: int = 60,
) -> pd.DataFrame:
    store = BlobStore(workdir(f"fig5/{corpus_name}"))
    corpus = make_corpus(spark, store, corpus_name)
    df = structure_sweep(
        spark,
        store,
        corpus,
        bins_list=bins_list or BINS,
        layers_list=layers_list or LAYERS,
        n_queries=n_queries,
        k=None,
    )
    out = df[["bins", "layers", "avg_false_pos", "expected_fp"]]
    print_table(f"Fig 5: false positives vs (B, L) on {corpus_name}", out)
    return out
