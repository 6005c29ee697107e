"""Shared (B, L) structure-sweep machinery for Figs 5, 10, 16, 17.

For every grid point, build an IoU Sketch with the pinned structure,
then measure per-query: observed false positives (lookup candidates
minus oracle matches), term-lookup latency, end-to-end search latency,
and the persisted index size — exactly the four panels of Fig 16 (Fig 10
shows the first three; Fig 5 the first).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import functions as F

from repro.cloud.blobstore import BlobStore
from repro.core.builder import (
    AirphantBuilder,
    BuilderConfig,
    CorpusProfile,
    doc_word_pairs,
    profile_corpus,
)
from repro.core.searcher import AirphantSearcher
from repro.core.sketch import expected_false_positives
from repro.corpora.generators import CorpusHandle
from repro.harness import make_engine, sample_query_words


def corpus_truth(corpus_df, words: list[str]) -> dict[str, int]:
    """Exact per-word match counts (the oracle for FP measurement)."""
    wanted = {w: None for w in words}
    rows = (
        doc_word_pairs(corpus_df)
        .filter(F.col("word").isin(list(wanted)))
        .groupBy("word")
        .agg(F.count("*").alias("n"))
        .collect()
    )
    truth = {w: 0 for w in words}
    truth.update({r["word"]: int(r["n"]) for r in rows})
    return truth


def common_pool(corpus_df, size: int) -> list[str]:
    """Terms sorted by descending document frequency (common-word pool)."""
    return [
        r["word"]
        for r in doc_word_pairs(corpus_df)
        .groupBy("word")
        .agg(F.count("*").alias("df"))
        .orderBy(F.desc("df"), "word")
        .limit(size)
        .collect()
    ]


def structure_sweep(
    spark,
    store: BlobStore,
    corpus: CorpusHandle,
    bins_list: list[int],
    layers_list: list[int],
    n_queries: int = 40,
    k: int | None = 10,
    region: str = "us",
    common_fraction: float = 0.01,
) -> pd.DataFrame:
    """Measure (observed FP, expected FP, lookup ms, search ms, bytes)
    over the (B, L) grid, reusing one profile and common-word pool."""
    corpus.df.cache()
    pairs = doc_word_pairs(corpus.df).cache()
    profile: CorpusProfile = profile_corpus(corpus.df, pairs)
    pool = common_pool(corpus.df, int(common_fraction * max(bins_list)) + 1)
    words = sample_query_words(corpus.df, n_queries, seed=5)
    truth = corpus_truth(corpus.df, words)
    rows = []
    for bins in bins_list:
        for layers in layers_list:
            cfg = BuilderConfig(
                bins=bins, n_layers=layers, common_fraction=common_fraction, seed=7
            )
            eng = make_engine("airphant", spark, store, region=region, config=cfg)
            name = f"{corpus.name}--B{bins}-L{layers}"
            # build through the raw builder to reuse the shared profile/pool
            report = AirphantBuilder(spark, store, cfg).build(
                corpus.df, name, profile=profile, common_pool=pool
            )
            eng.index_name = name
            eng.report = report
            eng.open()
            fp_total = 0
            lookup_ms = 0.0
            search_ms = 0.0
            for w in words:
                postings, lstats = eng.lookup(w)
                fp_total += len(postings) - truth[w]
                lookup_ms += lstats.lookup_ms
                _, sstats = eng.search(w, k=k)
                search_ms += sstats.total_ms
            b_iou = report.bins_per_layer * report.n_layers
            rows.append(
                {
                    "bins": bins,
                    "layers": layers,
                    "avg_false_pos": round(fp_total / len(words), 3),
                    "expected_fp": round(
                        expected_false_positives(
                            layers, b_iou, profile.doc_word_counts,
                            n_terms=profile.n_terms,
                        ),
                        3,
                    ),
                    "avg_lookup_ms": round(lookup_ms / len(words), 1),
                    "avg_search_ms": round(search_ms / len(words), 1),
                    "index_bytes": report.index_bytes,
                }
            )
    pairs.unpersist()
    corpus.df.unpersist()
    return pd.DataFrame(rows)
