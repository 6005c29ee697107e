"""Corpus substrate: synthetic document collections + parsers.

The paper evaluates on Cranfield and three Loghub system-log corpora
(HDFS, Windows, Spark) plus configurable synthetic diag/unif/zipf
datasets. The real corpora are not available offline, so
:mod:`repro.corpora.generators` synthesizes corpora whose statistics
(documents/terms/words ratios, skew) match Table II's shape at reduced
scale; :mod:`repro.corpora.parsers` provides the corpus-document and
document-word parsers of §III-C.
"""
from repro.corpora.generators import (
    CorpusHandle,
    cranfield_like,
    diag,
    hdfs_like,
    spark_like,
    unif,
    windows_like,
    write_corpus,
    zipf,
)
from repro.corpora.parsers import parse_blob, tokenize, tokenize_col

__all__ = [
    "CorpusHandle",
    "write_corpus",
    "diag",
    "unif",
    "zipf",
    "cranfield_like",
    "hdfs_like",
    "windows_like",
    "spark_like",
    "parse_blob",
    "tokenize",
    "tokenize_col",
]
