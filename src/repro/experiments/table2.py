"""Table II — corpus statistics: #documents, #terms, #words, sigma_X.

Reproduces the paper's Table II twice over:

* *scaled (measured)*: profile our stand-in corpora with Spark and
  compute sigma_X from the real |W_i| profile;
* *paper scale (analytic)*: evaluate sigma_X's closed form at the
  paper's published sizes, confirming the reported coefficients.
"""
from __future__ import annotations

import pandas as pd

from repro.cloud.blobstore import BlobStore
from repro.core.builder import profile_corpus
from repro.core.sketch import sigma_x
from repro.corpora.generators import SCALE_FACTORS
from repro.experiments._util import print_table, workdir
from repro.harness import CORPUS_ORDER, make_corpus

#: The paper's Table II rows: (n_docs, n_terms, total_words, sigma_X).
PAPER_ROWS = {
    "diag": (1e8, 1e8, 1e8, 1.00),
    "unif": (1e8, 1.0e8, 1.0e9, 1.00),
    "zipf": (1e8, 5.0e7, 9.5e8, 1.41),
    "cranfield": (1.4e3, 5.3e3, 1.2e5, 0.51),
    "hdfs": (1.1e7, 3.6e6, 1.4e8, 1.77),
    "windows": (1.1e8, 8.3e5, 1.7e9, 11.73),
    "spark": (3.3e7, 5.2e6, 3.5e8, 2.53),
}


def analytic_paper_sigma(name: str) -> float:
    """sigma_X at the paper's full scale, with sum|W_i| approximated from
    total words (distinct words/doc ~ 0.93x words/doc; diag exactly 1)."""
    n, terms, words, _ = PAPER_ROWS[name]
    sum_wi = min(words, n * max(1.0, 0.93 * words / n))
    return sigma_x(int(n), int(terms), sum_wi=sum_wi)


def run(spark, corpora: list[str] | None = None) -> pd.DataFrame:
    rows = []
    for name in corpora or CORPUS_ORDER:
        store = BlobStore(workdir(f"table2/{name}"))
        corpus = make_corpus(spark, store, name)
        corpus.df.cache()
        p = profile_corpus(corpus.df)
        sig = sigma_x(p.n_docs, p.n_terms, p.doc_word_counts)
        paper_n, paper_t, paper_w, paper_sig = PAPER_ROWS[name]
        rows.append(
            {
                "corpus": name,
                "docs": p.n_docs,
                "terms": p.n_terms,
                "words": p.total_words,
                "sigma_x": round(sig, 2),
                "paper_docs": paper_n,
                "paper_terms": paper_t,
                "paper_words": paper_w,
                "paper_sigma_x": paper_sig,
                "analytic_sigma_at_paper_scale": round(analytic_paper_sigma(name), 2),
                "scale_factor": SCALE_FACTORS.get(name, 1000),
            }
        )
        corpus.df.unpersist()
    df = pd.DataFrame(rows)
    print_table("Table II: corpus statistics (scaled measured vs paper)", df)
    return df
