"""The paper's primary contribution: IoU Sketch and the Airphant engine.

Submodules follow the paper's decomposition (Table I):

* :mod:`repro.core.hashing` — the pairwise-independent hash family behind
  the word→bin mapping, identical on the Spark (builder) and Python
  (searcher) sides.
* :mod:`repro.core.postings` — postings and their compressed binary codec.
* :mod:`repro.core.superpost` — superpost compaction (header block +
  superpost blocks, §IV-C).
* :mod:`repro.core.mht` — the Multilayer Hash Table kept in Searcher memory.
* :mod:`repro.core.sketch` — the in-memory IoU Sketch reference plus the
  accuracy analysis (Eqs 1, 2, 5; Table II's sigma_X).
* :mod:`repro.core.optimizer` — Algorithm 1 with Lemmas 1-3.
* :mod:`repro.core.topk` — top-K sampling size (Eq 6).
* :mod:`repro.core.builder` — the Spark-based Airphant Builder.
* :mod:`repro.core.searcher` — the Airphant Searcher.
"""
