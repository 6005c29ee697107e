"""Baseline search engines the paper compares against (§V-A).

Each baseline reproduces the *cloud access pattern* of its real
counterpart over the same blob store, latency model, postings
compression, and document-retrieval routine as Airphant:

* :mod:`repro.baselines.skiplist` — skip-list term index (Apache Lucene):
  O(log n) sequential *dependent* reads per lookup.
* :mod:`repro.baselines.btree` — paged B-tree term index (SQLite): fixed
  4 KiB pages, root cached, root-to-leaf dependent reads.
* :mod:`repro.baselines.engines` — the engine wrappers: ``LuceneLike``,
  ``SQLiteLike``, ``ElasticLike`` (searchable-snapshot chunk reads),
  ``HashTableEngine`` (IoU Sketch with L=1), and ``AirphantEngine``.
"""
