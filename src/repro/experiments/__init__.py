"""Experiment drivers — one module per reproduced table/figure.

Each module exposes ``run(spark, **params) -> pandas.DataFrame`` printing
the paper artifact's rows. ``jobs/<name>.py`` wraps each for
spark-submit; ``benchmarks/`` wraps the same drivers for pytest-benchmark.
The EXPERIMENTS.md paper-vs-measured tables are regenerated from these.
"""
