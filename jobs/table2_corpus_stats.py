"""spark-submit entrypoint: Table II corpus statistics (see repro.experiments.table2)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.table2 import run

if __name__ == "__main__":
    run_cli(run, "table2_corpus_stats")
