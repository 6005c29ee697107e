"""spark-submit entrypoint: Fig 5 false positives vs (B,L) (see repro.experiments.fig5)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig5 import run

if __name__ == "__main__":
    run_cli(run, "fig5_false_positives")
