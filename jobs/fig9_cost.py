"""spark-submit entrypoint: Fig 9 cost comparison (see repro.experiments.fig9)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig9 import run

if __name__ == "__main__":
    run_cli(run, "fig9_cost")
