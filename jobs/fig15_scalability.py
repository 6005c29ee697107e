"""spark-submit entrypoint: Fig 15 corpus-size scalability (see repro.experiments.fig15)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig15 import run

if __name__ == "__main__":
    run_cli(run, "fig15_scalability")
