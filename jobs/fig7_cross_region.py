"""spark-submit entrypoint: Fig 7 cross-region latency (see repro.experiments.fig7)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig7 import run

if __name__ == "__main__":
    run_cli(run, "fig7_cross_region")
