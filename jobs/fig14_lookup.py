"""spark-submit entrypoint: Fig 14 term lookup latency (see repro.experiments.fig14)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig14 import run

if __name__ == "__main__":
    run_cli(run, "fig14_lookup")
