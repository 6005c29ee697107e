"""spark-submit entrypoint: Fig 6 end-to-end latency (see repro.experiments.fig6)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig6 import run

if __name__ == "__main__":
    run_cli(run, "fig6_end_to_end")
