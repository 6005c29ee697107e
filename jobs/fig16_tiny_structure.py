"""spark-submit entrypoint: Fig 16 tiny IoU structures (see repro.experiments.fig16)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig16 import run

if __name__ == "__main__":
    run_cli(run, "fig16_tiny_structure")
