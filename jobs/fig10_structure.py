"""spark-submit entrypoint: Fig 10 IoU structure sweep (see repro.experiments.fig10)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig10 import run

if __name__ == "__main__":
    run_cli(run, "fig10_structure")
