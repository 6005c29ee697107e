"""spark-submit entrypoint: Fig 8 wait/download breakdown (see repro.experiments.fig8)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import run_cli

from repro.experiments.fig8 import run

if __name__ == "__main__":
    run_cli(run, "fig8_breakdown")
