"""Shared helpers for the experiment drivers."""
from __future__ import annotations

import os
import shutil
import sys
import tempfile

import pandas as pd


def workdir(prefix: str) -> str:
    """Fresh blob-store root for one experiment run."""
    root = os.path.join(tempfile.gettempdir(), "airphant-repro", prefix)
    shutil.rmtree(root, ignore_errors=True)
    os.makedirs(root, exist_ok=True)
    return root


def print_table(title: str, df: pd.DataFrame) -> None:
    """Print one reproduced table in the paper's row layout."""
    print(f"\n== {title} ==")
    print(df.to_string(index=False))
    sys.stdout.flush()
