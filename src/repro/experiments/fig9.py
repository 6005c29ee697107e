"""Fig 9 — relative cost C_Elasticsearch / C_Airphant over (tau, S).

Peak A = 154.08 op/s (one Elasticsearch server), trough a = A/20, data
size S sweeping bottom-to-top lines. Also prints the two derived
constants the paper reports: the S→infinity asymptote (~3.29x) and the
VM-cost factor (A vs 13.48a break-even).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.cost.model import (
    CostParams,
    PeakTrough,
    asymptotic_ratio,
    cost_ratio,
    vm_cost_factor,
)
from repro.experiments._util import print_table

A_PEAK = 154.08
TROUGH = A_PEAK / 20
SIZES_GB = [1, 10, 100, 1_000, 10_000, 100_000]
TAUS = [0.01, 0.05, 0.1, 0.2, 0.5, 0.9]


def run(spark=None, params: CostParams = CostParams()) -> pd.DataFrame:
    rows = []
    for size in SIZES_GB:
        for tau in TAUS:
            wl = PeakTrough(peak_ops=A_PEAK, trough_ops=TROUGH, tau=tau)
            rows.append(
                {
                    "size_gb": size,
                    "tau": tau,
                    "cost_ratio_E_over_A": round(cost_ratio(size, wl, params), 3),
                }
            )
    df = pd.DataFrame(rows)
    pivot = df.pivot(index="size_gb", columns="tau", values="cost_ratio_E_over_A")
    print_table("Fig 9: C_E / C_A (rows: S in GB, cols: tau)", pivot.reset_index())
    print(
        f"asymptote lim S->inf C_E/C_A = {asymptotic_ratio(params):.2f} (paper: 3.29)\n"
        f"VM cost factor = {vm_cost_factor(params):.2f} (paper: 13.48)"
    )
    return df
