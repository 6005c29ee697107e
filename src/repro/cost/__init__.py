"""Cost comparison substrate: coupled vs decoupled deployment (§V-C)."""
from repro.cost.model import (
    CostParams,
    PeakTrough,
    airphant_cost,
    asymptotic_ratio,
    cost_ratio,
    elastic_cost,
    vm_cost_factor,
)

__all__ = [
    "CostParams",
    "PeakTrough",
    "airphant_cost",
    "elastic_cost",
    "cost_ratio",
    "asymptotic_ratio",
    "vm_cost_factor",
]
