"""Spark Data Source V2 integration.

:mod:`repro.datasource.airphant_source` exposes the cloud-stored IoU
Sketch index as a Spark ``airphant`` data source: the driver performs
the single-batch MHT lookup, and document retrieval fans out as parallel
scan tasks across executors.
"""
from repro.datasource.airphant_source import AirphantDataSource, register

__all__ = ["AirphantDataSource", "register"]
