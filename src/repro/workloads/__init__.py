"""Workloads: TPC-DS-lite (§7.1/§7.2) and SSB-lite (§7.3)."""
from . import ssb, tpcds_lite

__all__ = ["ssb", "tpcds_lite"]
