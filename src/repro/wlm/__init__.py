"""Workload manager substrate: resource plans, pools, mappings, triggers."""
from .manager import QueryTask, WorkloadManager
from .plans import Mapping, Pool, ResourcePlan, Trigger

__all__ = ["QueryTask", "WorkloadManager", "Mapping", "Pool", "ResourcePlan", "Trigger"]
