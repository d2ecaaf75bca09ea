"""TierBase substrate: in-memory KV store with pluggable value codecs."""
from .tierbase import TierBase, WorkloadResult, run_workload

__all__ = ["TierBase", "WorkloadResult", "run_workload"]
