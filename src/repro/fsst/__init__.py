"""Simplified FSST (Fast Static Symbol Table) string compression."""
from .fsst import FsstTable, train_fsst

__all__ = ["FsstTable", "train_fsst"]
