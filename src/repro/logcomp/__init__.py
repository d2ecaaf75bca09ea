"""Parser-based log compression substrate (LogReducer reproduction)."""
from .logreducer import LogReducer

__all__ = ["LogReducer"]
