"""JSON-specific serialization substrates: Amazon Ion (binary) and
schema-driven JSON BinPack reproductions."""
from .ion import IonB
from .binpack import BinPackD

__all__ = ["IonB", "BinPackD"]
