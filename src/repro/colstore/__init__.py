"""PBC columnar chunk store with per-record random access."""
from .chunks import ChunkReader, random_access, read_table, write_chunks

__all__ = ["ChunkReader", "random_access", "read_table", "write_chunks"]
