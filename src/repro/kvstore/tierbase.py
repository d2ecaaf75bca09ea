"""TierBase stand-in: a Redis-like in-memory KV store (paper §7.5).

The real TierBase is Ant Group's distributed, Redis-compatible,
in-memory store; the Table 8 case study measures one single-threaded
instance's memory usage and SET/GET throughput under three value
codecs (uncompressed, dictionary-trained Zstd, PBC_F). This substrate
reproduces exactly that unit: a hash-map keyed store whose values pass
through a line-mode codec on write and read, with byte-accounted memory
usage and a wall-clock op-loop throughput harness.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from ..baselines.registry import Codec


class TierBase:
    """Single-instance KV store with an optional value codec."""

    def __init__(self, codec: Codec | None = None):
        self.codec = codec
        self._store: dict[str, bytes] = {}

    def set(self, key: str, value: str) -> None:
        if self.codec is not None:
            self._store[key] = self.codec.compress_record(value)
        else:
            self._store[key] = value.encode("utf-8")

    def get(self, key: str) -> str | None:
        data = self._store.get(key)
        if data is None:
            return None
        if self.codec is not None:
            return self.codec.decompress_record(data)
        return data.decode("utf-8")

    def delete(self, key: str) -> bool:
        return self._store.pop(key, None) is not None

    def __len__(self) -> int:
        return len(self._store)

    def memory_usage(self) -> int:
        """Value bytes held in memory (keys excluded, as the paper's
        metric normalises against the uncompressed value footprint)."""
        return sum(len(v) for v in self._store.values())


@dataclass
class WorkloadResult:
    """One Table 8 row cell group: memory % and SET/GET throughput."""

    codec_name: str
    memory_bytes: int
    memory_pct: float  # vs uncompressed
    set_qps: float
    get_qps: float


def run_workload(
    values: list[str],
    codec: Codec | None,
    *,
    uncompressed_bytes: int | None = None,
) -> WorkloadResult:
    """SET every value, then GET every key, timing each loop."""
    db = TierBase(codec)
    keys = [f"k:{i:012d}" for i in range(len(values))]

    t0 = time.perf_counter()
    for k, v in zip(keys, values):
        db.set(k, v)
    set_s = time.perf_counter() - t0

    t0 = time.perf_counter()
    for k in keys:
        db.get(k)
    get_s = time.perf_counter() - t0

    mem = db.memory_usage()
    base = uncompressed_bytes or sum(len(v.encode("utf-8")) for v in values)
    return WorkloadResult(
        codec_name=codec.name if codec else "Uncompressed",
        memory_bytes=mem,
        memory_pct=100.0 * mem / max(base, 1),
        set_qps=len(values) / max(set_s, 1e-9),
        get_qps=len(values) / max(get_s, 1e-9),
    )
