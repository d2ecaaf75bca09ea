"""PBC chunk files: executor-local per-column-chunk encoding (repro hint).

Each Spark partition of a ``DataFrame[id, record]`` is written by its
executor as one ``.pbc`` chunk file — PBC applied per column chunk, the
way a Parquet/ORC encoding codec would run inside the writer. The
layout keeps a per-record offset index so a point lookup decodes
exactly one record (the paper's random-access property), unlike
block-wise compression which must inflate the whole block:

    magic "PBC1"
    varint n_records
    n * varint id            (row ids)
    (n+1) * varint offset    (record byte offsets, delta-coded)
    n * record bytes         (each a PBC compressed record)

The pattern dictionary is stored once per table in
``_dictionary.json`` (the dictionary is shared state, like a Parquet
schema footer). ``datasource.py`` exposes the table to Spark SQL as a
Python DataSourceV2.
"""
from __future__ import annotations

import json
import os
import uuid
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.extract import PatternDictionary
from ..core.pbc import PBCCodec
from ..core.varint import decode_varint, encode_varint

MAGIC = b"PBC1"
DICT_FILE = "_dictionary.json"


def _write_chunk(path: str, ids: list[int], payloads: list[bytes]) -> None:
    out = bytearray(MAGIC)
    out += encode_varint(len(ids))
    for i in ids:
        out += encode_varint(i)
    offset = 0
    for p in payloads:
        out += encode_varint(len(p))
        offset += len(p)
    out += encode_varint(0)  # terminator keeps the index n+1 entries long
    for p in payloads:
        out += p
    tmp = f"{path}.tmp-{uuid.uuid4().hex}"
    with open(tmp, "wb") as f:
        f.write(out)
    os.replace(tmp, path)


class ChunkReader:
    """Random access into one chunk file without full decompression."""

    def __init__(self, path: str, codec: PBCCodec):
        self.path = path
        self.codec = codec
        with open(path, "rb") as f:
            data = f.read()
        if data[:4] != MAGIC:
            raise ValueError(f"{path}: not a PBC chunk")
        pos = 4
        n, pos = decode_varint(data, pos)
        self.ids: list[int] = []
        for _ in range(n):
            i, pos = decode_varint(data, pos)
            self.ids.append(i)
        lengths: list[int] = []
        for _ in range(n + 1):
            ln, pos = decode_varint(data, pos)
            lengths.append(ln)
        self._data = data
        self._offsets = [pos]
        for ln in lengths[:-1]:
            self._offsets.append(self._offsets[-1] + ln)

    def __len__(self) -> int:
        return len(self.ids)

    def record_at(self, idx: int) -> str:
        """Decode the ``idx``-th record only — O(record), not O(chunk)."""
        start, end = self._offsets[idx], self._offsets[idx + 1]
        return self.codec.decompress_record(self._data[start:end])

    def iter_records(self) -> Iterator[tuple[int, str]]:
        for idx, rid in enumerate(self.ids):
            yield rid, self.record_at(idx)


def write_chunks(
    df: DataFrame,
    path: str,
    dictionary: PatternDictionary,
    *,
    id_col: str = "id",
    record_col: str = "record",
) -> int:
    """Write a DataFrame as PBC chunks, one file per partition.

    Encoding happens inside executors via ``mapInPandas`` (the
    executor-local codec of the repro hint); the driver only writes the
    shared dictionary and counts chunk manifests. Returns the number of
    chunks written. Requires a filesystem shared with executors (true
    for ``local[*]``).
    """
    os.makedirs(path, exist_ok=True)
    with open(os.path.join(path, DICT_FILE), "w") as f:
        json.dump(dictionary.to_dict(), f)
    spark = df.sparkSession
    dict_bc = spark.sparkContext.broadcast(dictionary.to_dict())

    def encode_partition(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        codec = PBCCodec(PatternDictionary.from_dict(dict_bc.value))
        ids: list[int] = []
        payloads: list[bytes] = []
        for pdf in batches:
            for rid, rec in zip(pdf[id_col], pdf[record_col]):
                ids.append(int(rid))
                payloads.append(codec.compress_record(rec))
        if ids:
            chunk = os.path.join(path, f"chunk-{uuid.uuid4().hex}.pbc")
            _write_chunk(chunk, ids, payloads)
            yield pd.DataFrame({"chunk": [chunk], "records": [len(ids)]})

    manifest = df.mapInPandas(encode_partition, "chunk string, records long")
    return manifest.count()


def _load_codec(path: str) -> PBCCodec:
    with open(os.path.join(path, DICT_FILE)) as f:
        return PBCCodec(PatternDictionary.from_dict(json.load(f)))


def chunk_files(path: str) -> list[str]:
    return sorted(
        os.path.join(path, f) for f in os.listdir(path) if f.endswith(".pbc")
    )


def read_table(spark: SparkSession, path: str) -> DataFrame:
    """Read a PBC chunk table back as ``DataFrame[id, record]``.

    Goes through the registered Python data source (DataSourceV2) so
    Spark SQL scans it like any other format.
    """
    from .datasource import register

    register(spark)
    return spark.read.format("pbc").load(path)


def random_access(path: str, row_id: int) -> str | None:
    """Point lookup by row id across chunks — decodes one record only."""
    codec = _load_codec(path)
    for chunk in chunk_files(path):
        reader = ChunkReader(chunk, codec)
        try:
            idx = reader.ids.index(row_id)
        except ValueError:
            continue
        return reader.record_at(idx)
    return None
