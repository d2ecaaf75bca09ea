"""Python DataSourceV2 exposing PBC chunk tables to Spark SQL.

``spark.read.format("pbc").load(path)`` scans chunk files in parallel —
one input partition per chunk — decoding records with the shared
pattern dictionary inside executors. This is the closest Python-side
equivalent of registering a custom columnar FileFormat with its own
encoding codec (a true JVM DataSource is out of scope offline; see
DESIGN.md §2).
"""
from __future__ import annotations

from pyspark.sql.datasource import DataSource, DataSourceReader, InputPartition
from pyspark.sql.types import LongType, StringType, StructField, StructType

SCHEMA = StructType(
    [
        StructField("id", LongType(), nullable=False),
        StructField("record", StringType(), nullable=False),
    ]
)


class _ChunkPartition(InputPartition):
    def __init__(self, chunk_path: str, table_path: str):
        self.chunk_path = chunk_path
        self.table_path = table_path


class PbcDataSourceReader(DataSourceReader):
    def __init__(self, options: dict):
        self.path = options.get("path")
        if not self.path:
            raise ValueError("pbc data source requires a path")

    def partitions(self):
        from .chunks import chunk_files

        return [_ChunkPartition(c, self.path) for c in chunk_files(self.path)]

    def read(self, partition: _ChunkPartition):
        from .chunks import ChunkReader, _load_codec

        codec = _load_codec(partition.table_path)
        reader = ChunkReader(partition.chunk_path, codec)
        for rid, record in reader.iter_records():
            yield (rid, record)


class PbcDataSource(DataSource):
    """`format("pbc")` — PBC chunk tables with per-record encoding."""

    @classmethod
    def name(cls) -> str:
        return "pbc"

    def schema(self) -> StructType:
        return SCHEMA

    def reader(self, schema: StructType) -> PbcDataSourceReader:
        return PbcDataSourceReader(self.options)


def register(spark) -> None:
    """Idempotently register the data source with a session."""
    key = "_pbc_datasource_registered"
    if not getattr(spark, key, False):
        spark.dataSource.register(PbcDataSource)
        setattr(spark, key, True)
