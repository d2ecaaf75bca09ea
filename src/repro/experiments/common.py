"""Shared machinery for the table harnesses.

Measurement conventions (paper §7.2):

- *compression ratio* = compressed bytes / raw bytes (lower is better);
- *speeds* are single-threaded MB/s of raw data over wall-clock, offline
  training excluded (the paper excludes dictionary/pattern training);
- *ratios* are computed distributed: the codec is broadcast and applied
  per partition with ``mapInPandas`` (executor-local codec), then
  aggregated with Spark SQL. Speeds are measured on a local subset —
  the paper reports per-core throughput, which a parallel run would
  obscure.

Scales: ``quick`` keeps unit tests fast; ``bench`` is used for the
EXPERIMENTS.md numbers.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..baselines.registry import Codec, make_codec
from ..datasets import dataset_df, records

#: records per dataset at each scale (unece records are ~4.5 KB, capped)
SCALES = {
    "quick": {"default": 200, "unece": 24, "github": 60, "Hadoop": 100},
    "bench": {"default": 2000, "unece": 150, "github": 400, "Hadoop": 800},
}
TRAIN_FRACTION = {"quick": 0.4, "bench": 0.15}
#: cap on records used for single-thread speed timing
SPEED_CAP = {"quick": 100, "bench": 400}


def dataset_size(name: str, scale: str) -> int:
    sizes = SCALES[scale]
    return sizes.get(name, sizes["default"])


@dataclass
class Corpus:
    """One dataset instance: Spark frame + local record lists."""

    name: str
    df: DataFrame
    train: list[str]
    test: list[str]

    @property
    def raw_bytes(self) -> int:
        return sum(len(r.encode("utf-8")) for r in self.test)


def load_corpus(spark: SparkSession, name: str, scale: str, seed: int = 0) -> Corpus:
    n = dataset_size(name, scale)
    n_train = max(8, int(n * TRAIN_FRACTION[scale]))
    train = records(name, n_train, seed=seed + 1)
    df = dataset_df(spark, name, n, seed=seed + 2).repartition(4)
    test = [r["record"] for r in df.select("record").collect()]
    return Corpus(name=name, df=df, train=train, test=test)


def spark_line_ratio(corpus: Corpus, codec: Codec) -> float:
    """Per-record compressed/raw ratio, computed inside executors."""
    sc = corpus.df.sparkSession.sparkContext
    codec_bc = sc.broadcast(codec)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        c = codec_bc.value
        for pdf in batches:
            comp = sum(len(c.compress_record(r)) for r in pdf["record"])
            raw = sum(len(r.encode("utf-8")) for r in pdf["record"])
            yield pd.DataFrame({"comp": [comp], "raw": [raw]})

    agg = (
        corpus.df.mapInPandas(run, "comp long, raw long")
        .agg(F.sum("comp").alias("comp"), F.sum("raw").alias("raw"))
        .collect()[0]
    )
    return agg["comp"] / agg["raw"]


def spark_file_ratio(corpus: Corpus, codec: Codec) -> float:
    """Per-partition block compression ratio (file mode in executors)."""
    sc = corpus.df.sparkSession.sparkContext
    codec_bc = sc.broadcast(codec)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        c = codec_bc.value
        recs: list[str] = []
        for pdf in batches:
            recs.extend(pdf["record"])
        if recs:
            blob = c.compress_file(recs)
            raw = len("\n".join(recs).encode("utf-8"))
            yield pd.DataFrame({"comp": [len(blob)], "raw": [raw]})

    agg = (
        corpus.df.mapInPandas(run, "comp long, raw long")
        .agg(F.sum("comp").alias("comp"), F.sum("raw").alias("raw"))
        .collect()[0]
    )
    return agg["comp"] / agg["raw"]


def time_line_codec(codec: Codec, recs: list[str]) -> tuple[float, float]:
    """(compress MB/s, decompress MB/s) over a single-threaded loop."""
    raw_mb = sum(len(r.encode("utf-8")) for r in recs) / 1e6
    t0 = time.perf_counter()
    compressed = [codec.compress_record(r) for r in recs]
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    for c in compressed:
        codec.decompress_record(c)
    t_dec = time.perf_counter() - t0
    return raw_mb / max(t_comp, 1e-9), raw_mb / max(t_dec, 1e-9)


def time_file_codec(codec: Codec, recs: list[str]) -> tuple[float, float]:
    raw_mb = len("\n".join(recs).encode("utf-8")) / 1e6
    t0 = time.perf_counter()
    blob = codec.compress_file(recs)
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    codec.decompress_file(blob)
    t_dec = time.perf_counter() - t0
    return raw_mb / max(t_comp, 1e-9), raw_mb / max(t_dec, 1e-9)


def trained_codec(name: str, corpus: Corpus, **kwargs) -> Codec:
    codec = make_codec(name, **kwargs)
    codec.train(corpus.train)
    return codec


def check_roundtrip_line(codec: Codec, recs: list[str]) -> None:
    for r in recs:
        got = codec.decompress_record(codec.compress_record(r))
        if got != r:
            raise AssertionError(
                f"{codec.name} line round-trip failed: {r!r} -> {got!r}"
            )


def check_roundtrip_file(codec: Codec, recs: list[str]) -> None:
    got = codec.decompress_file(codec.compress_file(recs))
    if got != recs:
        raise AssertionError(f"{codec.name} file round-trip failed")


def format_table(rows: list[dict], columns: list[str]) -> str:
    """Fixed-width text table for job output and EXPERIMENTS.md."""
    widths = {
        c: max(len(c), *(len(_fmt(r.get(c))) for r in rows)) for c in columns
    }
    lines = ["  ".join(c.ljust(widths[c]) for c in columns)]
    lines.append("  ".join("-" * widths[c] for c in columns))
    for r in rows:
        lines.append("  ".join(_fmt(r.get(c)).ljust(widths[c]) for c in columns))
    return "\n".join(lines)


def _fmt(v) -> str:
    if v is None:
        return ""
    if isinstance(v, float):
        return f"{v:.3f}" if abs(v) < 10 else f"{v:.1f}"
    return str(v)
