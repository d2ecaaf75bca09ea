"""Spark-facing PBC API: distributed train/compress/decompress.

The offline pattern-extraction phase samples a DataFrame (the paper
trains on a few MB of samples regardless of corpus size, §7.3.3) and
clusters on the driver; the online phase runs inside executors via
``mapInPandas`` with the pattern dictionary broadcast — the
executor-local per-column-chunk codec of the repro hint. All transforms
are ``DataFrame -> DataFrame``.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame

from ..fsst import FsstTable
from .extract import PatternDictionary
from .pbc import PBCCodec, train_pbc


def sample_records(
    df: DataFrame,
    *,
    record_col: str = "record",
    n: int = 256,
    seed: int = 0,
) -> list[str]:
    """Deterministic sample of up to ``n`` records for offline training."""
    total = df.count()
    if total == 0:
        return []
    fraction = min(1.0, (3.0 * n) / total)
    rows = df.sample(fraction=fraction, seed=seed).limit(n).collect()
    if len(rows) < min(n, total):  # tiny frames: sampling may under-fill
        rows = df.limit(n).collect()
    return [r[record_col] for r in rows]


def train_patterns(
    df: DataFrame,
    *,
    record_col: str = "record",
    sample_size: int = 256,
    seed: int = 0,
    **train_kwargs,
) -> PatternDictionary:
    """Offline phase: sample the frame, extract the pattern dictionary."""
    sample = sample_records(df, record_col=record_col, n=sample_size, seed=seed)
    return train_pbc(sample, **train_kwargs)


def _codec_from_broadcast(dict_value: dict, fsst_value: dict | None) -> PBCCodec:
    from ..baselines.registry import _FsstResidual

    residual = None
    if fsst_value is not None:
        residual = _FsstResidual(FsstTable.from_dict(fsst_value))
    return PBCCodec(PatternDictionary.from_dict(dict_value), residual_codec=residual)


def compress_df(
    df: DataFrame,
    dictionary: PatternDictionary,
    *,
    id_col: str = "id",
    record_col: str = "record",
    fsst_table: FsstTable | None = None,
) -> DataFrame:
    """``DataFrame[id, record] -> DataFrame[id, data: binary]`` in executors."""
    sc = df.sparkSession.sparkContext
    dict_bc = sc.broadcast(dictionary.to_dict())
    fsst_bc = sc.broadcast(fsst_table.to_dict() if fsst_table else None)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        codec = _codec_from_broadcast(dict_bc.value, fsst_bc.value)
        for pdf in batches:
            yield pd.DataFrame(
                {
                    id_col: pdf[id_col],
                    "data": [codec.compress_record(r) for r in pdf[record_col]],
                }
            )

    return df.mapInPandas(run, f"{id_col} long, data binary")


def decompress_df(
    df: DataFrame,
    dictionary: PatternDictionary,
    *,
    id_col: str = "id",
    data_col: str = "data",
    fsst_table: FsstTable | None = None,
) -> DataFrame:
    """Inverse of :func:`compress_df`."""
    sc = df.sparkSession.sparkContext
    dict_bc = sc.broadcast(dictionary.to_dict())
    fsst_bc = sc.broadcast(fsst_table.to_dict() if fsst_table else None)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        codec = _codec_from_broadcast(dict_bc.value, fsst_bc.value)
        for pdf in batches:
            yield pd.DataFrame(
                {
                    id_col: pdf[id_col],
                    "record": [
                        codec.decompress_record(bytes(d)) for d in pdf[data_col]
                    ],
                }
            )

    return df.mapInPandas(run, f"{id_col} long, record string")


def compressed_size_stats(compressed: DataFrame, raw: DataFrame) -> dict:
    """Aggregate ratio via Spark SQL over the two frames."""
    from pyspark.sql import functions as F

    comp_bytes = compressed.select(
        F.sum(F.length("data")).alias("b")
    ).collect()[0]["b"]
    raw_bytes = raw.select(
        F.sum(F.length(F.encode("record", "utf-8"))).alias("b")
    ).collect()[0]["b"]
    return {
        "compressed_bytes": int(comp_bytes),
        "raw_bytes": int(raw_bytes),
        "ratio": comp_bytes / raw_bytes if raw_bytes else float("nan"),
    }
