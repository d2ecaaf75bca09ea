"""Table 4 — file (block) compression performance.

Records are concatenated and compressed block-wise — the LZ-friendly
setting. Competitors: Snappy, LZMA, LZ4, Zstd, and PBC with Zstd/LZMA
backends (PBC_Z, PBC_L). Distributed ratio = per-partition blocks
compressed inside executors; speeds on a local single-thread subset.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..datasets import GENERATORS
from .common import (
    SPEED_CAP,
    format_table,
    load_corpus,
    spark_file_ratio,
    time_file_codec,
    trained_codec,
)
from .paper_numbers import TABLE4_CODECS, TABLE4_RATIO

CODECS = TABLE4_CODECS  # ["Snappy", "LZMA", "LZ4", "Zstd", "PBC_Z", "PBC_L"]


def run(
    spark: SparkSession,
    scale: str = "bench",
    datasets: list[str] | None = None,
    seed: int = 0,
) -> list[dict]:
    rows = []
    for name in datasets or list(GENERATORS):
        corpus = load_corpus(spark, name, scale, seed=seed)
        speed_recs = corpus.test[: SPEED_CAP[scale]]
        for idx, codec_name in enumerate(CODECS):
            codec = trained_codec(codec_name, corpus)
            ratio = spark_file_ratio(corpus, codec)
            comp_mbs, decomp_mbs = time_file_codec(codec, speed_recs)
            rows.append(
                {
                    "dataset": name,
                    "codec": codec_name,
                    "ratio": ratio,
                    "comp_mbs": comp_mbs,
                    "decomp_mbs": decomp_mbs,
                    "paper_ratio": TABLE4_RATIO[name][idx],
                }
            )
    return rows


def render(rows: list[dict]) -> str:
    return format_table(
        rows, ["dataset", "codec", "ratio", "paper_ratio", "comp_mbs", "decomp_mbs"]
    )
