"""Table 3 — line-by-line compression performance.

Every record is compressed individually (random-access setting). The
paper's competitors: FSST, LZ4 and Zstd with trained dictionaries, PBC,
PBC_F. Ratios are computed distributed (executor-local codecs via
``mapInPandas``); speeds on a local single-thread subset.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..datasets import GENERATORS
from .common import (
    SPEED_CAP,
    format_table,
    load_corpus,
    spark_line_ratio,
    time_line_codec,
    trained_codec,
)
from .paper_numbers import TABLE3_CODECS, TABLE3_RATIO

CODECS = TABLE3_CODECS  # ["FSST", "LZ4(dict)", "Zstd(dict)", "PBC", "PBC_F"]


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
            ratio = spark_line_ratio(corpus, codec)
            comp_mbs, decomp_mbs = time_line_codec(codec, speed_recs)
            rows.append(
                {
                    "dataset": name,
                    "codec": codec_name,
                    "ratio": ratio,
                    "comp_mbs": comp_mbs,
                    "decomp_mbs": decomp_mbs,
                    "paper_ratio": TABLE3_RATIO[name][idx],
                }
            )
    return rows


def render(rows: list[dict]) -> str:
    return format_table(
        rows, ["dataset", "codec", "ratio", "paper_ratio", "comp_mbs", "decomp_mbs"]
    )
