"""Table 5 — log compression: LogReducer vs PBC_L (LZMA level 9).

Averaged over the log datasets. LogReducer is parser-based and
log-specific; PBC_L needs no prior knowledge. The paper's shape:
LogReducer wins ratio slightly (typed timestamp/numeric encodings),
PBC_L wins compression and especially decompression speed.
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from ..datasets import LOG_DATASETS
from ..logcomp import LogReducer
from .common import format_table, load_corpus, trained_codec
from .paper_numbers import TABLE5


def _time_file(codec, recs) -> tuple[float, float, float]:
    raw = len("\n".join(recs).encode("utf-8"))
    t0 = time.perf_counter()
    blob = codec.compress_file(recs)
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    back = codec.decompress_file(blob)
    t_dec = time.perf_counter() - t0
    if back != recs:
        raise AssertionError(f"{codec.name} round-trip failed")
    return len(blob) / raw, raw / 1e6 / max(t_comp, 1e-9), raw / 1e6 / max(t_dec, 1e-9)


def run(
    spark: SparkSession,
    scale: str = "bench",
    datasets: list[str] | None = None,
    seed: int = 0,
) -> list[dict]:
    per_codec: dict[str, list[tuple[float, float, float]]] = {
        "LogReducer": [],
        "PBC_L": [],
    }
    for name in datasets or LOG_DATASETS:
        corpus = load_corpus(spark, name, scale, seed=seed)
        per_codec["LogReducer"].append(_time_file(LogReducer(), corpus.test))
        pbc_l = trained_codec("PBC_L", corpus)
        per_codec["PBC_L"].append(_time_file(pbc_l, corpus.test))
    rows = []
    for codec_name, results in per_codec.items():
        n = len(results)
        rows.append(
            {
                "codec": codec_name,
                "ratio": sum(r[0] for r in results) / n,
                "comp_mbs": sum(r[1] for r in results) / n,
                "decomp_mbs": sum(r[2] for r in results) / n,
                "paper_ratio": TABLE5[codec_name]["ratio"],
                "paper_comp_mbs": TABLE5[codec_name]["comp_mbs"],
                "paper_decomp_mbs": TABLE5[codec_name]["decomp_mbs"],
            }
        )
    return rows


def render(rows: list[dict]) -> str:
    return format_table(
        rows,
        [
            "codec", "ratio", "paper_ratio", "comp_mbs", "paper_comp_mbs",
            "decomp_mbs", "paper_decomp_mbs",
        ],
    )
