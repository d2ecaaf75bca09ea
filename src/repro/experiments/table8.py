"""Table 8 — TierBase production case study.

Two KV workloads (A = trade records/KV1-like, B = session objects/
KV2-like) run against the TierBase substrate with three value codecs:
uncompressed, dictionary-trained Zstd (TierBase's previous solution),
and PBC_F. Metrics per the paper: memory usage relative to
uncompressed, and single-instance SET / GET throughput.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..kvstore import run_workload
from .common import dataset_size, format_table, load_corpus, trained_codec
from .paper_numbers import TABLE8

WORKLOADS = {"A": "KV1", "B": "KV2"}


def run(spark: SparkSession, scale: str = "bench", seed: int = 0) -> list[dict]:
    rows = []
    for wl, dataset in WORKLOADS.items():
        corpus = load_corpus(spark, dataset, scale, seed=seed)
        values = corpus.test
        base = sum(len(v.encode("utf-8")) for v in values)
        codecs = [
            ("Uncompressed", None),
            ("Zstd", trained_codec("Zstd(dict)", corpus)),
            ("PBC_F", trained_codec("PBC_F", corpus)),
        ]
        for label, codec in codecs:
            res = run_workload(values, codec, uncompressed_bytes=base)
            paper = TABLE8[label]
            col = 0 if wl == "A" else 1
            rows.append(
                {
                    "workload": wl,
                    "codec": label,
                    "memory_pct": res.memory_pct,
                    "set_qps": res.set_qps,
                    "get_qps": res.get_qps,
                    "paper_memory_pct": paper["mem"][col],
                    "paper_set_qps": paper["set"][col],
                    "paper_get_qps": paper["get"][col],
                }
            )
    return rows


def render(rows: list[dict]) -> str:
    return format_table(
        rows,
        [
            "workload", "codec", "memory_pct", "paper_memory_pct",
            "set_qps", "paper_set_qps", "get_qps", "paper_get_qps",
        ],
    )
