"""Table 7 — per-JSON-dataset file ratio: BP-D+LZMA vs PBC_L.

The paper's shape: the schema-driven method wins where the ground-truth
schema captures nearly all structure (unece), PBC_L wins where value
co-occurrences escape the schema (github), cities is a near-tie.
"""
from __future__ import annotations

import json

from pyspark.sql import SparkSession

from ..baselines import lzma_codec
from ..datasets import JSON_DATASETS
from ..jsoncomp import BinPackD
from .common import format_table, load_corpus, trained_codec
from .paper_numbers import TABLE7


def run(
    spark: SparkSession,
    scale: str = "bench",
    datasets: list[str] | None = None,
    seed: int = 0,
) -> list[dict]:
    rows = []
    for name in datasets or JSON_DATASETS:
        corpus = load_corpus(spark, name, scale, seed=seed)
        raw = corpus.raw_bytes
        objs = [json.loads(r) for r in corpus.test]
        bp = BinPackD()
        bp.train([json.loads(r) for r in corpus.train])
        bp_blob = lzma_codec.compress(bp.encode_file(objs), preset=6)
        if bp.decode_file(lzma_codec.decompress(bp_blob)) != objs:
            raise AssertionError("BP-D+LZMA round-trip failed")
        pbc_l = trained_codec("PBC_L", corpus)
        pbc_blob = pbc_l.compress_file(corpus.test)
        if pbc_l.decompress_file(pbc_blob) != corpus.test:
            raise AssertionError("PBC_L round-trip failed")
        rows.append(
            {
                "dataset": name,
                "BP-D+LZMA": len(bp_blob) / raw,
                "PBC_L": len(pbc_blob) / raw,
                "paper_BP-D": TABLE7[name]["BP-D+LZMA"],
                "paper_PBC_L": TABLE7[name]["PBC_L"],
            }
        )
    return rows


def render(rows: list[dict]) -> str:
    return format_table(
        rows, ["dataset", "BP-D+LZMA", "paper_BP-D", "PBC_L", "paper_PBC_L"]
    )
