"""Table 6 — JSON compression: Ion-B / BP-D vs PBC / PBC_F (+LZMA).

Record mode compresses each JSON record individually; file mode
serializes the whole corpus then LZMA-compresses it (for Ion-B and
BP-D, mirroring the paper's ``+LZMA`` rows) or runs PBC_L. Metrics are
averaged over the JSON datasets. The paper's shape: PBC/PBC_F beat the
JSON-specialised formats at record level; at file level PBC_L and
BP-D+LZMA are both excellent.
"""
from __future__ import annotations

import json
import time

from pyspark.sql import SparkSession

from ..baselines import lzma_codec
from ..datasets import JSON_DATASETS
from ..jsoncomp import BinPackD, IonB
from .common import format_table, load_corpus, trained_codec
from .paper_numbers import TABLE6


def _record_metrics_json(codec, objs, raw_bytes) -> tuple[float, float, float]:
    t0 = time.perf_counter()
    encoded = [codec.encode_record(o) for o in objs]
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    back = [codec.decode_record(e) for e in encoded]
    t_dec = time.perf_counter() - t0
    if back != objs:
        raise AssertionError(f"{codec.name} record round-trip failed")
    mb = raw_bytes / 1e6
    return (
        sum(map(len, encoded)) / raw_bytes,
        mb / max(t_comp, 1e-9),
        mb / max(t_dec, 1e-9),
    )


def _record_metrics_pbc(codec, recs, raw_bytes) -> tuple[float, float, float]:
    t0 = time.perf_counter()
    encoded = [codec.compress_record(r) for r in recs]
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    back = [codec.decompress_record(e) for e in encoded]
    t_dec = time.perf_counter() - t0
    if back != recs:
        raise AssertionError("PBC record round-trip failed")
    mb = raw_bytes / 1e6
    return (
        sum(map(len, encoded)) / raw_bytes,
        mb / max(t_comp, 1e-9),
        mb / max(t_dec, 1e-9),
    )


def _file_metrics_json(codec, objs, raw_bytes) -> tuple[float, float, float]:
    t0 = time.perf_counter()
    blob = lzma_codec.compress(codec.encode_file(objs), preset=6)
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    back = codec.decode_file(lzma_codec.decompress(blob))
    t_dec = time.perf_counter() - t0
    if back != objs:
        raise AssertionError(f"{codec.name}+LZMA file round-trip failed")
    mb = raw_bytes / 1e6
    return len(blob) / raw_bytes, mb / max(t_comp, 1e-9), mb / max(t_dec, 1e-9)


def _file_metrics_pbc(codec, recs, raw_bytes) -> tuple[float, float, float]:
    t0 = time.perf_counter()
    blob = codec.compress_file(recs)
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    back = codec.decompress_file(blob)
    t_dec = time.perf_counter() - t0
    if back != recs:
        raise AssertionError("PBC_L file round-trip failed")
    mb = raw_bytes / 1e6
    return len(blob) / raw_bytes, mb / max(t_comp, 1e-9), mb / max(t_dec, 1e-9)


def run(
    spark: SparkSession,
    scale: str = "bench",
    datasets: list[str] | None = None,
    seed: int = 0,
) -> list[dict]:
    acc: dict[tuple[str, str], list[tuple[float, float, float]]] = {}

    def add(mode: str, codec: str, metrics: tuple[float, float, float]) -> None:
        acc.setdefault((mode, codec), []).append(metrics)

    for name in datasets or JSON_DATASETS:
        corpus = load_corpus(spark, name, scale, seed=seed)
        objs = [json.loads(r) for r in corpus.test]
        train_objs = [json.loads(r) for r in corpus.train]
        raw = corpus.raw_bytes

        ion = IonB()
        bp = BinPackD()
        bp.train(train_objs)
        add("record", "Ion-B", _record_metrics_json(ion, objs, raw))
        add("record", "BP-D", _record_metrics_json(bp, objs, raw))
        pbc = trained_codec("PBC", corpus)
        pbc_f = trained_codec("PBC_F", corpus)
        add("record", "PBC", _record_metrics_pbc(pbc.codec, corpus.test, raw))
        add(
            "record", "PBC_F", _record_metrics_pbc(pbc_f.codec, corpus.test, raw)
        )
        add("file", "Ion-B+LZMA", _file_metrics_json(ion, objs, raw))
        add("file", "BP-D+LZMA", _file_metrics_json(bp, objs, raw))
        pbc_l = trained_codec("PBC_L", corpus)
        add("file", "PBC_L", _file_metrics_pbc(pbc_l, corpus.test, raw))

    rows = []
    for (mode, codec), results in acc.items():
        n = len(results)
        paper = TABLE6.get(mode, {}).get(codec, {})
        rows.append(
            {
                "mode": mode,
                "codec": codec,
                "ratio": sum(r[0] for r in results) / n,
                "comp_mbs": sum(r[1] for r in results) / n,
                "decomp_mbs": sum(r[2] for r in results) / n,
                "paper_ratio": paper.get("ratio"),
                "paper_comp_mbs": paper.get("comp_mbs"),
                "paper_decomp_mbs": paper.get("decomp_mbs"),
            }
        )
    return rows


def render(rows: list[dict]) -> str:
    return format_table(
        rows,
        [
            "mode", "codec", "ratio", "paper_ratio", "comp_mbs",
            "paper_comp_mbs", "decomp_mbs", "paper_decomp_mbs",
        ],
    )
