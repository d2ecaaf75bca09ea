"""Table 7 benchmarks — BP-D+LZMA vs PBC_L file compression on JSON."""
import json

import pytest

from repro.baselines import lzma_codec
from repro.jsoncomp import BinPackD

DATASETS = ["github", "cities"]


@pytest.mark.parametrize("dataset", DATASETS)
def test_bp_d_lzma_file(benchmark, bench_corpus, dataset):
    train, batch = bench_corpus(dataset)
    objs = [json.loads(r) for r in batch]
    bp = BinPackD()
    bp.train([json.loads(r) for r in train])

    blob = benchmark(lambda: lzma_codec.compress(bp.encode_file(objs), preset=6))
    raw = sum(len(r.encode()) for r in batch)
    benchmark.extra_info["ratio"] = len(blob) / raw
    assert bp.decode_file(lzma_codec.decompress(blob)) == objs


@pytest.mark.parametrize("dataset", DATASETS)
def test_pbc_l_file(benchmark, bench_codec, bench_corpus, dataset):
    codec = bench_codec("PBC_L", dataset)
    _, batch = bench_corpus(dataset)
    blob = benchmark(lambda: codec.compress_file(batch))
    raw = sum(len(r.encode()) for r in batch)
    benchmark.extra_info["ratio"] = len(blob) / raw
    assert codec.decompress_file(blob) == batch
