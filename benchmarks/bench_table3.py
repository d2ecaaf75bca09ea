"""Table 3 benchmarks — line-by-line compress/decompress throughput.

One benchmark per (codec, dataset, direction); pytest-benchmark's
``extra_info`` records the compression ratio so a single run regenerates
the full Table 3 cell set for the chosen datasets.
"""
import pytest

CODECS = ["FSST", "LZ4(dict)", "Zstd(dict)", "PBC", "PBC_F"]
DATASETS = ["KV1", "Apache", "github"]


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("codec_name", CODECS)
def test_compress(benchmark, bench_codec, bench_corpus, codec_name, dataset):
    codec = bench_codec(codec_name, dataset)
    _, batch = bench_corpus(dataset)

    result = benchmark(lambda: [codec.compress_record(r) for r in batch])
    raw = sum(len(r.encode()) for r in batch)
    benchmark.extra_info["ratio"] = sum(map(len, result)) / raw
    benchmark.extra_info["raw_mb"] = raw / 1e6
    assert [codec.decompress_record(c) for c in result] == batch


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("codec_name", CODECS)
def test_decompress(benchmark, bench_codec, bench_corpus, codec_name, dataset):
    codec = bench_codec(codec_name, dataset)
    _, batch = bench_corpus(dataset)
    compressed = [codec.compress_record(r) for r in batch]

    result = benchmark(lambda: [codec.decompress_record(c) for c in compressed])
    benchmark.extra_info["raw_mb"] = sum(len(r.encode()) for r in batch) / 1e6
    assert result == batch
