"""Table 4 benchmarks — file (block) compress/decompress throughput."""
import pytest

CODECS = ["Snappy", "LZMA", "LZ4", "Zstd", "PBC_Z", "PBC_L"]
DATASETS = ["KV1", "Apache"]


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("codec_name", CODECS)
def test_compress_file(benchmark, bench_codec, bench_corpus, codec_name, dataset):
    codec = bench_codec(codec_name, dataset)
    _, batch = bench_corpus(dataset)
    raw = len("\n".join(batch).encode())

    blob = benchmark(lambda: codec.compress_file(batch))
    benchmark.extra_info["ratio"] = len(blob) / raw
    benchmark.extra_info["raw_mb"] = raw / 1e6
    assert codec.decompress_file(blob) == batch


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("codec_name", CODECS)
def test_decompress_file(benchmark, bench_codec, bench_corpus, codec_name, dataset):
    codec = bench_codec(codec_name, dataset)
    _, batch = bench_corpus(dataset)
    blob = codec.compress_file(batch)

    result = benchmark(lambda: codec.decompress_file(blob))
    benchmark.extra_info["raw_mb"] = len("\n".join(batch).encode()) / 1e6
    assert result == batch
