"""Table 5 benchmarks — LogReducer vs PBC_L on log data."""
import pytest

from repro.logcomp import LogReducer

DATASETS = ["Apache", "HDFS"]


@pytest.mark.parametrize("dataset", DATASETS)
def test_logreducer_compress(benchmark, bench_corpus, dataset):
    _, batch = bench_corpus(dataset)
    lr = LogReducer()
    blob = benchmark(lambda: lr.compress_file(batch))
    raw = len("\n".join(batch).encode())
    benchmark.extra_info["ratio"] = len(blob) / raw
    assert lr.decompress_file(blob) == batch


@pytest.mark.parametrize("dataset", DATASETS)
def test_logreducer_decompress(benchmark, bench_corpus, dataset):
    _, batch = bench_corpus(dataset)
    lr = LogReducer()
    blob = lr.compress_file(batch)
    assert benchmark(lambda: lr.decompress_file(blob)) == batch


@pytest.mark.parametrize("dataset", DATASETS)
def test_pbc_l_compress(benchmark, bench_codec, bench_corpus, dataset):
    codec = bench_codec("PBC_L", dataset)
    _, batch = bench_corpus(dataset)
    blob = benchmark(lambda: codec.compress_file(batch))
    raw = len("\n".join(batch).encode())
    benchmark.extra_info["ratio"] = len(blob) / raw
    assert codec.decompress_file(blob) == batch


@pytest.mark.parametrize("dataset", DATASETS)
def test_pbc_l_decompress(benchmark, bench_codec, bench_corpus, dataset):
    codec = bench_codec("PBC_L", dataset)
    _, batch = bench_corpus(dataset)
    blob = codec.compress_file(batch)
    assert benchmark(lambda: codec.decompress_file(blob)) == batch
