"""Table 8 benchmarks — TierBase SET/GET throughput per value codec."""
import pytest

from repro.kvstore import TierBase

WORKLOADS = {"A": "KV1", "B": "KV2"}
CODECS = ["Uncompressed", "Zstd(dict)", "PBC_F"]


def _codec(bench_codec, name, dataset):
    return None if name == "Uncompressed" else bench_codec(name, dataset)


@pytest.mark.parametrize("workload", list(WORKLOADS))
@pytest.mark.parametrize("codec_name", CODECS)
def test_set_throughput(benchmark, bench_codec, bench_corpus, workload, codec_name):
    dataset = WORKLOADS[workload]
    _, values = bench_corpus(dataset)
    codec = _codec(bench_codec, codec_name, dataset)
    keys = [f"k:{i}" for i in range(len(values))]

    def do_sets():
        db = TierBase(codec)
        for k, v in zip(keys, values):
            db.set(k, v)
        return db

    db = benchmark(do_sets)
    base = sum(len(v.encode()) for v in values)
    benchmark.extra_info["memory_pct"] = 100.0 * db.memory_usage() / base
    benchmark.extra_info["ops"] = len(values)


@pytest.mark.parametrize("workload", list(WORKLOADS))
@pytest.mark.parametrize("codec_name", CODECS)
def test_get_throughput(benchmark, bench_codec, bench_corpus, workload, codec_name):
    dataset = WORKLOADS[workload]
    _, values = bench_corpus(dataset)
    codec = _codec(bench_codec, codec_name, dataset)
    db = TierBase(codec)
    keys = [f"k:{i}" for i in range(len(values))]
    for k, v in zip(keys, values):
        db.set(k, v)

    got = benchmark(lambda: [db.get(k) for k in keys])
    benchmark.extra_info["ops"] = len(values)
    assert got == values
