"""Table 6 benchmarks — JSON record serialization codecs."""
import json

import pytest

from repro.jsoncomp import BinPackD, IonB

DATASET = "cities"


@pytest.fixture(scope="module")
def objs(bench_corpus):
    _, batch = bench_corpus(DATASET)
    return [json.loads(r) for r in batch]


@pytest.fixture(scope="module")
def binpack(bench_corpus):
    train, _ = bench_corpus(DATASET)
    bp = BinPackD()
    bp.train([json.loads(r) for r in train])
    return bp


def _raw(objs) -> int:
    return sum(len(json.dumps(o).encode()) for o in objs)


def test_ion_b_encode(benchmark, objs):
    ion = IonB()
    enc = benchmark(lambda: [ion.encode_record(o) for o in objs])
    benchmark.extra_info["ratio"] = sum(map(len, enc)) / _raw(objs)
    assert [ion.decode_record(e) for e in enc] == objs


def test_ion_b_decode(benchmark, objs):
    ion = IonB()
    enc = [ion.encode_record(o) for o in objs]
    assert benchmark(lambda: [ion.decode_record(e) for e in enc]) == objs


def test_bp_d_encode(benchmark, objs, binpack):
    enc = benchmark(lambda: [binpack.encode_record(o) for o in objs])
    benchmark.extra_info["ratio"] = sum(map(len, enc)) / _raw(objs)
    assert [binpack.decode_record(e) for e in enc] == objs


def test_bp_d_decode(benchmark, objs, binpack):
    enc = [binpack.encode_record(o) for o in objs]
    assert benchmark(lambda: [binpack.decode_record(e) for e in enc]) == objs


@pytest.mark.parametrize("codec_name", ["PBC", "PBC_F"])
def test_pbc_record_encode(benchmark, bench_codec, bench_corpus, codec_name):
    codec = bench_codec(codec_name, DATASET)
    _, batch = bench_corpus(DATASET)
    enc = benchmark(lambda: [codec.compress_record(r) for r in batch])
    raw = sum(len(r.encode()) for r in batch)
    benchmark.extra_info["ratio"] = sum(map(len, enc)) / raw
    assert [codec.decompress_record(e) for e in enc] == batch
