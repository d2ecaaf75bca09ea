"""End-to-end tests for the PBC codec across all 16 datasets."""
import pytest

from repro.core.pbc import PBCCodec, train_pbc
from repro.datasets import GENERATORS

ALL_DATASETS = list(GENERATORS)


@pytest.fixture(scope="module")
def pbc(corpus_cache):
    cache = {}

    def get(name: str) -> tuple[PBCCodec, list[str]]:
        if name not in cache:
            train, test = corpus_cache(name)
            cache[name] = (PBCCodec(train_pbc(train, k=16)), test)
        return cache[name]

    return get


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_roundtrip_every_dataset(pbc, name):
    codec, test = pbc(name)
    for rec in test:
        assert codec.decompress_record(codec.compress_record(rec)) == rec


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_block_roundtrip_every_dataset(pbc, name):
    codec, test = pbc(name)
    assert codec.decompress_block(codec.compress_block(test)) == test


@pytest.mark.parametrize(
    "name",
    [n for n in ALL_DATASETS if n not in ("uuid",)],
)
def test_compresses_structured_data(pbc, name):
    codec, test = pbc(name)
    comp = sum(len(codec.compress_record(r)) for r in test)
    raw = sum(len(r.encode("utf-8")) for r in test)
    assert comp < raw, f"{name}: no compression ({comp}/{raw})"


def test_uuid_is_capacity_boundary(pbc):
    # the paper's structure-free control: little to gain, but lossless
    codec, test = pbc("uuid")
    comp = sum(len(codec.compress_record(r)) for r in test)
    raw = sum(len(r.encode("utf-8")) for r in test)
    assert comp <= raw * 1.1


def test_outlier_stored_raw(pbc):
    codec, _ = pbc("KV1")
    weird = "totally unrelated record éø"
    data = codec.compress_record(weird)
    assert data[0] == 0  # outlier marker
    assert codec.decompress_record(data) == weird


def test_outlier_rate_zero_on_in_distribution(pbc):
    codec, test = pbc("KV3")
    assert codec.outlier_rate(test) == 0.0


def test_outlier_rate_one_on_garbage(pbc):
    codec, _ = pbc("KV3")
    assert codec.outlier_rate(["☃" * 5, "☄" * 7]) == 1.0


def test_outlier_rate_empty_list(pbc):
    codec, _ = pbc("KV1")
    assert codec.outlier_rate([]) == 0.0


def test_empty_block():
    codec = PBCCodec(train_pbc(["a1", "a2"]))
    assert codec.decompress_block(codec.compress_block([])) == []


def test_unicode_record_roundtrip():
    recs = [f"msg=日本語{i}&n={i}" for i in range(20)]
    codec = PBCCodec(train_pbc(recs, k=2))
    for r in recs:
        assert codec.decompress_record(codec.compress_record(r)) == r


def test_dictionary_survives_serialization(pbc):
    from repro.core.extract import PatternDictionary

    codec, test = pbc("KV1")
    clone = PBCCodec(
        PatternDictionary.from_dict(codec.dictionary.to_dict())
    )
    for rec in test[:20]:
        assert clone.decompress_record(codec.compress_record(rec)) == rec
        assert codec.decompress_record(clone.compress_record(rec)) == rec


def test_compressed_is_smaller_than_fsst_on_kv1(pbc, codec_cache):
    codec, test = pbc("KV1")
    fsst = codec_cache("FSST", "KV1")
    pbc_bytes = sum(len(codec.compress_record(r)) for r in test)
    fsst_bytes = sum(len(fsst.compress_record(r)) for r in test)
    assert pbc_bytes < fsst_bytes
