"""Tests for the LZ4/Snappy reimplementations and the Zstd/LZMA wrappers."""
import os
import random

import pytest
from hypothesis import given, settings, strategies as st

from repro.baselines import lz4, lzma_codec, snappy, zstdlike
from repro.baselines.dict_train import train_dictionary

CASES = [
    b"",
    b"a",
    b"ab",
    b"hello world " * 100,
    b"abcabcabcabcabcabc",
    bytes(range(256)) * 4,
    b"x" * 100_000,
]


@pytest.fixture(scope="module")
def random_blobs():
    rng = random.Random(7)
    return [
        os.urandom(2000),
        bytes(rng.choices(b"abcd", k=5000)),
        bytes(rng.choices(range(256), k=300)),
    ]


class TestLz4:
    @pytest.mark.parametrize("data", CASES, ids=range(len(CASES)))
    def test_roundtrip(self, data):
        assert lz4.decompress(lz4.compress(data)) == data

    def test_roundtrip_random(self, random_blobs):
        for data in random_blobs:
            assert lz4.decompress(lz4.compress(data)) == data

    def test_compresses_repetitive(self):
        data = b"the quick brown fox " * 200
        assert len(lz4.compress(data)) < len(data) * 0.2

    def test_dictionary_improves_short_records(self):
        zdict = b"GET /api/v1/users/ HTTP/1.1 host=example.com"
        rec = b"GET /api/v1/users/42 HTTP/1.1 host=example.com"
        plain = lz4.compress(rec)
        with_dict = lz4.compress(rec, zdict=zdict)
        assert len(with_dict) < len(plain)
        assert lz4.decompress(with_dict, zdict=zdict) == rec

    def test_dict_mismatch_garbles_or_raises(self):
        zdict = b"common shared prefix material"
        comp = lz4.compress(b"common shared prefix material 12", zdict=zdict)
        try:
            out = lz4.decompress(comp)  # wrong: decoded without the dict
        except (ValueError, IndexError):
            return
        assert out != b"common shared prefix material 12"

    def test_overlapping_copy(self):
        data = b"ab" * 500  # classic overlapping-match case
        assert lz4.decompress(lz4.compress(data)) == data

    @settings(max_examples=80, deadline=None)
    @given(st.binary(max_size=600))
    def test_roundtrip_property(self, data):
        assert lz4.decompress(lz4.compress(data)) == data


class TestSnappy:
    @pytest.mark.parametrize("data", CASES, ids=range(len(CASES)))
    def test_roundtrip(self, data):
        assert snappy.decompress(snappy.compress(data)) == data

    def test_roundtrip_random(self, random_blobs):
        for data in random_blobs:
            assert snappy.decompress(snappy.compress(data)) == data

    def test_compresses_repetitive(self):
        data = b"0123456789" * 300
        assert len(snappy.compress(data)) < len(data) * 0.2

    def test_length_header_checked(self):
        comp = bytearray(snappy.compress(b"hello world hello world"))
        comp[0] ^= 0x7F  # corrupt the uncompressed-length varint
        with pytest.raises((ValueError, IndexError)):
            snappy.decompress(bytes(comp))

    def test_long_literal_runs(self):
        data = os.urandom(500)  # incompressible -> literals > 60 bytes
        assert snappy.decompress(snappy.compress(data)) == data

    @settings(max_examples=80, deadline=None)
    @given(st.binary(max_size=600))
    def test_roundtrip_property(self, data):
        assert snappy.decompress(snappy.compress(data)) == data


class TestZstdLike:
    @pytest.mark.parametrize("data", CASES, ids=range(len(CASES)))
    def test_roundtrip(self, data):
        assert zstdlike.decompress(zstdlike.compress(data)) == data

    @pytest.mark.parametrize("level", [1, 6, 9])
    def test_levels(self, level):
        data = b"level test data " * 50
        assert zstdlike.decompress(zstdlike.compress(data, level=level)) == data

    def test_dictionary_mode(self):
        zdict = b'{"symbol": "IBM", "side": "B", "quantity": '
        rec = b'{"symbol": "IBM", "side": "B", "quantity": 17}'
        with_dict = zstdlike.compress(rec, zdict=zdict)
        assert len(with_dict) < len(zstdlike.compress(rec))
        assert zstdlike.decompress(with_dict, zdict=zdict) == rec


class TestLzma:
    @pytest.mark.parametrize("data", CASES, ids=range(len(CASES)))
    def test_roundtrip(self, data):
        assert lzma_codec.decompress(lzma_codec.compress(data)) == data

    def test_best_ratio_of_family(self):
        # varied realistic data — on trivially repetitive input DEFLATE's
        # smaller framing can win, which is not the property of interest
        data = "\n".join(
            f"log line {i} with value {i * 37} and flag {i % 2}" for i in range(2000)
        ).encode()
        assert len(lzma_codec.compress(data, preset=9)) < len(
            zstdlike.compress(data, level=9)
        )


class TestDictTrain:
    def test_dictionary_contains_frequent_shingles(self):
        samples = [b'{"symbol": "IBM", "price": 1}'] * 50
        d = train_dictionary(samples)
        assert b'"symbol": "IBM"' in d or b'{"symbol": "IBM"' in d

    def test_size_cap(self):
        samples = [os.urandom(64) for _ in range(100)]
        assert len(train_dictionary(samples, dict_size=1024)) <= 1024

    def test_empty_samples(self):
        assert train_dictionary([]) == b""

    def test_improves_zstdlike_on_short_records(self):
        from repro.datasets import records

        recs = [r.encode() for r in records("KV1", 100, seed=5)]
        zdict = train_dictionary(recs[:50])
        plain = sum(len(zstdlike.compress(r)) for r in recs[50:])
        with_dict = sum(len(zstdlike.compress(r, zdict=zdict)) for r in recs[50:])
        assert with_dict < plain
