"""Tests for the TierBase KV-store substrate."""
import pytest

from repro.baselines.registry import make_codec
from repro.datasets import records
from repro.kvstore import TierBase, run_workload


@pytest.fixture(scope="module")
def pbc_codec():
    codec = make_codec("PBC_F")
    codec.train(records("KV1", 60, seed=1))
    return codec


class TestStore:
    def test_set_get(self):
        db = TierBase()
        db.set("k", "value")
        assert db.get("k") == "value"

    def test_get_missing(self):
        assert TierBase().get("nope") is None

    def test_overwrite(self):
        db = TierBase()
        db.set("k", "v1")
        db.set("k", "v2")
        assert db.get("k") == "v2"
        assert len(db) == 1

    def test_delete(self):
        db = TierBase()
        db.set("k", "v")
        assert db.delete("k") is True
        assert db.get("k") is None
        assert db.delete("k") is False

    def test_memory_usage_uncompressed(self):
        db = TierBase()
        db.set("a", "xyz")
        db.set("b", "1234")
        assert db.memory_usage() == 7

    def test_codec_values_transparent(self, pbc_codec):
        db = TierBase(pbc_codec)
        for i, rec in enumerate(records("KV1", 30, seed=2)):
            db.set(f"k{i}", rec)
        for i, rec in enumerate(records("KV1", 30, seed=2)):
            assert db.get(f"k{i}") == rec

    def test_codec_reduces_memory(self, pbc_codec):
        values = records("KV1", 50, seed=3)
        plain = TierBase()
        packed = TierBase(pbc_codec)
        for i, v in enumerate(values):
            plain.set(str(i), v)
            packed.set(str(i), v)
        assert packed.memory_usage() < plain.memory_usage() * 0.5

    def test_unicode_values(self):
        db = TierBase()
        db.set("k", "日本語 ünïcode")
        assert db.get("k") == "日本語 ünïcode"


class TestWorkload:
    def test_uncompressed_baseline(self):
        values = records("KV1", 40, seed=4)
        res = run_workload(values, None)
        assert res.codec_name == "Uncompressed"
        assert res.memory_pct == pytest.approx(100.0)
        assert res.set_qps > 0 and res.get_qps > 0

    def test_compressed_workload(self, pbc_codec):
        values = records("KV1", 40, seed=4)
        res = run_workload(values, pbc_codec)
        assert res.codec_name == "PBC_F"
        assert res.memory_pct < 60.0

    def test_memory_pct_uses_given_baseline(self, pbc_codec):
        values = records("KV1", 20, seed=4)
        base = sum(len(v.encode()) for v in values)
        res = run_workload(values, pbc_codec, uncompressed_bytes=base * 2)
        res2 = run_workload(values, pbc_codec, uncompressed_bytes=base)
        assert res.memory_pct == pytest.approx(res2.memory_pct / 2)
