"""Tests for the simplified FSST symbol-table codec."""
import pytest
from hypothesis import given, strategies as st

from repro.fsst import FsstTable, train_fsst
from repro.fsst.fsst import ESCAPE, MAX_SYMBOLS


class TestTable:
    def test_roundtrip_with_symbols(self):
        t = FsstTable([b"http://", b"www.", b".com", b"e"])
        data = b"http://www.example.com"
        enc = t.encode(data)
        assert t.decode(enc) == data
        assert len(enc) < len(data)

    def test_escape_unknown_bytes(self):
        t = FsstTable([b"ab"])
        enc = t.encode(b"abz")
        assert enc == bytes([0, ESCAPE, ord("z")])
        assert t.decode(enc) == b"abz"

    def test_escape_of_0xff_byte(self):
        t = FsstTable([b"x"])
        data = b"x\xffx"
        assert t.decode(t.encode(data)) == data

    def test_empty(self):
        t = FsstTable([b"a"])
        assert t.encode(b"") == b""
        assert t.decode(b"") == b""

    def test_longest_match_wins(self):
        t = FsstTable([b"a", b"ab", b"abc"])
        assert t.encode(b"abc") == bytes([2])

    def test_too_many_symbols_rejected(self):
        with pytest.raises(ValueError):
            FsstTable([bytes([i % 250, i // 250]) for i in range(MAX_SYMBOLS + 1)])

    def test_symbol_length_bounds(self):
        with pytest.raises(ValueError):
            FsstTable([b""])
        with pytest.raises(ValueError):
            FsstTable([b"123456789"])

    def test_serialization_roundtrip(self):
        t = FsstTable([b"abc", b"\x00\xff", b"q"])
        u = FsstTable.from_dict(t.to_dict())
        assert u.symbols == t.symbols
        data = b"abcq\x00\xffabc"
        assert u.decode(t.encode(data)) == data


class TestTraining:
    def test_trained_table_compresses_repetitive_text(self):
        sample = [b"timestamp=1639574096&user=alice"] * 30
        t = train_fsst(sample)
        enc = t.encode(sample[0])
        assert len(enc) < len(sample[0]) * 0.6
        assert t.decode(enc) == sample[0]

    def test_trained_table_handles_unseen_bytes(self):
        t = train_fsst([b"aaaa bbbb"] * 5)
        data = b"zzz \x01\x02!"
        assert t.decode(t.encode(data)) == data

    def test_table_within_limits(self):
        t = train_fsst([bytes(range(256))] * 3)
        assert len(t.symbols) <= MAX_SYMBOLS

    def test_empty_sample(self):
        t = train_fsst([])
        assert t.decode(t.encode(b"anything")) == b"anything"

    @given(st.binary(max_size=200))
    def test_roundtrip_property(self, data):
        t = train_fsst([b"common prefix 123", data])
        assert t.decode(t.encode(data)) == data
