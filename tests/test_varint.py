"""Unit tests for the LEB128 varint codec."""
import pytest
from hypothesis import given, strategies as st

from repro.core.varint import decode_varint, encode_varint, varint_size


@pytest.mark.parametrize(
    "value,expected",
    [
        (0, b"\x00"),
        (1, b"\x01"),
        (127, b"\x7f"),
        (128, b"\x80\x01"),
        (300, b"\xac\x02"),
        (16383, b"\xff\x7f"),
        (16384, b"\x80\x80\x01"),
    ],
)
def test_known_encodings(value, expected):
    assert encode_varint(value) == expected


@pytest.mark.parametrize("value", [0, 1, 127, 128, 255, 2**14, 2**21, 2**32, 2**60])
def test_roundtrip(value):
    data = encode_varint(value)
    got, pos = decode_varint(data, 0)
    assert got == value
    assert pos == len(data)


@pytest.mark.parametrize("value", [0, 5, 127, 128, 2**20, 2**35])
def test_size_matches_encoding(value):
    assert varint_size(value) == len(encode_varint(value))


def test_decode_with_offset():
    data = b"\xff" + encode_varint(300) + b"\x00"
    got, pos = decode_varint(data, 1)
    assert got == 300
    assert pos == 3


def test_negative_rejected():
    with pytest.raises(ValueError):
        encode_varint(-1)
    with pytest.raises(ValueError):
        varint_size(-5)


def test_truncated_rejected():
    with pytest.raises(ValueError):
        decode_varint(b"\x80", 0)
    with pytest.raises(ValueError):
        decode_varint(b"", 0)


def test_overlong_rejected():
    with pytest.raises(ValueError):
        decode_varint(b"\x80" * 10 + b"\x01", 0)


@given(st.integers(min_value=0, max_value=2**63 - 1))
def test_roundtrip_property(value):
    got, pos = decode_varint(encode_varint(value), 0)
    assert got == value


@given(st.lists(st.integers(min_value=0, max_value=2**40), max_size=20))
def test_stream_of_varints(values):
    buf = b"".join(encode_varint(v) for v in values)
    pos = 0
    out = []
    for _ in values:
        v, pos = decode_varint(buf, pos)
        out.append(v)
    assert out == values
    assert pos == len(buf)
