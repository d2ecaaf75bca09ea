"""LEB128-style variable-length unsigned integer encoding.

Used for pattern ids, VARCHAR length headers, and the VARINT field
encoder (Table 1 of the paper).
"""
from __future__ import annotations


def encode_varint(value: int) -> bytes:
    """Encode a non-negative integer as LEB128 bytes (7 bits/byte)."""
    if value < 0:
        raise ValueError(f"varint must be non-negative, got {value}")
    out = bytearray()
    while True:
        b = value & 0x7F
        value >>= 7
        if value:
            out.append(b | 0x80)
        else:
            out.append(b)
            return bytes(out)


def decode_varint(buf: bytes | memoryview, pos: int = 0) -> tuple[int, int]:
    """Decode a varint starting at ``pos``; return (value, next_pos)."""
    result = 0
    shift = 0
    while True:
        if pos >= len(buf):
            raise ValueError("truncated varint")
        b = buf[pos]
        pos += 1
        result |= (b & 0x7F) << shift
        if not b & 0x80:
            return result, pos
        shift += 7
        if shift > 63:
            raise ValueError("varint too long")


def varint_size(value: int) -> int:
    """Number of bytes ``encode_varint(value)`` produces."""
    if value < 0:
        raise ValueError(f"varint must be non-negative, got {value}")
    n = 1
    while value >= 0x80:
        value >>= 7
        n += 1
    return n
