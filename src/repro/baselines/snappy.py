"""Pure-Python Snappy format codec.

Implements the Snappy wire format: a varint uncompressed length followed
by tagged elements — literals (tag ``00``) and copies with 2-byte
offsets (tag ``10``). The encoder is a greedy 4-byte hash matcher like
the reference implementation's fast path; copies with 1-byte offsets
(tag ``01``) are valid input for the decoder but never emitted, which
the format explicitly allows.
"""
from __future__ import annotations

from ..core.varint import decode_varint, encode_varint

MIN_MATCH = 4
MAX_COPY_LEN = 64
MAX_OFFSET = 0xFFFF


def _hash4(data: bytes, i: int) -> int:
    v = data[i] | (data[i + 1] << 8) | (data[i + 2] << 16) | (data[i + 3] << 24)
    return ((v * 0x1E35A7BD) & 0xFFFFFFFF) >> 17


def _emit_literal(out: bytearray, data: bytes, start: int, end: int) -> None:
    n = end - start
    while n > 0:
        run = min(n, 60)
        if run < 60:
            out.append((run - 1) << 2)
        else:
            out.append(60 << 2)
            out.append(run - 1)
        out += data[start : start + run]
        start += run
        n -= run


def compress(data: bytes) -> bytes:
    out = bytearray(encode_varint(len(data)))
    n = len(data)
    table: dict[int, int] = {}
    i = 0
    anchor = 0
    while i + MIN_MATCH <= n:
        h = _hash4(data, i)
        cand = table.get(h)
        table[h] = i
        if (
            cand is not None
            and i - cand <= MAX_OFFSET
            and data[cand : cand + MIN_MATCH] == data[i : i + MIN_MATCH]
        ):
            m = MIN_MATCH
            while i + m < n and data[cand + m] == data[i + m]:
                m += 1
            if anchor < i:
                _emit_literal(out, data, anchor, i)
            offset = i - cand
            rem = m
            while rem >= MIN_MATCH:
                run = min(rem, MAX_COPY_LEN)
                if rem - run in (1, 2, 3):  # leave a tail long enough to emit
                    run = rem - MIN_MATCH
                out.append(((run - 1) << 2) | 2)
                out.append(offset & 0xFF)
                out.append(offset >> 8)
                rem -= run
            i += m
            anchor = i
        else:
            i += 1
    if anchor < n:
        _emit_literal(out, data, anchor, n)
    return bytes(out)


def decompress(data: bytes) -> bytes:
    expected, pos = decode_varint(data, 0)
    out = bytearray()
    n = len(data)
    while pos < n:
        tag = data[pos]
        pos += 1
        kind = tag & 3
        if kind == 0:  # literal
            ln = tag >> 2
            if ln < 60:
                ln += 1
            else:
                extra = ln - 59
                ln = int.from_bytes(data[pos : pos + extra], "little") + 1
                pos += extra
            out += data[pos : pos + ln]
            pos += ln
        elif kind == 1:  # copy, 1-byte offset
            ln = ((tag >> 2) & 0x7) + 4
            offset = ((tag >> 5) << 8) | data[pos]
            pos += 1
            start = len(out) - offset
            for k in range(ln):
                out.append(out[start + k])
        elif kind == 2:  # copy, 2-byte offset
            ln = (tag >> 2) + 1
            offset = data[pos] | (data[pos + 1] << 8)
            pos += 2
            start = len(out) - offset
            for k in range(ln):
                out.append(out[start + k])
        else:
            raise ValueError("copy-4 tags are never emitted by any encoder")
    if len(out) != expected:
        raise ValueError(f"length mismatch: {len(out)} != {expected}")
    return bytes(out)
