"""Pure-Python LZ4 block format codec (with optional preset dictionary).

Implements the LZ4 block layout — per sequence a token byte
(literal-length nibble | match-length nibble), optional length
extension bytes, literals, a 2-byte little-endian match offset, and a
match-length extension — with a greedy 4-byte hash-table matcher, the
same parsing strategy as the reference fast path. A preset dictionary
is supported the way liblz4 does it: the dictionary is a virtual prefix
of the input, so offsets may reach back into it (this is what
``LZ4(dict)`` in Table 3 relies on for short records).
"""
from __future__ import annotations

MIN_MATCH = 4
MAX_OFFSET = 0xFFFF
# matches must not extend into the final 5 bytes (mirrors the spec's
# end-of-block conditions and keeps the greedy loop simple)
TAIL_LITERALS = 5


def _hash4(data: bytes | bytearray, i: int) -> int:
    v = data[i] | (data[i + 1] << 8) | (data[i + 2] << 16) | (data[i + 3] << 24)
    return ((v * 2654435761) & 0xFFFFFFFF) >> 18


def _write_len(out: bytearray, n: int) -> None:
    while n >= 255:
        out.append(255)
        n -= 255
    out.append(n)


def compress(data: bytes, zdict: bytes = b"") -> bytes:
    src = zdict + data
    base = len(zdict)
    n = len(src)
    out = bytearray()
    table: dict[int, int] = {}
    # seed the table with dictionary positions
    for i in range(0, max(0, base - MIN_MATCH + 1)):
        table[_hash4(src, i)] = i
    i = base
    anchor = base
    limit = n - TAIL_LITERALS
    while i < limit and n - i >= MIN_MATCH:
        h = _hash4(src, i)
        cand = table.get(h)
        table[h] = i
        if (
            cand is not None
            and i - cand <= MAX_OFFSET
            and src[cand : cand + MIN_MATCH] == src[i : i + MIN_MATCH]
        ):
            # extend the match forward, staying clear of the tail
            m = MIN_MATCH
            max_m = min(n - i - TAIL_LITERALS + MIN_MATCH, n - i)
            while m < max_m and src[cand + m] == src[i + m]:
                m += 1
            if i + m > limit:
                m = limit - i
            if m >= MIN_MATCH:
                lit_len = i - anchor
                match_len = m - MIN_MATCH
                token = (min(lit_len, 15) << 4) | min(match_len, 15)
                out.append(token)
                if lit_len >= 15:
                    _write_len(out, lit_len - 15)
                out += src[anchor:i]
                offset = i - cand
                out.append(offset & 0xFF)
                out.append(offset >> 8)
                if match_len >= 15:
                    _write_len(out, match_len - 15)
                i += m
                anchor = i
                continue
        i += 1
    # final literals-only sequence
    lit_len = n - anchor
    out.append(min(lit_len, 15) << 4)
    if lit_len >= 15:
        _write_len(out, lit_len - 15)
    out += src[anchor:n]
    return bytes(out)


def _read_len(data: bytes, pos: int, initial: int) -> tuple[int, int]:
    n = initial
    if initial == 15:
        while True:
            b = data[pos]
            pos += 1
            n += b
            if b != 255:
                break
    return n, pos


def decompress(data: bytes, zdict: bytes = b"") -> bytes:
    out = bytearray(zdict)
    base = len(zdict)
    pos = 0
    n = len(data)
    while pos < n:
        token = data[pos]
        pos += 1
        lit_len, pos = _read_len(data, pos, token >> 4)
        out += data[pos : pos + lit_len]
        pos += lit_len
        if pos >= n:
            break  # final sequence has no match part
        offset = data[pos] | (data[pos + 1] << 8)
        pos += 2
        match_len, pos = _read_len(data, pos, token & 0xF)
        match_len += MIN_MATCH
        start = len(out) - offset
        if start < 0:
            raise ValueError("corrupt LZ4 stream: offset before dictionary")
        for k in range(match_len):  # byte-wise: overlapping copies are legal
            out.append(out[start + k])
    return bytes(out[base:])
