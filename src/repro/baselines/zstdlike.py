"""Zstd substitute built on zlib/DEFLATE (see DESIGN.md §2).

libzstd is unavailable offline; DEFLATE is the closest stdlib relative —
the same LZ77-window + entropy-coding family, with preset-dictionary
support (``zdict``) standing in for Zstd's trained dictionaries, which
is the mechanism ``Zstd(dict)`` in Table 3 depends on for short records.
Levels map 1:1 onto zlib levels (1 fast … 9 best).
"""
from __future__ import annotations

import zlib


def compress(data: bytes, level: int = 6, zdict: bytes = b"") -> bytes:
    c = zlib.compressobj(level, zlib.DEFLATED, zlib.MAX_WBITS, 8, 0, zdict)
    return c.compress(data) + c.flush()


def decompress(data: bytes, zdict: bytes = b"") -> bytes:
    d = zlib.decompressobj(zlib.MAX_WBITS, zdict)
    return d.decompress(data) + d.flush()
