"""LZMA baseline — the real C-backed stdlib implementation.

The paper uses LZMA as the highest-ratio LZ-family member and as the
block backend of ``PBC_L``. ``FORMAT_ALONE`` (classic .lzma headers) is
used: it carries less framing overhead than .xz, which matters for the
small corpora used in tests.
"""
from __future__ import annotations

import lzma


def compress(data: bytes, preset: int = 6) -> bytes:
    return lzma.compress(data, format=lzma.FORMAT_ALONE, preset=preset)


def decompress(data: bytes) -> bytes:
    return lzma.decompress(data, format=lzma.FORMAT_ALONE)
