"""Simplified FSST: static symbol-table string compression (Boncz et al.).

The real FSST trains a table of up to 255 symbols (1–8 bytes) over a
sample in several generations and encodes by greedy longest-match, with
byte 255 escaping bytes outside the table. This reproduction keeps the
same interface and format properties — per-string compression, random
access, O(1) decode via table lookup — with a simpler two-generation
gain-driven trainer. It operates on ``bytes`` so it can also serve as
PBC's residual codec (``PBC_F``).

Encoded form: sequence of code bytes; ``0xFF`` is the escape marker and
is followed by one literal byte. Codes ``0..len(table)-1`` index the
symbol table.
"""
from __future__ import annotations

from collections import Counter

ESCAPE = 0xFF
MAX_SYMBOLS = 255  # code 255 reserved for escape
MAX_SYMBOL_LEN = 8


class FsstTable:
    """An immutable symbol table with greedy longest-match encoding."""

    def __init__(self, symbols: list[bytes]):
        if len(symbols) > MAX_SYMBOLS:
            raise ValueError(f"at most {MAX_SYMBOLS} symbols, got {len(symbols)}")
        for s in symbols:
            if not 1 <= len(s) <= MAX_SYMBOL_LEN:
                raise ValueError(f"symbol length must be 1..8, got {s!r}")
        self.symbols = list(symbols)
        # longest-match lookup: length -> {symbol: code}
        self._by_len: list[dict[bytes, int]] = [dict() for _ in range(MAX_SYMBOL_LEN + 1)]
        for code, s in enumerate(self.symbols):
            self._by_len[len(s)][s] = code
        self._max_len = max((len(s) for s in self.symbols), default=1)

    def encode(self, data: bytes) -> bytes:
        out = bytearray()
        i = 0
        n = len(data)
        by_len = self._by_len
        top = self._max_len
        while i < n:
            code = None
            for ln in range(min(top, n - i), 0, -1):
                code = by_len[ln].get(data[i : i + ln])
                if code is not None:
                    out.append(code)
                    i += ln
                    break
            if code is None:
                out.append(ESCAPE)
                out.append(data[i])
                i += 1
        return bytes(out)

    def decode(self, data: bytes) -> bytes:
        out = bytearray()
        symbols = self.symbols
        i = 0
        n = len(data)
        while i < n:
            c = data[i]
            if c == ESCAPE:
                out.append(data[i + 1])
                i += 2
            else:
                out += symbols[c]
                i += 1
        return bytes(out)

    # ---- serialisation (broadcast to executors) ----

    def to_dict(self) -> dict:
        return {"symbols": [s.hex() for s in self.symbols]}

    @classmethod
    def from_dict(cls, d: dict) -> "FsstTable":
        return cls([bytes.fromhex(s) for s in d["symbols"]])


def _count_candidates(samples: list[bytes], max_bytes: int) -> Counter:
    """Frequencies of all 2..8-byte substrings over a bounded sample."""
    counts: Counter = Counter()
    budget = max_bytes
    for s in samples:
        if budget <= 0:
            break
        s = s[: min(len(s), budget)]
        budget -= len(s)
        n = len(s)
        for i in range(n):
            for ln in range(2, min(MAX_SYMBOL_LEN, n - i) + 1):
                counts[s[i : i + ln]] += 1
    return counts


def train_fsst(
    samples: list[bytes],
    *,
    max_sample_bytes: int = 1 << 16,
    min_count: int = 2,
) -> FsstTable:
    """Two-generation gain-greedy trainer.

    Generation 1 ranks substrings by gain ``count * (len - 1)`` (bytes
    saved vs emitting each byte as its own code). Generation 2 re-encodes
    the sample with the provisional table and fills remaining slots with
    the single bytes that still occur (so escapes stay rare), mirroring
    the real FSST's iterative refinement at much lower complexity.
    """
    counts = _count_candidates(samples, max_sample_bytes)
    ranked = sorted(
        (c for c in counts.items() if c[1] >= min_count),
        key=lambda kv: -(kv[1] * (len(kv[0]) - 1)),
    )
    chosen: list[bytes] = []
    covered: set[bytes] = set()
    for sym, _cnt in ranked:
        if len(chosen) >= MAX_SYMBOLS - 64:  # leave room for single bytes
            break
        if sym in covered:
            continue
        chosen.append(sym)
        covered.add(sym)
    # generation 2: add the most frequent single bytes not yet in the table
    byte_counts: Counter = Counter()
    budget = max_sample_bytes
    for s in samples:
        if budget <= 0:
            break
        s = s[: min(len(s), budget)]
        budget -= len(s)
        byte_counts.update(s)
    for b, _cnt in byte_counts.most_common():
        if len(chosen) >= MAX_SYMBOLS:
            break
        sym = bytes([b])
        if sym not in covered:
            chosen.append(sym)
            covered.add(sym)
    return FsstTable(chosen)
