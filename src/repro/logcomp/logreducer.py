"""Simplified LogReducer (Wei et al., FAST'21) — parser-based log compression.

LogReducer parses logs into templates + variables with a log parser,
then applies variable-specific encodings (timestamp deltas, numeric
packing) before an LZMA backend. This reproduction keeps that pipeline:

1. *Parse*: tokenize on whitespace; a token containing a digit is a
   variable slot, the rest is template text (a Drain-style parser
   distilled to its effect on machine logs).
2. *Encode variables by kind*: all-digit variables are stored as
   zigzag-varint deltas against the previous value in the same slot of
   the same template (timestamps and counters become tiny); other
   variables are length-prefixed strings.
3. *Backend*: the whole serialized stream is LZMA-compressed.

Like the original, it is file-mode only and log-specific: it cannot
compress non-log data better than its backend, and there is no
per-record random access. Decompression rebuilds lines exactly.
"""
from __future__ import annotations

from ..baselines import lzma_codec
from ..core.varint import decode_varint, encode_varint


def _zigzag(n: int) -> int:
    return (n << 1) ^ (n >> 63) if n >= 0 else ((-n) << 1) - 1


def _unzigzag(z: int) -> int:
    return (z >> 1) if (z & 1) == 0 else -((z + 1) >> 1)


def _is_numeric(tok: str) -> bool:
    return tok.isdigit() and len(tok) <= 18  # fits int64 after delta


class LogReducer:
    """Template-mining log compressor with typed variable encodings."""

    name = "LogReducer"
    random_access = False

    # ---- parsing ----

    @staticmethod
    def _template_of(line: str) -> tuple[str, list[str]]:
        """Split a line into its template key and variable tokens."""
        tokens = line.split(" ")
        tmpl: list[str] = []
        variables: list[str] = []
        for tok in tokens:
            if any(c.isdigit() for c in tok):
                tmpl.append("\x00")  # variable slot marker
                variables.append(tok)
            else:
                tmpl.append(tok)
        return " ".join(tmpl), variables

    # ---- compression ----

    def compress_file(self, records: list[str]) -> bytes:
        templates: dict[str, int] = {}
        lines: list[tuple[int, list[str]]] = []
        for line in records:
            tmpl, variables = self._template_of(line)
            tid = templates.setdefault(tmpl, len(templates))
            lines.append((tid, variables))

        out = bytearray()
        tmpl_blob = "\x01".join(templates.keys()).encode("utf-8")
        out += encode_varint(len(tmpl_blob))
        out += tmpl_blob
        out += encode_varint(len(lines))
        # per-line template ids
        for tid, _ in lines:
            out += encode_varint(tid)
        # variables, delta-encoded per (template, slot)
        last_numeric: dict[tuple[int, int], int] = {}
        for tid, variables in lines:
            for slot, var in enumerate(variables):
                if _is_numeric(var) and (len(var) == 1 or var[0] != "0"):
                    value = int(var)
                    prev = last_numeric.get((tid, slot), 0)
                    out += b"\x01"
                    out += encode_varint(_zigzag(value - prev))
                    last_numeric[(tid, slot)] = value
                else:
                    b = var.encode("utf-8")
                    out += b"\x00"
                    out += encode_varint(len(b))
                    out += b
        return lzma_codec.compress(bytes(out), preset=9)

    # ---- decompression ----

    def decompress_file(self, data: bytes) -> list[str]:
        raw = lzma_codec.decompress(data)
        pos = 0
        tmpl_len, pos = decode_varint(raw, pos)
        templates = raw[pos : pos + tmpl_len].decode("utf-8").split("\x01")
        pos += tmpl_len
        n_lines, pos = decode_varint(raw, pos)
        tids: list[int] = []
        for _ in range(n_lines):
            tid, pos = decode_varint(raw, pos)
            tids.append(tid)
        slots = [t.count("\x00") for t in templates]
        last_numeric: dict[tuple[int, int], int] = {}
        out: list[str] = []
        for tid in tids:
            variables: list[str] = []
            for slot in range(slots[tid]):
                kind = raw[pos]
                pos += 1
                if kind == 1:
                    z, pos = decode_varint(raw, pos)
                    prev = last_numeric.get((tid, slot), 0)
                    value = prev + _unzigzag(z)
                    last_numeric[(tid, slot)] = value
                    variables.append(str(value))
                else:
                    ln, pos = decode_varint(raw, pos)
                    variables.append(raw[pos : pos + ln].decode("utf-8"))
                    pos += ln
            line = templates[tid]
            for var in variables:
                line = line.replace("\x00", var, 1)
            out.append(line)
        return out
