"""The PBC codec: per-record pattern-based compression (paper §3).

Compressed record layout::

    varint(pattern_id) + field_payload

- ``pattern_id == 0`` marks an outlier; the payload is the raw UTF-8
  record (framed externally by the caller or the block format).
- otherwise the payload is the concatenation of each field value encoded
  with the pattern's field encoder (Table 1), optionally passed through
  a per-record *residual codec* (FSST for the paper's ``PBC_F``).

Block layout (file mode, used by ``PBC_Z``/``PBC_L`` before the
block-wise backend)::

    varint(n_records) + n * (varint(record_len) + record_bytes)

Per-record compression means random access needs only the one record's
bytes plus the shared pattern dictionary — no block decompression.
"""
from __future__ import annotations

from dataclasses import dataclass

from .extract import PatternDictionary, extract_patterns
from .varint import decode_varint, encode_varint


class ResidualCodec:
    """Per-record transform applied to the field payload (e.g. FSST)."""

    name = "identity"

    def encode(self, data: bytes) -> bytes:
        return data

    def decode(self, data: bytes) -> bytes:
        return data


@dataclass
class PBCCodec:
    """Pattern-based per-record compressor/decompressor."""

    dictionary: PatternDictionary
    residual_codec: ResidualCodec | None = None

    def compress_record(self, record: str) -> bytes:
        hit = self.dictionary.match_encodable(record)
        if hit is None:
            return b"\x00" + record.encode("utf-8")
        pattern, fields = hit
        payload = b"".join(
            enc.encode(v) for enc, v in zip(pattern.encoders, fields)
        )
        if self.residual_codec is not None:
            payload = self.residual_codec.encode(payload)
        return encode_varint(pattern.pattern_id) + payload

    def decompress_record(self, data: bytes) -> str:
        pattern_id, pos = decode_varint(data, 0)
        if pattern_id == 0:
            return data[pos:].decode("utf-8")
        pattern = self.dictionary.get(pattern_id)
        payload = data[pos:]
        if self.residual_codec is not None:
            payload = self.residual_codec.decode(payload)
        mv = memoryview(payload)
        fields: list[str] = []
        fpos = 0
        for enc in pattern.encoders:
            v, fpos = enc.decode(mv, fpos)
            fields.append(v)
        return pattern.reconstruct(fields)

    # ---- block (file) mode ----

    def compress_block(self, records: list[str]) -> bytes:
        out = bytearray(encode_varint(len(records)))
        for r in records:
            c = self.compress_record(r)
            out += encode_varint(len(c))
            out += c
        return bytes(out)

    def decompress_block(self, data: bytes) -> list[str]:
        n, pos = decode_varint(data, 0)
        records: list[str] = []
        for _ in range(n):
            ln, pos = decode_varint(data, pos)
            records.append(self.decompress_record(data[pos : pos + ln]))
            pos += ln
        return records

    def outlier_rate(self, records: list[str]) -> float:
        """Fraction of records not covered by any pattern (re-train signal)."""
        if not records:
            return 0.0
        misses = sum(
            1 for r in records if self.dictionary.match_encodable(r) is None
        )
        return misses / len(records)


def train_pbc(
    sample: list[str],
    *,
    k: int = 32,
    band: int | None = 64,
    **kwargs,
) -> PatternDictionary:
    """Offline training phase — thin alias over :func:`extract_patterns`."""
    return extract_patterns(sample, k=k, band=band, **kwargs)
