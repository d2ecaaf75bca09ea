"""Field encoders for residual subsequences (paper Table 1).

A *field* is the set of residual substrings matched by one wildcard of a
pattern across all records of a cluster. Every value in a field shares
one encoder, chosen offline by :func:`choose_encoder` to minimise the
total encoded size:

- ``CHAR(n)``    — all values are exactly ``n`` bytes: store raw, no header.
- ``INT(n, m)``  — all values are ``n``-digit strings: store as an
  ``m``-byte big-endian integer (leading zeros are recoverable from ``n``).
- ``VARINT``     — digit strings without leading zeros: LEB128 integer.
- ``VARCHAR``    — anything: 1–2-byte varint length header + raw bytes.

Encoders operate on ``str`` values (records are strings per paper §3.1)
and serialise to ``bytes``.
"""
from __future__ import annotations

from dataclasses import dataclass

from .varint import decode_varint, encode_varint, varint_size


class FieldEncoder:
    """Interface for a field encoder: value <-> bytes within a stream."""

    #: short tag persisted in the pattern dictionary
    tag: str

    def encode(self, value: str) -> bytes:
        raise NotImplementedError

    def decode(self, buf: memoryview, pos: int) -> tuple[str, int]:
        """Decode one value at ``pos``; return (value, next_pos)."""
        raise NotImplementedError

    def can_encode(self, value: str) -> bool:
        """Whether this encoder round-trips ``value``.

        Encoders are chosen from *sampled* field values; an unseen value
        can violate them (e.g. a 7-char string in a ``CHAR(3)`` field).
        The codec checks this and falls back to the next matching
        pattern or the outlier path.
        """
        return True

    def encoded_size(self, value: str) -> int:
        return len(self.encode(value))

    def spec(self) -> str:
        """Serialisable spec string, parsed back by :func:`encoder_from_spec`."""
        return self.tag


@dataclass(frozen=True)
class CharEncoder(FieldEncoder):
    """Fixed-length raw characters (``CHAR(n)``)."""

    n: int
    tag: str = "CHAR"

    def encode(self, value: str) -> bytes:
        b = value.encode("utf-8")
        if len(b) != self.n:
            raise ValueError(f"CHAR({self.n}) got {len(b)}-byte value {value!r}")
        return b

    def decode(self, buf: memoryview, pos: int) -> tuple[str, int]:
        end = pos + self.n
        return bytes(buf[pos:end]).decode("utf-8"), end

    def encoded_size(self, value: str) -> int:
        return self.n

    def can_encode(self, value: str) -> bool:
        return len(value.encode("utf-8")) == self.n

    def spec(self) -> str:
        return f"CHAR({self.n})"


@dataclass(frozen=True)
class VarcharEncoder(FieldEncoder):
    """Variable-length characters with a varint length header."""

    tag: str = "VARCHAR"

    def encode(self, value: str) -> bytes:
        b = value.encode("utf-8")
        return encode_varint(len(b)) + b

    def decode(self, buf: memoryview, pos: int) -> tuple[str, int]:
        n, pos = decode_varint(buf, pos)
        end = pos + n
        return bytes(buf[pos:end]).decode("utf-8"), end

    def encoded_size(self, value: str) -> int:
        n = len(value.encode("utf-8"))
        return varint_size(n) + n


@dataclass(frozen=True)
class IntEncoder(FieldEncoder):
    """``INT(n, m)``: ``n``-digit decimal strings as ``m``-byte integers."""

    n: int
    m: int
    tag: str = "INT"

    def encode(self, value: str) -> bytes:
        if len(value) != self.n or not value.isdigit():
            raise ValueError(f"INT({self.n},{self.m}) got {value!r}")
        return int(value).to_bytes(self.m, "big")

    def decode(self, buf: memoryview, pos: int) -> tuple[str, int]:
        end = pos + self.m
        v = int.from_bytes(bytes(buf[pos:end]), "big")
        return str(v).zfill(self.n), end

    def encoded_size(self, value: str) -> int:
        return self.m

    def can_encode(self, value: str) -> bool:
        return len(value) == self.n and value.isdigit()

    def spec(self) -> str:
        return f"INT({self.n},{self.m})"


@dataclass(frozen=True)
class VarintEncoder(FieldEncoder):
    """Digit strings without leading zeros as LEB128 integers."""

    tag: str = "VARINT"

    def encode(self, value: str) -> bytes:
        if not value.isdigit() or (len(value) > 1 and value[0] == "0"):
            raise ValueError(f"VARINT got non-canonical digits {value!r}")
        return encode_varint(int(value))

    def decode(self, buf: memoryview, pos: int) -> tuple[str, int]:
        v, pos = decode_varint(buf, pos)
        return str(v), pos

    def encoded_size(self, value: str) -> int:
        return varint_size(int(value))

    def can_encode(self, value: str) -> bool:
        return value.isdigit() and (len(value) == 1 or value[0] != "0")


VARCHAR = VarcharEncoder()
VARINT = VarintEncoder()


def _int_bytes_needed(n_digits: int) -> int:
    """Smallest ``m`` such that any ``n_digits``-digit value fits ``m`` bytes."""
    max_value = 10**n_digits - 1
    return max(1, (max_value.bit_length() + 7) // 8)


def choose_encoder(values: list[str]) -> FieldEncoder:
    """Pick the smallest applicable encoder for a field's value set.

    Applicability follows Table 1; among applicable encoders the one with
    the minimal total encoded size over ``values`` wins (ties prefer the
    simpler fixed-width encoder, which also decodes fastest).
    """
    if not values:
        return VARCHAR
    candidates: list[FieldEncoder] = []
    lengths = {len(v.encode("utf-8")) for v in values}
    all_digits = all(v.isdigit() for v in values)
    if len(lengths) == 1:
        (n,) = lengths
        if all_digits and n > 0:
            candidates.append(IntEncoder(n=n, m=_int_bytes_needed(n)))
        if n > 0:
            candidates.append(CharEncoder(n=n))
    if all_digits and all(len(v) == 1 or v[0] != "0" for v in values):
        candidates.append(VARINT)
    candidates.append(VARCHAR)
    return min(candidates, key=lambda e: sum(e.encoded_size(v) for v in values))


def encoder_from_spec(spec: str) -> FieldEncoder:
    """Inverse of :meth:`FieldEncoder.spec` (pattern-dictionary loading)."""
    if spec == "VARCHAR":
        return VARCHAR
    if spec == "VARINT":
        return VARINT
    if spec.startswith("CHAR("):
        return CharEncoder(n=int(spec[5:-1]))
    if spec.startswith("INT("):
        n, m = spec[4:-1].split(",")
        return IntEncoder(n=int(n), m=int(m))
    raise ValueError(f"unknown encoder spec {spec!r}")
