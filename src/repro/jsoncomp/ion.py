"""Simplified Amazon Ion binary serialization (``Ion-B`` in Table 6).

Ion's binary format is a self-describing type-tagged encoding with
symbol tables for field names. This reproduction keeps the properties
that matter for the paper's comparison:

- type-tagged values: null, bool, int (varint), float (8-byte IEEE or
  short decimal text), string (length-prefixed UTF-8), list, struct;
- field names interned in a symbol table. In *record* mode the symbol
  table ships inline with every record (each record must be
  self-contained — this is why Ion-B's record-level ratio is modest);
  in *file* mode one table is shared across the stream.

Values round-trip exactly (ints stay ints, floats stay floats).
"""
from __future__ import annotations

import json
import struct as _struct

from ..core.varint import decode_varint, encode_varint

_T_NULL, _T_FALSE, _T_TRUE, _T_INT, _T_NEGINT = 0, 1, 2, 3, 4
_T_FLOAT, _T_DECIMAL, _T_STRING, _T_LIST, _T_STRUCT = 5, 6, 7, 8, 9


class _SymbolTable:
    def __init__(self) -> None:
        self.symbols: list[str] = []
        self.index: dict[str, int] = {}

    def intern(self, name: str) -> int:
        sid = self.index.get(name)
        if sid is None:
            sid = len(self.symbols)
            self.symbols.append(name)
            self.index[name] = sid
        return sid

    def serialize(self) -> bytes:
        # length-prefixed symbols: field names may be empty or contain
        # any character, so a separator-joined blob is not safe
        out = bytearray(encode_varint(len(self.symbols)))
        for s in self.symbols:
            b = s.encode("utf-8")
            out += encode_varint(len(b))
            out += b
        return bytes(out)

    @classmethod
    def parse(cls, data: bytes, pos: int) -> tuple["_SymbolTable", int]:
        count, pos = decode_varint(data, pos)
        table = cls()
        for _ in range(count):
            n, pos = decode_varint(data, pos)
            table.intern(data[pos : pos + n].decode("utf-8"))
            pos += n
        return table, pos


def _encode_value(value, out: bytearray, symbols: _SymbolTable) -> None:
    if value is None:
        out.append(_T_NULL)
    elif value is True:
        out.append(_T_TRUE)
    elif value is False:
        out.append(_T_FALSE)
    elif isinstance(value, int):
        out.append(_T_INT if value >= 0 else _T_NEGINT)
        out += encode_varint(abs(value))
    elif isinstance(value, float):
        text = json.dumps(value)
        if len(text) < 8:  # short decimals beat an 8-byte double
            out.append(_T_DECIMAL)
            out += encode_varint(len(text))
            out += text.encode("ascii")
        else:
            out.append(_T_FLOAT)
            out += _struct.pack(">d", value)
    elif isinstance(value, str):
        b = value.encode("utf-8")
        out.append(_T_STRING)
        out += encode_varint(len(b))
        out += b
    elif isinstance(value, list):
        out.append(_T_LIST)
        out += encode_varint(len(value))
        for v in value:
            _encode_value(v, out, symbols)
    elif isinstance(value, dict):
        out.append(_T_STRUCT)
        out += encode_varint(len(value))
        for k, v in value.items():
            out += encode_varint(symbols.intern(k))
            _encode_value(v, out, symbols)
    else:
        raise TypeError(f"not a JSON value: {type(value)}")


def _decode_value(data: bytes, pos: int, symbols: _SymbolTable) -> tuple[object, int]:
    tag = data[pos]
    pos += 1
    if tag == _T_NULL:
        return None, pos
    if tag == _T_TRUE:
        return True, pos
    if tag == _T_FALSE:
        return False, pos
    if tag in (_T_INT, _T_NEGINT):
        v, pos = decode_varint(data, pos)
        return (v if tag == _T_INT else -v), pos
    if tag == _T_FLOAT:
        return _struct.unpack(">d", data[pos : pos + 8])[0], pos + 8
    if tag == _T_DECIMAL:
        n, pos = decode_varint(data, pos)
        return float(data[pos : pos + n]), pos + n
    if tag == _T_STRING:
        n, pos = decode_varint(data, pos)
        return data[pos : pos + n].decode("utf-8"), pos + n
    if tag == _T_LIST:
        n, pos = decode_varint(data, pos)
        items = []
        for _ in range(n):
            v, pos = _decode_value(data, pos, symbols)
            items.append(v)
        return items, pos
    if tag == _T_STRUCT:
        n, pos = decode_varint(data, pos)
        obj = {}
        for _ in range(n):
            sid, pos = decode_varint(data, pos)
            v, pos = _decode_value(data, pos, symbols)
            obj[symbols.symbols[sid]] = v
        return obj, pos
    raise ValueError(f"bad Ion tag {tag}")


class IonB:
    """Amazon Ion binary — record mode is fully self-contained."""

    name = "Ion-B"
    random_access = True

    def encode_record(self, obj) -> bytes:
        symbols = _SymbolTable()
        body = bytearray()
        _encode_value(obj, body, symbols)
        return symbols.serialize() + bytes(body)

    def decode_record(self, data: bytes):
        symbols, pos = _SymbolTable.parse(data, 0)
        value, _ = _decode_value(data, pos, symbols)
        return value

    def encode_file(self, objs: list) -> bytes:
        symbols = _SymbolTable()
        body = bytearray()
        for obj in objs:
            rec = bytearray()
            _encode_value(obj, rec, symbols)
            body += encode_varint(len(rec))
            body += rec
        return symbols.serialize() + encode_varint(len(objs)) + bytes(body)

    def decode_file(self, data: bytes) -> list:
        symbols, pos = _SymbolTable.parse(data, 0)
        n, pos = decode_varint(data, pos)
        out = []
        for _ in range(n):
            ln, pos = decode_varint(data, pos)
            value, _ = _decode_value(data, pos, symbols)
            pos += ln
            out.append(value)
        return out
