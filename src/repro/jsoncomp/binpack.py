"""Schema-driven JSON BinPack reproduction (``BP-D`` in Tables 6/7).

With a schema in hand, no keys or type tags need to be stored for
conforming values: objects serialize as a presence bitmap over optional
keys plus values in schema key order; enums serialize as indexes; ints
as zigzag varints; other numbers as short decimal text. Values that
deviate from the schema fall back to a self-described Ion encoding
behind a 1-byte escape, so encoding is total and lossless.
"""
from __future__ import annotations

import json

from ..core.varint import decode_varint, encode_varint
from .ion import IonB
from .schema import infer_schema

_ion = IonB()
_ESCAPE = 0xFF


def _zigzag(n: int) -> int:
    return (n << 1) if n >= 0 else ((-n) << 1) - 1


def _unzigzag(z: int) -> int:
    return (z >> 1) if (z & 1) == 0 else -((z + 1) >> 1)


def _conforms(value, schema: dict) -> bool:
    t = schema["type"]
    if t == "any":
        return True
    if t == "null":
        return value is None
    if t == "bool":
        return isinstance(value, bool)
    if t == "int":
        return isinstance(value, int) and not isinstance(value, bool)
    if t == "number":
        return isinstance(value, (int, float)) and not isinstance(value, bool)
    if t == "string":
        return isinstance(value, str)
    if t == "enum":
        return isinstance(value, str) and value in schema["values"]
    if t == "array":
        return isinstance(value, list) and all(
            _conforms(v, schema["items"]) for v in value
        )
    if t == "object":
        return isinstance(value, dict) and all(
            k in schema["properties"] and _conforms(v, schema["properties"][k])
            for k, v in value.items()
        ) and all(k in value for k in schema["required"])
    return False


def _encode(value, schema: dict, out: bytearray) -> None:
    t = schema["type"]
    if t == "null":
        return  # nothing to store
    if t == "bool":
        out.append(1 if value else 0)
        return
    if t == "int":
        out += encode_varint(_zigzag(value))
        return
    if t == "number":
        text = json.dumps(value)
        out += encode_varint(len(text))
        out += text.encode("ascii")
        return
    if t == "enum":
        out += encode_varint(schema["values"].index(value))
        return
    if t == "string":
        b = value.encode("utf-8")
        out += encode_varint(len(b))
        out += b
        return
    if t == "array":
        out += encode_varint(len(value))
        for v in value:
            _encode(v, schema["items"], out)
        return
    if t == "object":
        optional = [k for k in schema["keys"] if k not in schema["required"]]
        bits = 0
        for i, k in enumerate(optional):
            if k in value:
                bits |= 1 << i
        out += encode_varint(bits)
        for k in schema["keys"]:
            if k in value:
                _encode(value[k], schema["properties"][k], out)
        return
    if t == "any":
        blob = _ion.encode_record(value)
        out += encode_varint(len(blob))
        out += blob
        return
    raise ValueError(f"bad schema node {t}")


def _encode_total(value, schema: dict, out: bytearray) -> None:
    """Top-level (per record) schema encoding with a non-conformance escape.

    Conformance is checked recursively once per record, so nested values
    carry no per-value markers; a record that deviates from the schema
    is stored whole as self-described Ion behind a 1-byte escape.
    """
    if schema["type"] != "any" and _conforms(value, schema):
        out.append(0)
        _encode(value, schema, out)
    else:
        out.append(_ESCAPE)
        blob = _ion.encode_record(value)
        out += encode_varint(len(blob))
        out += blob


def _decode(schema: dict, data: bytes, pos: int):
    t = schema["type"]
    if t == "null":
        return None, pos
    if t == "bool":
        return bool(data[pos]), pos + 1
    if t == "int":
        z, pos = decode_varint(data, pos)
        return _unzigzag(z), pos
    if t == "number":
        n, pos = decode_varint(data, pos)
        text = data[pos : pos + n].decode("ascii")
        value = json.loads(text)
        return value, pos + n
    if t == "enum":
        i, pos = decode_varint(data, pos)
        return schema["values"][i], pos
    if t == "string":
        n, pos = decode_varint(data, pos)
        return data[pos : pos + n].decode("utf-8"), pos + n
    if t == "array":
        n, pos = decode_varint(data, pos)
        items = []
        for _ in range(n):
            v, pos = _decode(schema["items"], data, pos)
            items.append(v)
        return items, pos
    if t == "object":
        optional = [k for k in schema["keys"] if k not in schema["required"]]
        bits, pos = decode_varint(data, pos)
        present = set(schema["required"])
        for i, k in enumerate(optional):
            if bits & (1 << i):
                present.add(k)
        obj = {}
        for k in schema["keys"]:
            if k in present:
                v, pos = _decode(schema["properties"][k], data, pos)
                obj[k] = v
        return obj, pos
    if t == "any":
        n, pos = decode_varint(data, pos)
        return _ion.decode_record(data[pos : pos + n]), pos + n
    raise ValueError(f"bad schema node {t}")


def _decode_total(schema: dict, data: bytes, pos: int):
    marker = data[pos]
    pos += 1
    if marker == _ESCAPE:
        n, pos = decode_varint(data, pos)
        return _ion.decode_record(data[pos : pos + n]), pos + n
    return _decode(schema, data, pos)


class BinPackD:
    """Schema-driven BinPack; ``train`` infers the application schema."""

    name = "BP-D"
    random_access = True

    def __init__(self) -> None:
        self.schema: dict | None = None

    def train(self, objs: list) -> None:
        self.schema = infer_schema(objs)

    def _require(self) -> dict:
        if self.schema is None:
            raise RuntimeError("BP-D used before train()")
        return self.schema

    def encode_record(self, obj) -> bytes:
        out = bytearray()
        _encode_total(obj, self._require(), out)
        return bytes(out)

    def decode_record(self, data: bytes):
        value, _ = _decode_total(self._require(), data, 0)
        return value

    def encode_file(self, objs: list) -> bytes:
        out = bytearray(encode_varint(len(objs)))
        schema = self._require()
        for obj in objs:
            _encode_total(obj, schema, out)
        return bytes(out)

    def decode_file(self, data: bytes) -> list:
        n, pos = decode_varint(data, 0)
        schema = self._require()
        out = []
        for _ in range(n):
            v, pos = _decode_total(schema, data, pos)
            out.append(v)
        return out
