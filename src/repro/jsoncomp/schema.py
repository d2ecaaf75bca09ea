"""JSON schema inference for the schema-driven BinPack reproduction.

JSON BinPack's best mode (``BP-D`` in the paper) consumes an
*application-provided* JSON schema. Offline, we infer an equivalent
schema from a training sample — the stand-in for the ground-truth
schema the application would provide (the paper notes BP-D's advantage
comes precisely from this external knowledge).

Schema node forms (plain dicts, picklable/broadcastable):

- ``{"type": "object", "keys": [...], "required": [...], "properties": {k: node}}``
- ``{"type": "int"} | {"type": "number"} | {"type": "bool"} | {"type": "null"}``
- ``{"type": "string"}`` or ``{"type": "enum", "values": [...]}``
- ``{"type": "array", "items": node}``
- ``{"type": "any"}`` — fallback, value self-described
"""
from __future__ import annotations

_MAX_ENUM = 32


def _merge_types(a: dict, b: dict) -> dict:
    if a == b:
        return a
    if a["type"] == "any" or b["type"] == "any":
        return {"type": "any"}
    if {a["type"], b["type"]} == {"int", "number"}:
        return {"type": "number"}
    if {a["type"], b["type"]} <= {"string", "enum"}:
        if a["type"] == "string" or b["type"] == "string":
            return {"type": "string"}
        merged = set(a["values"]) | set(b["values"])
        n = a.get("n", 1) + b.get("n", 1)
        if len(merged) <= _MAX_ENUM:
            return {"type": "enum", "values": sorted(merged), "n": n}
        return {"type": "string"}
    if a["type"] == b["type"] == "object":
        keys = list(dict.fromkeys(a["keys"] + b["keys"]))
        required = [k for k in a["required"] if k in b["required"]]
        props = {}
        for k in keys:
            pa, pb = a["properties"].get(k), b["properties"].get(k)
            props[k] = _merge_types(pa, pb) if pa and pb else (pa or pb)
        return {"type": "object", "keys": keys, "required": required, "properties": props}
    if a["type"] == b["type"] == "array":
        return {"type": "array", "items": _merge_types(a["items"], b["items"])}
    return {"type": "any"}


def _schema_of(value) -> dict:
    if value is None:
        return {"type": "null"}
    if isinstance(value, bool):
        return {"type": "bool"}
    if isinstance(value, int):
        return {"type": "int"}
    if isinstance(value, float):
        return {"type": "number"}
    if isinstance(value, str):
        return {"type": "enum", "values": [value], "n": 1}
    if isinstance(value, list):
        items: dict = {"type": "any"}
        for v in value:
            s = _schema_of(v)
            items = s if items["type"] == "any" else _merge_types(items, s)
        return {"type": "array", "items": items}
    if isinstance(value, dict):
        keys = list(value.keys())
        return {
            "type": "object",
            "keys": keys,
            "required": keys,
            "properties": {k: _schema_of(v) for k, v in value.items()},
        }
    raise TypeError(f"not a JSON value: {type(value)}")


def _finalize(schema: dict) -> dict:
    """Demote unsupported enums and strip bookkeeping counts.

    A closed enum is only believable with repetition evidence: if the
    sample saw nearly as many distinct values as observations, the field
    is open-ended (ids, urls, names) and unseen values would force the
    encoder's per-record escape path. Such fields become ``string``.
    """
    t = schema["type"]
    if t == "enum":
        n = schema.pop("n", 1)
        if len(schema["values"]) > max(2, n // 3):
            return {"type": "string"}
        return {"type": "enum", "values": schema["values"]}
    if t == "object":
        return {
            **schema,
            "properties": {
                k: _finalize(v) for k, v in schema["properties"].items()
            },
        }
    if t == "array":
        return {**schema, "items": _finalize(schema["items"])}
    return schema


def infer_schema(objs: list) -> dict:
    """Infer the common schema of a sample of JSON objects."""
    if not objs:
        return {"type": "any"}
    schema = _schema_of(objs[0])
    for obj in objs[1:]:
        schema = _merge_types(schema, _schema_of(obj))
    return _finalize(schema)
