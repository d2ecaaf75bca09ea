"""Tests for the Ion-B and JSON BinPack (BP-D) reproductions."""
import json

import pytest
from hypothesis import given, strategies as st

from repro.datasets import JSON_DATASETS, records
from repro.jsoncomp import BinPackD, IonB
from repro.jsoncomp.schema import infer_schema

VALUES = [
    None,
    True,
    False,
    0,
    -17,
    2**40,
    1.5,
    -0.25,
    "",
    "hello",
    "日本語",
    [],
    [1, 2, 3],
    [{"a": 1}, {"a": 2}],
    {"k": "v"},
    {"nested": {"deep": [None, {"x": 1.25}]}},
]

json_values = st.recursive(
    st.none()
    | st.booleans()
    | st.integers(min_value=-(2**53), max_value=2**53)
    | st.floats(allow_nan=False, allow_infinity=False, width=64)
    | st.text(max_size=20),
    lambda children: st.lists(children, max_size=4)
    | st.dictionaries(st.text(max_size=8), children, max_size=4),
    max_leaves=12,
)


class TestIonB:
    @pytest.mark.parametrize("value", VALUES, ids=range(len(VALUES)))
    def test_record_roundtrip(self, value):
        ion = IonB()
        assert ion.decode_record(ion.encode_record(value)) == value

    def test_file_roundtrip(self):
        ion = IonB()
        objs = [{"id": i, "name": f"u{i}"} for i in range(50)]
        assert ion.decode_file(ion.encode_file(objs)) == objs

    def test_file_mode_shares_symbols(self):
        ion = IonB()
        objs = [{"a_long_field_name": i} for i in range(50)]
        per_record = sum(len(ion.encode_record(o)) for o in objs)
        as_file = len(ion.encode_file(objs))
        assert as_file < per_record  # symbol table amortised

    def test_int_float_distinguished(self):
        ion = IonB()
        assert ion.decode_record(ion.encode_record(1)) == 1
        got = ion.decode_record(ion.encode_record(1.0))
        assert isinstance(got, float)

    @given(json_values)
    def test_roundtrip_property(self, value):
        ion = IonB()
        assert ion.decode_record(ion.encode_record(value)) == value

    @pytest.mark.parametrize("name", JSON_DATASETS)
    def test_real_datasets(self, name):
        ion = IonB()
        objs = [json.loads(r) for r in records(name, 10, seed=3)]
        assert ion.decode_file(ion.encode_file(objs)) == objs


class TestSchemaInference:
    def test_object_schema(self):
        s = infer_schema([{"a": 1, "b": "x"}, {"a": 2, "b": "y"}])
        assert s["type"] == "object"
        assert s["keys"] == ["a", "b"]
        assert s["properties"]["a"]["type"] == "int"

    def test_enum_detected(self):
        s = infer_schema([{"side": "B"}, {"side": "S"}])
        assert s["properties"]["side"]["type"] == "enum"
        assert set(s["properties"]["side"]["values"]) == {"B", "S"}

    def test_enum_overflow_to_string(self):
        objs = [{"v": f"unique-{i}"} for i in range(100)]
        assert infer_schema(objs)["properties"]["v"]["type"] == "string"

    def test_optional_keys(self):
        s = infer_schema([{"a": 1, "b": 2}, {"a": 3}])
        assert s["required"] == ["a"]
        assert "b" in s["keys"]

    def test_int_and_float_merge_to_number(self):
        s = infer_schema([{"x": 1}, {"x": 2.5}])
        assert s["properties"]["x"]["type"] == "number"

    def test_conflicting_types_fall_to_any(self):
        s = infer_schema([{"x": 1}, {"x": "s"}])
        assert s["properties"]["x"]["type"] == "any"

    def test_array_items(self):
        s = infer_schema([{"xs": [1, 2]}, {"xs": [3]}])
        assert s["properties"]["xs"]["type"] == "array"
        assert s["properties"]["xs"]["items"]["type"] == "int"

    def test_empty_sample(self):
        assert infer_schema([])["type"] == "any"


class TestBinPackD:
    def _trained(self, objs):
        bp = BinPackD()
        bp.train(objs)
        return bp

    def test_record_roundtrip(self):
        objs = [{"a": i, "b": f"s{i}", "c": i * 0.5} for i in range(30)]
        bp = self._trained(objs[:10])
        for o in objs:
            assert bp.decode_record(bp.encode_record(o)) == o

    def test_file_roundtrip(self):
        objs = [{"a": i} for i in range(40)]
        bp = self._trained(objs)
        assert bp.decode_file(bp.encode_file(objs)) == objs

    def test_schema_driven_is_compact(self):
        objs = [{"field_with_long_name": i, "another_long_one": "CONST"} for i in range(20)]
        bp = self._trained(objs)
        ion = IonB()
        assert len(bp.encode_record(objs[0])) < len(ion.encode_record(objs[0]))

    def test_nonconforming_record_escapes(self):
        bp = self._trained([{"a": 1}, {"a": 2}])
        weird = {"completely": ["different", {"shape": True}]}
        data = bp.encode_record(weird)
        assert data[0] == 0xFF  # escape marker
        assert bp.decode_record(data) == weird

    def test_optional_key_bitmap(self):
        bp = self._trained([{"a": 1, "b": 2}, {"a": 3}])
        for o in ({"a": 1, "b": 2}, {"a": 9}):
            assert bp.decode_record(bp.encode_record(o)) == o

    def test_untrained_rejected(self):
        with pytest.raises(RuntimeError):
            BinPackD().encode_record({"a": 1})

    @pytest.mark.parametrize("name", JSON_DATASETS)
    def test_real_datasets(self, name):
        objs = [json.loads(r) for r in records(name, 12, seed=3)]
        bp = self._trained(objs[:6])
        for o in objs:
            assert bp.decode_record(bp.encode_record(o)) == o

    @pytest.mark.parametrize("name", JSON_DATASETS)
    def test_beats_ion_record_mode(self, name):
        objs = [json.loads(r) for r in records(name, 12, seed=3)]
        bp = self._trained(objs[:6])
        ion = IonB()
        bp_bytes = sum(len(bp.encode_record(o)) for o in objs)
        ion_bytes = sum(len(ion.encode_record(o)) for o in objs)
        assert bp_bytes < ion_bytes

    @given(st.lists(json_values, min_size=1, max_size=6))
    def test_total_encoding_property(self, objs):
        bp = self._trained(objs[:3])
        for o in objs:
            assert bp.decode_record(bp.encode_record(o)) == o
