"""Unit tests for the Table-1 field encoders and encoder selection."""
import pytest
from hypothesis import given, strategies as st

from repro.core.encoders import (
    VARCHAR,
    VARINT,
    CharEncoder,
    IntEncoder,
    choose_encoder,
    encoder_from_spec,
)


def _roundtrip(enc, value: str) -> str:
    data = enc.encode(value)
    got, pos = enc.decode(memoryview(data), 0)
    assert pos == len(data)
    return got


class TestCharEncoder:
    def test_roundtrip(self):
        assert _roundtrip(CharEncoder(n=3), "abc") == "abc"

    def test_unicode(self):
        value = "日本"  # 6 UTF-8 bytes
        assert _roundtrip(CharEncoder(n=6), value) == value

    def test_size(self):
        assert CharEncoder(n=5).encoded_size("abcde") == 5

    def test_wrong_length_rejected(self):
        with pytest.raises(ValueError):
            CharEncoder(n=3).encode("abcd")

    def test_can_encode(self):
        enc = CharEncoder(n=3)
        assert enc.can_encode("xyz")
        assert not enc.can_encode("xy")
        assert enc.can_encode("日")  # 3 UTF-8 bytes: byte length is what counts

    def test_spec_roundtrip(self):
        assert encoder_from_spec(CharEncoder(n=7).spec()) == CharEncoder(n=7)


class TestVarcharEncoder:
    @pytest.mark.parametrize("value", ["", "a", "hello world", "x" * 200, "日本語"])
    def test_roundtrip(self, value):
        assert _roundtrip(VARCHAR, value) == value

    def test_size_includes_header(self):
        assert VARCHAR.encoded_size("abc") == 4
        assert VARCHAR.encoded_size("") == 1
        assert VARCHAR.encoded_size("x" * 200) == 202  # 2-byte header

    def test_stream_of_values(self):
        data = VARCHAR.encode("ab") + VARCHAR.encode("") + VARCHAR.encode("cde")
        mv = memoryview(data)
        v1, p = VARCHAR.decode(mv, 0)
        v2, p = VARCHAR.decode(mv, p)
        v3, p = VARCHAR.decode(mv, p)
        assert (v1, v2, v3) == ("ab", "", "cde")
        assert p == len(data)


class TestIntEncoder:
    def test_roundtrip(self):
        assert _roundtrip(IntEncoder(n=6, m=3), "163957") == "163957"

    def test_leading_zeros_preserved(self):
        assert _roundtrip(IntEncoder(n=4, m=2), "0042") == "0042"

    def test_rejects_bad_input(self):
        with pytest.raises(ValueError):
            IntEncoder(n=3, m=2).encode("12a")
        with pytest.raises(ValueError):
            IntEncoder(n=3, m=2).encode("1234")

    def test_can_encode(self):
        enc = IntEncoder(n=3, m=2)
        assert enc.can_encode("123")
        assert enc.can_encode("007")
        assert not enc.can_encode("12")
        assert not enc.can_encode("12a")

    def test_spec_roundtrip(self):
        assert encoder_from_spec(IntEncoder(n=9, m=4).spec()) == IntEncoder(n=9, m=4)


class TestVarintEncoder:
    @pytest.mark.parametrize("value", ["0", "7", "42", "163957409", "99999999999"])
    def test_roundtrip(self, value):
        assert _roundtrip(VARINT, value) == value

    def test_rejects_leading_zero(self):
        with pytest.raises(ValueError):
            VARINT.encode("042")

    def test_can_encode(self):
        assert VARINT.can_encode("0")
        assert VARINT.can_encode("10")
        assert not VARINT.can_encode("01")
        assert not VARINT.can_encode("1a")


class TestChooseEncoder:
    def test_fixed_digits_become_int(self):
        enc = choose_encoder(["12", "99", "03"])
        assert enc == IntEncoder(n=2, m=1)

    def test_large_fixed_digits_get_enough_bytes(self):
        enc = choose_encoder(["1639574096", "1639574100"])
        assert isinstance(enc, IntEncoder)
        assert enc.m == 5  # 10 digits need 5 bytes

    def test_fixed_text_becomes_char(self):
        assert choose_encoder(["abc", "xyz", "foo"]) == CharEncoder(n=3)

    def test_variable_digits_become_varint(self):
        assert choose_encoder(["5", "123", "40"]) == VARINT

    def test_leading_zero_variable_digits_fall_back(self):
        enc = choose_encoder(["05", "123"])
        assert enc == VARCHAR

    def test_variable_text_becomes_varchar(self):
        assert choose_encoder(["a", "bb", "ccc"]) == VARCHAR

    def test_empty_values(self):
        assert choose_encoder([]) == VARCHAR
        assert choose_encoder(["", "x"]) == VARCHAR

    def test_chosen_encoder_roundtrips_all_values(self):
        for values in (["12", "34"], ["abc", "def"], ["5", "1000"], ["", "ab"]):
            enc = choose_encoder(values)
            for v in values:
                assert enc.can_encode(v)
                assert _roundtrip(enc, v) == v

    @given(
        st.lists(
            st.text(
                alphabet=st.characters(min_codepoint=32, max_codepoint=126),
                max_size=12,
            ),
            min_size=1,
            max_size=8,
        )
    )
    def test_choose_encoder_total(self, values):
        enc = choose_encoder(values)
        for v in values:
            assert enc.can_encode(v)
            assert _roundtrip(enc, v) == v


def test_encoder_from_spec_rejects_unknown():
    with pytest.raises(ValueError):
        encoder_from_spec("BOGUS")
