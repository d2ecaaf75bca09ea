"""Tests for Pattern objects: regex matching, reconstruction, serialisation."""
import pytest

from repro.core.dp import WILDCARD
from repro.core.encoders import VARCHAR, VARINT, CharEncoder
from repro.core.pattern import Pattern, seq_to_segments


def test_seq_to_segments():
    seq = ("a", "b", WILDCARD, "c", WILDCARD)
    assert seq_to_segments(seq) == ["ab", None, "c", None]


def test_seq_to_segments_wildcard_first():
    assert seq_to_segments((WILDCARD, "x")) == [None, "x"]


def test_seq_to_segments_empty():
    assert seq_to_segments(()) == []


class TestMatching:
    def test_simple_match(self):
        p = Pattern(pattern_id=1, segments=["GET /", None, " 200"])
        assert p.match("GET /index.html 200") == ["index.html"]

    def test_no_match(self):
        p = Pattern(pattern_id=1, segments=["GET /", None, " 200"])
        assert p.match("POST /x 200") is None

    def test_multi_field(self):
        p = Pattern(pattern_id=1, segments=["a=", None, "&b=", None])
        assert p.match("a=1&b=2") == ["1", "2"]

    def test_empty_field_values(self):
        p = Pattern(pattern_id=1, segments=["x", None, "y", None])
        assert p.match("xy") == ["", ""]

    def test_regex_metachars_escaped(self):
        p = Pattern(pattern_id=1, segments=["a.b(c)[d]", None])
        assert p.match("a.b(c)[d]TAIL") == ["TAIL"]
        assert p.match("aXb(c)[d]TAIL") is None

    def test_anchored_both_ends(self):
        p = Pattern(pattern_id=1, segments=["ab"])
        assert p.match("ab") == []
        assert p.match("abx") is None
        assert p.match("xab") is None

    def test_leading_wildcard(self):
        p = Pattern(pattern_id=1, segments=[None, "-suffix"])
        assert p.match("anything-suffix") == ["anything"]

    def test_match_reconstruct_inverse(self):
        p = Pattern(pattern_id=1, segments=["{\"q\": ", None, ", \"t\": ", None, "}"])
        rec = '{"q": 100, "t": 163}'
        fields = p.match(rec)
        assert p.reconstruct(fields) == rec


class TestProperties:
    def test_n_fields_and_literal_length(self):
        p = Pattern(pattern_id=1, segments=["abc", None, "de", None])
        assert p.n_fields == 2
        assert p.literal_length == 5

    def test_default_encoders_are_varchar(self):
        p = Pattern(pattern_id=1, segments=["x", None, "y", None])
        assert all(e == VARCHAR for e in p.encoders)

    def test_encoder_count_mismatch_rejected(self):
        with pytest.raises(ValueError):
            Pattern(pattern_id=1, segments=["x", None], encoders=[VARCHAR, VARINT])


class TestSerialization:
    def test_roundtrip(self):
        p = Pattern(
            pattern_id=7,
            segments=["head-", None, ":", None],
            encoders=[CharEncoder(n=4), VARINT],
        )
        q = Pattern.from_dict(p.to_dict())
        assert q.pattern_id == 7
        assert q.segments == p.segments
        assert q.encoders == p.encoders

    def test_roundtrip_preserves_matching(self):
        p = Pattern(pattern_id=2, segments=[None, "=", None])
        q = Pattern.from_dict(p.to_dict())
        assert q.match("key=value") == ["key", "value"]
