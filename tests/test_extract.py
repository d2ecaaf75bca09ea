"""Tests for clustering and pattern extraction (the offline phase)."""
import pytest

from repro.core.cluster import Cluster, agglomerate, merge_two, pattern_coverage
from repro.core.dp import WILDCARD
from repro.core.extract import (
    PatternDictionary,
    coarse_signature,
    extract_patterns,
    shape_signature,
)
from repro.core.pattern import Pattern


class TestSignatures:
    def test_shape_signature_collapses_runs(self):
        assert shape_signature("abc123 def45") == "a0 a0"

    def test_shape_signature_keeps_punctuation(self):
        assert shape_signature("a=1&b=22") == "a=0&a=0"

    def test_same_template_same_shape(self):
        a = shape_signature('{"q": 100, "p": 50.25}')
        b = shape_signature('{"q": 999, "p": 1.75}')
        assert a == b

    def test_coarse_signature_merges_hex_variants(self):
        a = coarse_signature("cd61-3e30-d8f1")
        b = coarse_signature("91b7-584a-2265")
        assert a == b == "#-#-#"


class TestClusterOps:
    def test_singleton(self):
        c = Cluster.singleton("abc")
        assert c.size == 1
        assert c.seq == ("a", "b", "c")

    def test_merge_two_combines_members(self):
        m = merge_two(Cluster.singleton("ab1"), Cluster.singleton("ab2"))
        assert m.size == 2
        assert m.seq == ("a", "b", WILDCARD)

    def test_pattern_coverage(self):
        c = Cluster(seq=("a", WILDCARD, "b"), members=["aXb"])
        assert pattern_coverage(c) == pytest.approx(2 / 3)

    def test_agglomerate_reaches_k(self):
        clusters = [Cluster.singleton(f"rec{i}x") for i in range(6)]
        out = agglomerate(clusters, 2)
        assert len(out) == 2
        assert sum(c.size for c in out) == 6

    def test_agglomerate_prefers_similar(self):
        clusters = [
            Cluster.singleton("GET /a 200"),
            Cluster.singleton("GET /b 200"),
            Cluster.singleton("ERR disk full 17"),
        ]
        out = agglomerate(clusters, 2)
        sizes = sorted(c.size for c in out)
        assert sizes == [1, 2]
        big = next(c for c in out if c.size == 2)
        assert all(m.startswith("GET") for m in big.members)

    def test_agglomerate_k_one(self):
        clusters = [Cluster.singleton(s) for s in ("ab", "cd", "ef")]
        assert len(agglomerate(clusters, 1)) == 1


class TestExtractPatterns:
    def test_empty_sample(self):
        d = extract_patterns([])
        assert len(d) == 0

    def test_single_template(self):
        recs = [f"user={i}&score={i * 7}" for i in range(20)]
        d = extract_patterns(recs, k=4)
        assert len(d) >= 1
        hit = d.match("user=999&score=123")
        assert hit is not None
        pat, fields = hit
        assert pat.reconstruct(fields) == "user=999&score=123"

    def test_two_templates_two_patterns(self):
        recs = [f"GET /page/{i} 200" for i in range(10)]
        recs += [f"uid={i}|amt={i * 3}" for i in range(10)]
        d = extract_patterns(recs, k=8)
        assert d.match("GET /page/77 200") is not None
        assert d.match("uid=5|amt=9999") is not None

    def test_k_limits_pattern_count(self):
        recs = [f"t{j}-{i}" for j in range(6) for i in range(4)]
        d = extract_patterns(recs, k=2)
        assert len(d) <= 2

    def test_longest_pattern_preferred(self):
        # the more specific (longer-literal) pattern must win matching
        recs = [f"prefix-{i}-suffix" for i in range(10)]
        recs += [f"p{i}x" for i in range(10)]
        d = extract_patterns(recs, k=4)
        hit = d.match("prefix-42-suffix")
        assert hit is not None
        assert hit[0].literal_length >= len("prefix--suffix")


class TestPatternDictionary:
    def _dict(self):
        return PatternDictionary(
            patterns=[
                Pattern(pattern_id=1, segments=["ab", None]),
                Pattern(pattern_id=2, segments=["abcd", None]),
            ]
        )

    def test_ordered_longest_first(self):
        d = self._dict()
        assert [p.pattern_id for p in d.patterns] == [2, 1]

    def test_match_prefers_longest(self):
        d = self._dict()
        pat, fields = d.match("abcdX")
        assert pat.pattern_id == 2

    def test_fall_through_to_shorter(self):
        d = self._dict()
        pat, fields = d.match("abX")
        assert pat.pattern_id == 1

    def test_get_by_id(self):
        d = self._dict()
        assert d.get(2).segments[0] == "abcd"

    def test_reserved_zero_id_rejected(self):
        with pytest.raises(ValueError):
            PatternDictionary(patterns=[Pattern(pattern_id=0, segments=["x", None])])

    def test_serialization_roundtrip(self):
        d = self._dict()
        q = PatternDictionary.from_dict(d.to_dict())
        assert [p.pattern_id for p in q.patterns] == [2, 1]
        assert q.match("abcdZ")[0].pattern_id == 2

    def test_serialized_size_positive(self):
        assert self._dict().serialized_size() > 0

    def test_match_encodable_skips_violating_pattern(self):
        from repro.core.encoders import CharEncoder

        d = PatternDictionary(
            patterns=[
                Pattern(
                    pattern_id=1,
                    segments=["v=", None],
                    encoders=[CharEncoder(n=3)],
                ),
                Pattern(pattern_id=2, segments=["v", None]),
            ]
        )
        pat, fields = d.match_encodable("v=toolong")
        assert pat.pattern_id == 2  # CHAR(3) cannot hold 'toolong'
        assert pat.reconstruct(fields) == "v=toolong"
