"""Tests for the minimal encoding-length merging DP (Algorithms 1+2)."""
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.dp import WILDCARD, merge_patterns, record_to_pattern
from repro.core.onegram import gram_counter, one_gram_lower_bound


def seq(text: str) -> tuple:
    """'ab*c' -> ('a','b',WILDCARD,'c') for readable test cases."""
    return tuple(WILDCARD if c == "*" else c for c in text)


def show(pattern: tuple) -> str:
    return "".join("*" if t is WILDCARD else t for t in pattern)


class TestBasicMerges:
    def test_identical_records_cost_zero(self):
        eli, merged = merge_patterns(seq("abc"), seq("abc"), 1, 1)
        assert eli < 0.5  # only tie-break epsilon dust, no byte cost
        assert show(merged) == "abc"

    def test_single_differing_suffix(self):
        # paper-style: abc1 vs abc2 -> pattern abc*, each record pays a
        # 1-byte header + 1-byte payload => ELI 4 (plus epsilon dust)
        eli, merged = merge_patterns(seq("abc1"), seq("abc2"), 1, 1)
        assert show(merged) == "abc*"
        assert 4 <= eli < 4.5

    def test_middle_field(self):
        eli, merged = merge_patterns(seq("a1b"), seq("a2b"), 1, 1)
        assert show(merged) == "a*b"

    def test_disjoint_records_merge_to_wildcard(self):
        eli, merged = merge_patterns(seq("abc"), seq("xyz"), 1, 1)
        assert show(merged) == "*"
        # all six chars demoted + one header each side = 8 bytes
        assert 8 <= eli < 9

    def test_empty_vs_record(self):
        eli, merged = merge_patterns(seq(""), seq("ab"), 1, 1)
        assert show(merged) == "*"

    def test_wildcards_align_free(self):
        eli, merged = merge_patterns(seq("a*b"), seq("a*b"), 1, 1)
        assert show(merged) == "a*b"
        assert eli < 0.5

    def test_wildcard_absorbs_literal(self):
        eli, merged = merge_patterns(seq("a*b"), seq("axxb"), 2, 1)
        assert show(merged) == "a*b"

    def test_cluster_sizes_weight_cost(self):
        small = merge_patterns(seq("abc1"), seq("abc2"), 1, 1)[0]
        big = merge_patterns(seq("abc1"), seq("abc2"), 10, 10)[0]
        assert big > small * 5

    def test_separator_kept_over_digit_crossing(self):
        # one comma anchor vs a crossing spurious digit: comma must win
        eli, merged = merge_patterns(seq("12,9"), seq("87,19"), 1, 1)
        assert "," in show(merged)


class TestSymmetryAndBounds:
    @pytest.mark.parametrize(
        "a,b",
        [("abc1", "abc2"), ("hello world", "hello spark"), ("x,y", "u,v"), ("", "q")],
    )
    def test_symmetric_cost(self, a, b):
        e1 = merge_patterns(seq(a), seq(b), 1, 1)[0]
        e2 = merge_patterns(seq(b), seq(a), 1, 1)[0]
        assert e1 == pytest.approx(e2)

    def test_bound_prunes(self):
        assert merge_patterns(seq("abcdef"), seq("uvwxyz"), 1, 1, bound=1.0) is None

    def test_bound_keeps_cheap_merges(self):
        res = merge_patterns(seq("abc1"), seq("abc2"), 1, 1, bound=100.0)
        assert res is not None

    def test_banded_matches_full_on_similar_strings(self):
        a = "user=1234&ts=1639570000&city=rome"
        b = "user=98&ts=1639570999&city=oslo"
        full = merge_patterns(seq(a), seq(b), 1, 1, band=None)
        banded = merge_patterns(seq(a), seq(b), 1, 1, band=16)
        assert full is not None and banded is not None
        assert banded[0] == pytest.approx(full[0])
        assert show(banded[1]) == show(full[1])

    @settings(max_examples=60, deadline=None)
    @given(
        st.text(alphabet="ab1,", max_size=12), st.text(alphabet="ab1,", max_size=12)
    )
    def test_onegram_is_lower_bound_for_singletons(self, a, b):
        eli = merge_patterns(seq(a), seq(b), 1, 1)[0]
        lb = one_gram_lower_bound(
            gram_counter(seq(a)), gram_counter(seq(b)), 1, 1
        )
        assert lb <= eli + 1e-9

    @settings(max_examples=40, deadline=None)
    @given(st.text(alphabet="abc,.0123", max_size=16))
    def test_self_merge_is_free_and_stable(self, text):
        eli, merged = merge_patterns(seq(text), seq(text), 1, 1)
        assert eli < 1.0  # epsilon dust only
        assert show(merged) == text


class TestMergedPatternValidity:
    @settings(max_examples=60, deadline=None)
    @given(
        st.text(alphabet="abcd0123,=.", max_size=20),
        st.text(alphabet="abcd0123,=.", max_size=20),
    )
    def test_merged_is_common_subsequence(self, a, b):
        _, merged = merge_patterns(seq(a), seq(b), 1, 1)
        lits = [t for t in merged if t is not WILDCARD]

        def is_subsequence(needle, hay):
            it = iter(hay)
            return all(c in it for c in needle)

        assert is_subsequence(lits, a)
        assert is_subsequence(lits, b)

    @settings(max_examples=40, deadline=None)
    @given(
        st.text(alphabet="xy1,", max_size=14), st.text(alphabet="xy1,", max_size=14)
    )
    def test_no_adjacent_wildcards(self, a, b):
        _, merged = merge_patterns(seq(a), seq(b), 1, 1)
        for t1, t2 in zip(merged, merged[1:]):
            assert not (t1 is WILDCARD and t2 is WILDCARD)


def test_record_to_pattern():
    assert record_to_pattern("ab") == ("a", "b")
    assert record_to_pattern("") == ()
