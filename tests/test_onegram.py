"""Tests for the 1-gram distance pruning bound (paper Definition 5)."""
from collections import Counter

from hypothesis import given, strategies as st

from repro.core.dp import WILDCARD
from repro.core.onegram import gram_counter, one_gram_distance, one_gram_lower_bound


def test_identical_strings_distance_zero():
    c = Counter("hello")
    assert one_gram_distance(c, c) == 0


def test_disjoint_strings_distance_is_total_length():
    assert one_gram_distance(Counter("aaa"), Counter("bb")) == 5


def test_partial_overlap():
    # "aab" vs "abb": matched a,b (2 each side) -> 6 - 4 = 2
    assert one_gram_distance(Counter("aab"), Counter("abb")) == 2


def test_symmetry():
    a, b = Counter("abcabc"), Counter("cccab")
    assert one_gram_distance(a, b) == one_gram_distance(b, a)


def test_empty():
    assert one_gram_distance(Counter(), Counter()) == 0
    assert one_gram_distance(Counter("xyz"), Counter()) == 3


def test_gram_counter_skips_wildcards():
    c = gram_counter(("a", WILDCARD, "b", WILDCARD))
    assert c == Counter("ab")


def test_lower_bound_scales_with_cluster_size():
    a, b = Counter("abc"), Counter("xyz")
    assert one_gram_lower_bound(a, b, 1, 1) == 6
    assert one_gram_lower_bound(a, b, 4, 2) == 12  # weighted by min size


@given(st.text(max_size=30), st.text(max_size=30))
def test_distance_nonnegative_and_bounded(a, b):
    d = one_gram_distance(Counter(a), Counter(b))
    assert 0 <= d <= len(a) + len(b)
