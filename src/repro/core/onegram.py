"""1-gram distance pruning (paper §5.1, Definition 5).

``Dist_1(s, t) = |MS_s ⊎ MS_t| - 2 |MS_s ∩ MS_t|`` over character
multisets, i.e. the number of character occurrences that cannot be
matched one-to-one between the two sequences. It is a lower bound on
the encoding-length increment of merging the two clusters (each
unmatchable occurrence must be demoted to residual payload, costing at
least one byte per member), so pairs whose 1-gram distance already
exceeds the current best ELI are skipped without running the DP.
"""
from __future__ import annotations

from collections import Counter

from .dp import WILDCARD


def gram_counter(seq: tuple) -> Counter:
    """Character multiset of a pattern sequence (wildcards excluded)."""
    return Counter(c for c in seq if c is not WILDCARD)


def one_gram_distance(ca: Counter, cb: Counter) -> int:
    """Unmatched-occurrence count between two character multisets."""
    na = sum(ca.values())
    nb = sum(cb.values())
    inter = sum(min(v, cb[k]) for k, v in ca.items() if k in cb)
    return na + nb - 2 * inter


def one_gram_lower_bound(ca: Counter, cb: Counter, size_a: int, size_b: int) -> float:
    """Cluster-weighted lower bound on the ELI of merging two clusters.

    Every occurrence present in ``a`` but unmatched in ``b`` costs at
    least ``size_a`` bytes (and vice versa) when demoted to residuals;
    wildcard-header refunds can reduce ELI below this only by the number
    of pre-existing wildcards, which we conservatively ignore by using
    the plain unmatched count weighted by ``min(size_a, size_b)``.
    """
    return one_gram_distance(ca, cb) * min(size_a, size_b)
