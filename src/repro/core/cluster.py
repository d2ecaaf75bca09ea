"""Greedy agglomerative clustering under minimal encoding-length merging.

Implements the paper's clustering framework (§4.2, Fig. 3): start from
initial clusters, repeatedly merge the pair with the minimal encoding
length increment (Problem 2) until ``k`` clusters remain, using the
1-gram distance as a pruning lower bound (§5.1) and the running-best
ELI as the DP early-termination bound.
"""
from __future__ import annotations

from dataclasses import dataclass, field as dc_field

from .dp import WILDCARD, merge_patterns, record_to_pattern
from .onegram import gram_counter, one_gram_lower_bound


@dataclass
class Cluster:
    """A cluster: its pattern sequence and member records."""

    seq: tuple
    members: list[str]
    grams: "dict" = dc_field(default_factory=dict)

    def __post_init__(self) -> None:
        if not self.grams:
            self.grams = gram_counter(self.seq)

    @property
    def size(self) -> int:
        return len(self.members)

    @classmethod
    def singleton(cls, record: str) -> "Cluster":
        return cls(seq=record_to_pattern(record), members=[record])


def merge_two(a: Cluster, b: Cluster, *, band: int | None = None) -> Cluster:
    """Merge two clusters into one with the DP-derived pattern."""
    res = merge_patterns(a.seq, b.seq, a.size, b.size, band=band)
    if res is None:  # banded DP found no alignment — fall back to exact
        res = merge_patterns(a.seq, b.seq, a.size, b.size, band=None)
    _, merged_seq = res
    return Cluster(seq=merged_seq, members=a.members + b.members)


def _pair_eli(
    a: Cluster, b: Cluster, bound: float | None, band: int | None
) -> float | None:
    res = merge_patterns(a.seq, b.seq, a.size, b.size, bound=bound, band=band)
    return None if res is None else res[0]


def agglomerate(
    clusters: list[Cluster],
    k: int,
    *,
    band: int | None = 64,
    use_pruning: bool = True,
) -> list[Cluster]:
    """Merge ``clusters`` down to at most ``k`` by minimal-ELI merging.

    Each iteration scans all pairs; the 1-gram lower bound skips pairs
    that cannot beat the current best, and the DP itself terminates
    early once a whole row exceeds the best (MIN bound, §5.1).
    """
    clusters = list(clusters)
    while len(clusters) > max(k, 1):
        best: tuple[int, int] | None = None
        best_eli = float("inf")
        n = len(clusters)
        for i in range(n):
            ci = clusters[i]
            for j in range(i + 1, n):
                cj = clusters[j]
                if use_pruning and best is not None:
                    lb = one_gram_lower_bound(ci.grams, cj.grams, ci.size, cj.size)
                    if lb > best_eli:
                        continue
                bound = best_eli if best is not None else None
                eli = _pair_eli(ci, cj, bound, band)
                if eli is not None and eli < best_eli:
                    best_eli = eli
                    best = (i, j)
        if best is None:
            # every pair pruned/infeasible under the band — merge the two
            # smallest clusters exactly so the loop always terminates
            order = sorted(range(n), key=lambda idx: clusters[idx].size)
            best = (min(order[0], order[1]), max(order[0], order[1]))
        i, j = best
        merged = merge_two(clusters[i], clusters[j], band=band)
        clusters = [c for idx, c in enumerate(clusters) if idx not in (i, j)]
        clusters.append(merged)
    return clusters


def pattern_coverage(cluster: Cluster) -> float:
    """Fraction of literal (non-wildcard) elements in the cluster pattern."""
    if not cluster.seq:
        return 0.0
    lits = sum(1 for t in cluster.seq if t is not WILDCARD)
    return lits / len(cluster.seq)
