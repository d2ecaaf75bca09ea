"""Offline dictionary training for short-record compression.

Stands in for ``zstd --train`` (the paper's ``Zstd(dict)`` /
``LZ4(dict)`` baselines): pick the highest-gain shingles from a sample
and concatenate them into a preset dictionary, most frequent *last* —
zlib (and zstd) resolve matches against the most recent window bytes
fastest, so hot content belongs at the dictionary's tail.
"""
from __future__ import annotations

from collections import Counter

SHINGLE_LEN = 16
SHINGLE_STRIDE = 4


def train_dictionary(
    samples: list[bytes],
    *,
    dict_size: int = 8192,
    max_sample_bytes: int = 1 << 20,
) -> bytes:
    counts: Counter = Counter()
    budget = max_sample_bytes
    for s in samples:
        if budget <= 0:
            break
        s = s[: min(len(s), budget)]
        budget -= len(s)
        for i in range(0, max(1, len(s) - SHINGLE_LEN + 1), SHINGLE_STRIDE):
            counts[s[i : i + SHINGLE_LEN]] += 1
    picked: list[bytes] = []
    used = 0
    seen: set[bytes] = set()
    for shingle, cnt in counts.most_common():
        if cnt < 2 or used >= dict_size:
            break
        if shingle in seen:
            continue
        seen.add(shingle)
        picked.append(shingle)
        used += len(shingle)
    picked.reverse()  # most frequent last = closest to the window
    return b"".join(picked)[-dict_size:]
