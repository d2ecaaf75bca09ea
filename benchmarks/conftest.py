"""Benchmark fixtures: trained codecs + record batches, built once.

Benchmarks time the *online* phase only (the paper excludes offline
training); training happens here in session-scoped fixtures.
"""
from __future__ import annotations

import pytest

from repro.baselines.registry import Codec, make_codec
from repro.datasets import records

#: benchmark batch sizes (records); unece records are ~4.5 KB each
TRAIN_N = {"default": 200, "unece": 24, "github": 80}
BATCH_N = {"default": 200, "unece": 16, "github": 60}


@pytest.fixture(scope="session")
def bench_corpus():
    cache: dict[str, tuple[list[str], list[str]]] = {}

    def get(name: str) -> tuple[list[str], list[str]]:
        if name not in cache:
            cache[name] = (
                records(name, TRAIN_N.get(name, TRAIN_N["default"]), seed=41),
                records(name, BATCH_N.get(name, BATCH_N["default"]), seed=42),
            )
        return cache[name]

    return get


@pytest.fixture(scope="session")
def bench_codec(bench_corpus):
    cache: dict[tuple[str, str], Codec] = {}

    def get(codec_name: str, dataset: str) -> Codec:
        key = (codec_name, dataset)
        if key not in cache:
            train, _ = bench_corpus(dataset)
            codec = make_codec(codec_name)
            codec.train(train)
            cache[key] = codec
        return cache[key]

    return get
