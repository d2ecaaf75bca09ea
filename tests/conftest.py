"""Shared fixtures for the test suite.

Training PBC is the expensive part of many tests, so trained codecs and
dataset slices are cached per session. The Spark session itself comes
from the repo-root ``conftest.py``.
"""
from __future__ import annotations

import pytest

from repro.baselines.registry import Codec, make_codec
from repro.datasets import records

#: small deterministic corpora: (train, test) record lists
_TRAIN_N = {"unece": 10, "github": 24, "Hadoop": 40}
_TEST_N = {"unece": 8, "github": 30, "Hadoop": 60}


@pytest.fixture(scope="session")
def corpus_cache():
    cache: dict[str, tuple[list[str], list[str]]] = {}

    def get(name: str) -> tuple[list[str], list[str]]:
        if name not in cache:
            cache[name] = (
                records(name, _TRAIN_N.get(name, 60), seed=11),
                records(name, _TEST_N.get(name, 80), seed=22),
            )
        return cache[name]

    return get


@pytest.fixture(scope="session")
def codec_cache(corpus_cache):
    cache: dict[tuple[str, str], Codec] = {}

    def get(codec_name: str, dataset: str) -> Codec:
        key = (codec_name, dataset)
        if key not in cache:
            train, _ = corpus_cache(dataset)
            codec = make_codec(codec_name)
            codec.train(train)
            cache[key] = codec
        return cache[key]

    return get
