"""Tests for the LogReducer reproduction."""
import pytest

from repro.datasets import LOG_DATASETS, records
from repro.logcomp import LogReducer
from repro.logcomp.logreducer import _unzigzag, _zigzag


@pytest.mark.parametrize("n", [0, 1, -1, 63, -64, 2**40, -(2**40)])
def test_zigzag_roundtrip(n):
    assert _unzigzag(_zigzag(n)) == n


def test_template_extraction():
    tmpl, variables = LogReducer._template_of("GET /page/17 took 20ms")
    assert variables == ["/page/17", "20ms"]
    assert tmpl == "GET \x00 took \x00"


def test_no_variables():
    tmpl, variables = LogReducer._template_of("plain words only")
    assert variables == []
    assert tmpl == "plain words only"


@pytest.mark.parametrize("name", LOG_DATASETS)
def test_roundtrip_every_log_dataset(name):
    recs = records(name, 80, seed=9)
    lr = LogReducer()
    assert lr.decompress_file(lr.compress_file(recs)) == recs


def test_compresses_logs_well():
    recs = records("Apache", 200, seed=4)
    lr = LogReducer()
    blob = lr.compress_file(recs)
    raw = len("\n".join(recs).encode())
    assert len(blob) < raw * 0.3


def test_timestamp_deltas_beat_plain_lzma():
    """Typed delta encoding is LogReducer's edge over a raw backend."""
    from repro.baselines import lzma_codec

    recs = [f"ts {1_639_574_000 + i} ok" for i in range(400)]
    lr_size = len(LogReducer().compress_file(recs))
    lzma_size = len(lzma_codec.compress("\n".join(recs).encode(), preset=9))
    assert lr_size < lzma_size


def test_empty_file():
    lr = LogReducer()
    assert lr.decompress_file(lr.compress_file([])) == []


def test_single_line():
    lr = LogReducer()
    assert lr.decompress_file(lr.compress_file(["one 1 line"])) == ["one 1 line"]


def test_mixed_templates_preserved_in_order():
    recs = ["a 1", "b 2", "a 3", "c x9 y", "b 4"]
    lr = LogReducer()
    assert lr.decompress_file(lr.compress_file(recs)) == recs
