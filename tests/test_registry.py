"""Cross-codec tests through the uniform registry interface."""
import pytest

from repro.baselines.registry import make_codec

LINE_CODECS = ["Snappy", "LZ4", "LZ4(dict)", "Zstd", "Zstd(dict)", "LZMA", "FSST", "PBC", "PBC_F"]
FILE_CODECS = ["Snappy", "LZ4", "Zstd", "LZMA", "PBC", "PBC_F", "PBC_Z", "PBC_L"]
DATASETS = ["KV1", "KV3", "Apache", "urls"]


@pytest.mark.parametrize("codec_name", LINE_CODECS)
@pytest.mark.parametrize("dataset", DATASETS)
def test_line_roundtrip(codec_cache, corpus_cache, codec_name, dataset):
    codec = codec_cache(codec_name, dataset)
    _, test = corpus_cache(dataset)
    for rec in test[:40]:
        assert codec.decompress_record(codec.compress_record(rec)) == rec


@pytest.mark.parametrize("codec_name", FILE_CODECS)
@pytest.mark.parametrize("dataset", ["KV1", "Apache"])
def test_file_roundtrip(codec_cache, corpus_cache, codec_name, dataset):
    codec = codec_cache(codec_name, dataset)
    _, test = corpus_cache(dataset)
    assert codec.decompress_file(codec.compress_file(test)) == test


@pytest.mark.parametrize("dataset", DATASETS)
def test_pbc_beats_dictionaryless_lz_on_lines(codec_cache, corpus_cache, dataset):
    """Paper Table 3 shape: per-record LZ without dict barely compresses."""
    _, test = corpus_cache(dataset)
    raw = sum(len(r.encode()) for r in test)
    pbc = codec_cache("PBC", dataset)
    lz4_plain = codec_cache("LZ4", dataset)
    pbc_bytes = sum(len(pbc.compress_record(r)) for r in test)
    lz4_bytes = sum(len(lz4_plain.compress_record(r)) for r in test)
    assert pbc_bytes < lz4_bytes
    assert pbc_bytes < raw * 0.85


def test_pbc_f_improves_on_pbc_for_text_residuals(codec_cache, corpus_cache):
    """FSST residual coding must help on word-heavy residuals (urls)."""
    _, test = corpus_cache("urls")
    pbc = codec_cache("PBC", "urls")
    pbc_f = codec_cache("PBC_F", "urls")
    plain = sum(len(pbc.compress_record(r)) for r in test)
    fsst = sum(len(pbc_f.compress_record(r)) for r in test)
    assert fsst < plain


def test_pbc_l_best_file_ratio_on_logs(codec_cache, corpus_cache):
    """Paper Table 4 shape: PBC_L beats plain LZMA on templated logs."""
    _, test = corpus_cache("Apache")
    blob_pbc_l = codec_cache("PBC_L", "Apache").compress_file(test)
    blob_lzma = codec_cache("LZMA", "Apache").compress_file(test)
    assert len(blob_pbc_l) < len(blob_lzma)


def test_dict_codecs_trained_flag(codec_cache):
    assert codec_cache("Zstd(dict)", "KV1").zdict != b""
    assert codec_cache("LZ4(dict)", "KV1").zdict != b""
    assert codec_cache("Zstd", "KV1").zdict == b""


def test_block_pbc_rejects_line_mode(codec_cache):
    with pytest.raises(RuntimeError):
        codec_cache("PBC_Z", "KV1").compress_record("x")


def test_untrained_pbc_rejects_use():
    with pytest.raises(RuntimeError):
        make_codec("PBC").compress_record("x")


def test_untrained_fsst_rejects_use():
    with pytest.raises(RuntimeError):
        make_codec("FSST").compress_record("x")


def test_unknown_codec_rejected():
    with pytest.raises(ValueError):
        make_codec("Brotli")


def test_exclusive_backends_rejected():
    from repro.baselines.registry import PbcCodec

    with pytest.raises(ValueError):
        PbcCodec(residual="fsst", block="lzma")


def test_random_access_flags():
    assert make_codec("PBC").random_access is True
    assert make_codec("PBC_F").random_access is True
    assert make_codec("PBC_Z").random_access is False
    assert make_codec("PBC_L").random_access is False


@pytest.mark.parametrize("codec_name", ["PBC", "PBC_F"])
def test_pbc_codecs_picklable_for_broadcast(codec_cache, corpus_cache, codec_name):
    import pickle

    codec = codec_cache(codec_name, "KV1")
    _, test = corpus_cache("KV1")
    clone = pickle.loads(pickle.dumps(codec))
    for rec in test[:10]:
        assert clone.decompress_record(clone.compress_record(rec)) == rec
