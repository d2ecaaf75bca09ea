"""Tests for the PBC chunk store and its Spark DataSourceV2."""
import os

import pytest

from repro.colstore import ChunkReader, random_access, read_table, write_chunks
from repro.colstore.chunks import _load_codec, chunk_files
from repro.core.spark_api import train_patterns
from repro.datasets import dataset_df


@pytest.fixture(scope="module")
def table(spark, tmp_path_factory):
    path = str(tmp_path_factory.mktemp("colstore") / "kv1.pbc")
    df = dataset_df(spark, "KV1", 400, seed=17).repartition(3).cache()
    dictionary = train_patterns(df, sample_size=80, seed=2, k=8)
    n_chunks = write_chunks(df, path, dictionary)
    return path, df, n_chunks


def test_chunks_written_per_partition(table):
    path, df, n_chunks = table
    assert n_chunks == 3
    assert len(chunk_files(path)) == 3
    assert os.path.exists(os.path.join(path, "_dictionary.json"))


def test_chunk_reader_lists_all_ids(table):
    path, df, _ = table
    codec = _load_codec(path)
    ids = []
    for chunk in chunk_files(path):
        ids.extend(ChunkReader(chunk, codec).ids)
    assert sorted(ids) == list(range(400))


def test_record_at_decodes_single_record(table):
    path, df, _ = table
    codec = _load_codec(path)
    reader = ChunkReader(chunk_files(path)[0], codec)
    originals = {r["id"]: r["record"] for r in df.collect()}
    for idx in (0, len(reader) // 2, len(reader) - 1):
        assert reader.record_at(idx) == originals[reader.ids[idx]]


def test_random_access_point_lookup(table):
    path, df, _ = table
    originals = {r["id"]: r["record"] for r in df.collect()}
    for rid in (0, 57, 399):
        assert random_access(path, rid) == originals[rid]


def test_random_access_missing_id(table):
    path, _, _ = table
    assert random_access(path, 99999) is None


def test_datasource_roundtrip(spark, table):
    path, df, _ = table
    got = read_table(spark, path)
    assert got.count() == 400
    mismatches = (
        df.alias("a").join(got.alias("b"), "id").filter("a.record <> b.record").count()
    )
    assert mismatches == 0


def test_datasource_sql_predicates(spark, table):
    path, df, _ = table
    got = read_table(spark, path)
    got.createOrReplaceTempView("pbc_table")
    n = spark.sql("SELECT count(*) AS n FROM pbc_table WHERE id < 100").collect()[0]["n"]
    assert n == 100


def test_compressed_smaller_than_raw(table):
    path, df, _ = table
    raw = sum(len(r["record"].encode()) for r in df.collect())
    stored = sum(os.path.getsize(c) for c in chunk_files(path))
    assert stored < raw * 0.6


def test_corrupt_magic_rejected(table, tmp_path):
    path, _, _ = table
    codec = _load_codec(path)
    bad = tmp_path / "bad.pbc"
    bad.write_bytes(b"XXXX" + b"\x00" * 10)
    with pytest.raises(ValueError):
        ChunkReader(str(bad), codec)
