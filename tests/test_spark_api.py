"""Spark integration tests: distributed train/compress/decompress + oracle."""
import pytest
from pyspark.sql import functions as F

from repro.core.spark_api import (
    compress_df,
    compressed_size_stats,
    decompress_df,
    sample_records,
    train_patterns,
)
from repro.datasets import dataset_df
from repro.fsst import train_fsst
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def kv1(spark):
    return dataset_df(spark, "KV1", 600, seed=31).repartition(4).cache()


@pytest.fixture(scope="module")
def trained(kv1):
    return train_patterns(kv1, sample_size=96, seed=1, k=8)


def test_sample_records(kv1):
    sample = sample_records(kv1, n=50, seed=2)
    assert 0 < len(sample) <= 50
    assert all(isinstance(s, str) for s in sample)


def test_sample_records_small_frame(spark):
    df = dataset_df(spark, "KV4", 5, seed=1)
    assert len(sample_records(df, n=50)) == 5


def test_compress_decompress_identity(spark, kv1, trained):
    comp = compress_df(kv1, trained)
    back = decompress_df(comp, trained)
    mismatches = (
        kv1.alias("a")
        .join(back.alias("b"), "id")
        .filter("a.record <> b.record")
        .count()
    )
    assert mismatches == 0
    assert back.count() == kv1.count()


def test_compression_ratio_distributed(kv1, trained):
    comp = compress_df(kv1, trained)
    stats = compressed_size_stats(comp, kv1)
    assert stats["compressed_bytes"] < stats["raw_bytes"] * 0.5
    assert 0 < stats["ratio"] < 0.5


def test_fsst_residual_variant(kv1, trained):
    sample = sample_records(kv1, n=60, seed=3)
    table = train_fsst([s.encode() for s in sample])
    comp = compress_df(kv1, trained, fsst_table=table)
    back = decompress_df(comp, trained, fsst_table=table)
    assert (
        kv1.alias("a").join(back.alias("b"), "id").filter("a.record <> b.record").count()
        == 0
    )


def test_oracle_checks_query_over_decompressed(spark, kv1, trained):
    """A query over round-tripped data must equal DuckDB over the original.

    Parses quantity out of the trade JSON on both sides — a corrupted
    decompression would change the aggregate, which the oracle catches.
    """
    back = decompress_df(compress_df(kv1, trained), trained)
    parsed = back.select(
        F.get_json_object("record", "$.symbol").alias("symbol"),
        F.get_json_object("record", "$.quantity").cast("long").alias("quantity"),
    )
    result = parsed.groupBy("symbol").agg(
        F.sum("quantity").alias("total_qty"), F.count("*").alias("n")
    )
    assert_equivalent(
        result,
        """
        SELECT record->>'$.symbol' AS symbol,
               SUM(CAST(record->>'$.quantity' AS BIGINT)) AS total_qty,
               COUNT(*) AS n
        FROM original GROUP BY 1
        """,
        original=kv1,
    )


def test_spark_roundtrip_other_datasets(spark):
    for name in ("Apache", "urls"):
        df = dataset_df(spark, name, 200, seed=13).repartition(3)
        d = train_patterns(df, sample_size=64, seed=5, k=8)
        back = decompress_df(compress_df(df, d), d)
        assert (
            df.alias("a")
            .join(back.alias("b"), "id")
            .filter("a.record <> b.record")
            .count()
            == 0
        )
