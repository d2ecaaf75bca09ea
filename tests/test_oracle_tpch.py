"""Oracle-checked tests over the provided TPC-H-lite generators.

Validates the DuckDB oracle wiring itself and exercises PBC as a value
codec for relational rows serialized to strings — records decompressed
in executors must produce the same aggregates DuckDB computes on the
original table.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.spark_api import compress_df, decompress_df, train_patterns
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def lineitem(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=3).cache()


def test_oracle_agrees_on_aggregate(spark, lineitem):
    got = lineitem.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"), F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS n "
        "FROM lineitem GROUP BY 1",
        lineitem=lineitem,
    )


def test_oracle_catches_wrong_result(spark, lineitem):
    wrong = lineitem.groupBy("l_returnflag").agg(
        (F.sum("l_quantity") + 1).alias("sum_qty")
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, SUM(l_quantity) AS sum_qty FROM lineitem GROUP BY 1",
            lineitem=lineitem,
        )


def test_pbc_roundtrip_preserves_relational_aggregates(spark, lineitem):
    """Serialize rows as csv-ish records, PBC round-trip, re-aggregate."""
    rows = lineitem.select(
        F.monotonically_increasing_id().alias("id"),
        F.concat_ws(
            "|",
            F.col("l_orderkey"),
            F.col("l_returnflag"),
            F.col("l_quantity").cast("long"),
        ).alias("record"),
    ).cache()
    dictionary = train_patterns(rows, sample_size=64, seed=4, k=4)
    back = decompress_df(compress_df(rows, dictionary), dictionary)
    parsed = back.select(
        F.split("record", "\\|").getItem(1).alias("l_returnflag"),
        F.split("record", "\\|").getItem(2).cast("long").alias("qty"),
    )
    got = parsed.groupBy("l_returnflag").agg(F.sum("qty").alias("sum_qty"))
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(CAST(l_quantity AS BIGINT)) AS sum_qty "
        "FROM lineitem GROUP BY 1",
        lineitem=lineitem,
    )
