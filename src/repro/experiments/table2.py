"""Table 2 — dataset statistics (record counts scaled, avg length matched).

The paper reports corpus sizes up to 33 billion records; we generate
scaled corpora and check the *average record length* against Table 2,
which is what drives per-record compression behaviour.
"""
from __future__ import annotations

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from ..datasets import GENERATORS, dataset_df
from .common import dataset_size, format_table
from .paper_numbers import TABLE2


def run(spark: SparkSession, scale: str = "bench", seed: int = 0) -> list[dict]:
    rows = []
    for name in GENERATORS:
        df = dataset_df(spark, name, dataset_size(name, scale), seed=seed)
        agg = df.agg(
            F.count("*").alias("n"),
            F.avg(F.length(F.encode("record", "utf-8"))).alias("avg_len"),
        ).collect()[0]
        paper_n, paper_len = TABLE2[name]
        rows.append(
            {
                "dataset": name,
                "records": int(agg["n"]),
                "avg_len": float(agg["avg_len"]),
                "paper_avg_len": paper_len,
                "paper_records": paper_n,
            }
        )
    return rows


def render(rows: list[dict]) -> str:
    return format_table(
        rows, ["dataset", "records", "avg_len", "paper_avg_len", "paper_records"]
    )
