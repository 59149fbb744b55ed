"""Parquet store for compressed block tables.

The "scientific array columns stored in Parquet via custom encoder" of
the repro hint: the codec blob sits in a Parquet binary column with the
block geometry alongside, so a distributed scientific database can scan,
filter, and transfer compressed blocks without decompressing them.
Parquet's own compression is disabled for the blob column's table — the
payload is already entropy-coded, and honest byte accounting matters for
the transfer experiment.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession


def write_compressed(df: DataFrame, path: str) -> None:
    """Write a compressed block table (from ``compress_df``) to Parquet."""
    df.write.mode("overwrite").option("compression", "none").parquet(path)


def read_compressed(spark: SparkSession, path: str) -> DataFrame:
    """Read a compressed block table back."""
    return spark.read.parquet(path)
