"""Parquet-backed compressed row-group store.

Writes the block DataFrame produced by ``codec.compress_to_blocks`` to
Parquet (one NeaTS payload per row, with ``start_idx``/``n`` min-max
metadata columns), and reads it back with block-range predicates — the
same access pattern as Parquet row-group pruning, followed by NeaTS
in-block random access.  A JVM DataSourceV2 file format is out of scope in
this container (see DESIGN.md §6); this store preserves the behaviour the
paper's evaluation exercises: pruning + per-page decode + random access.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, functions as F

from . import codec as _codec

__all__ = ["write_store", "read_blocks", "scan_range", "point_lookup", "store_size_bytes"]


def write_store(blocks: DataFrame, path: str) -> None:
    # Parquet compression off: the payloads are already NeaTS-compressed and
    # double compression would muddy the size accounting.
    blocks.write.mode("overwrite").option("compression", "none").parquet(path)


def read_blocks(spark: SparkSession, path: str) -> DataFrame:
    return spark.read.parquet(path)


def scan_range(spark: SparkSession, path: str, lo: int, hi: int) -> DataFrame:
    """Range query over the store; the filter on ``start_idx`` is pushed to
    the Parquet reader, so untouched row groups are never read."""
    blocks = read_blocks(spark, path).filter(
        (F.col("start_idx") < F.lit(hi)) & (F.col("start_idx") + F.col("n") > F.lit(lo))
    )
    return _codec.range_query(blocks, lo, hi)


def point_lookup(spark: SparkSession, path: str, keys: DataFrame, *, block_size: int) -> DataFrame:
    blocks = read_blocks(spark, path)
    return _codec.random_access(blocks, keys, block_size=block_size)


def store_size_bytes(blocks: DataFrame) -> int:
    """Total compressed payload bytes across blocks (driver-side sum)."""
    return blocks.select(F.sum(F.length("payload")).alias("s")).collect()[0]["s"]
