"""Per-partition NeaTS block codec for Spark DataFrames.

The repro target treats NeaTS as a page encoding for columnar storage:
a time series DataFrame ``(idx, y)`` is split into fixed-size blocks (the
"row groups"), each block is compressed *inside the executors* with
``applyInPandas``, and the result is a small DataFrame of binary payload
rows that can be written to Parquet (see ``rowgroup_store``).  Random
access and range scans decode only the touched blocks, using NeaTS's
native in-block random access (Algorithm 3).

Supported block codecs: ``neats`` / ``leats`` / ``sneats`` (NeaTS
serialisation), the general-purpose codecs (``xz``/``zstd``/``lz4``/
``snappy``/``brotli``), and ``gorilla``/``chimp`` XOR streams.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import (
    BinaryType, LongType, StringType, StructField, StructType,
)

from ..baselines.chimp import ChimpCodec
from ..baselines.gorilla import GorillaCodec
from ..baselines.gp import GPCodec
from ..core.neats import NeaTS

__all__ = ["compress_to_blocks", "decompress_blocks", "random_access", "range_query", "BLOCK_SCHEMA"]

BLOCK_SCHEMA = StructType([
    StructField("block_id", LongType(), False),
    StructField("start_idx", LongType(), False),
    StructField("n", LongType(), False),
    StructField("codec", StringType(), False),
    StructField("payload", BinaryType(), False),
])

_GP_NAMES = {"xz": "Xz", "zstd": "Zstd", "lz4": "Lz4", "snappy": "Snappy", "brotli": "Brotli"}


def encode_block(values: np.ndarray, codec: str) -> bytes:
    values = np.asarray(values, dtype=np.int64)
    if codec in ("neats", "leats", "sneats"):
        return NeaTS.compress(values, variant=codec).to_bytes()
    if codec in _GP_NAMES:
        return GPCodec(_GP_NAMES[codec]).compress(values)
    if codec == "gorilla":
        return GorillaCodec().compress(values.view(np.uint64))
    if codec == "chimp":
        return ChimpCodec().compress(values.view(np.uint64))
    raise ValueError(f"unknown codec {codec!r}")


def decode_block(payload: bytes, codec: str, n: int) -> np.ndarray:
    if codec in ("neats", "leats", "sneats"):
        return NeaTS.from_bytes(bytes(payload)).decompress()
    if codec in _GP_NAMES:
        return GPCodec(_GP_NAMES[codec]).decompress(bytes(payload), n_values=n)
    if codec == "gorilla":
        return GorillaCodec().decompress(bytes(payload)).view(np.int64)
    if codec == "chimp":
        return ChimpCodec().decompress(bytes(payload)).view(np.int64)
    raise ValueError(f"unknown codec {codec!r}")


def compress_to_blocks(
    df: DataFrame,
    *,
    codec: str = "neats",
    block_size: int = 4096,
    idx_col: str = "idx",
    value_col: str = "y",
) -> DataFrame:
    """Compress ``(idx, y)`` rows into per-block binary payloads.

    The groupBy shuffles rows to the executor owning each block, which then
    runs the NeaTS encoder on its sorted values — the per-partition custom
    encoder pattern.
    """
    src = df.select(
        F.col(idx_col).cast("long").alias("idx"),
        F.col(value_col).cast("long").alias("y"),
        (F.col(idx_col).cast("long") / F.lit(block_size)).cast("long").alias("block_id"),
    )

    def _encode(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("idx")
        vals = pdf["y"].to_numpy(dtype=np.int64)
        bid = int(pdf["block_id"].iloc[0])
        return pd.DataFrame(
            {
                "block_id": [bid],
                "start_idx": [int(pdf["idx"].iloc[0])],
                "n": [len(vals)],
                "codec": [codec],
                "payload": [encode_block(vals, codec)],
            }
        )

    return src.groupBy("block_id").applyInPandas(_encode, schema=BLOCK_SCHEMA)


_DECODED_SCHEMA = StructType([
    StructField("idx", LongType(), False),
    StructField("y", LongType(), False),
])


def decompress_blocks(blocks: DataFrame) -> DataFrame:
    """Inverse of :func:`compress_to_blocks`: back to ``(idx, y)`` rows."""

    def _decode(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            for _, row in pdf.iterrows():
                vals = decode_block(row["payload"], row["codec"], int(row["n"]))
                start = int(row["start_idx"])
                yield pd.DataFrame({"idx": np.arange(start, start + len(vals)), "y": vals})

    return blocks.mapInPandas(_decode, schema=_DECODED_SCHEMA)


def random_access(blocks: DataFrame, keys: DataFrame, *, block_size: int, key_col: str = "idx") -> DataFrame:
    """Batch random access: join the queried indexes to their blocks (a
    shuffle join — broadcast stays disabled per the session config) and use
    NeaTS's in-block Algorithm 3 instead of full block decoding."""
    k = keys.select(
        F.col(key_col).cast("long").alias("idx"),
        (F.col(key_col).cast("long") / F.lit(block_size)).cast("long").alias("block_id"),
    )
    joined = k.join(blocks, on="block_id", how="inner")

    def _pick(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            for (payload, codec, start, n), grp in pdf.groupby(
                ["payload", "codec", "start_idx", "n"], sort=False
            ):
                idxs = grp["idx"].to_numpy(dtype=np.int64)
                if codec in ("neats", "leats", "sneats"):
                    nts = NeaTS.from_bytes(bytes(payload))
                    ys = np.asarray([nts.access(int(i - start)) for i in idxs], dtype=np.int64)
                else:
                    vals = decode_block(payload, codec, int(n))
                    ys = vals[idxs - start]
                yield pd.DataFrame({"idx": idxs, "y": ys})

    return joined.mapInPandas(_pick, schema=_DECODED_SCHEMA)


def range_query(blocks: DataFrame, lo: int, hi: int) -> DataFrame:
    """Range scan [lo, hi): prune non-overlapping blocks by their
    (start_idx, n) metadata — the row-group pruning analogue — then decode
    and trim."""
    pruned = blocks.filter(
        (F.col("start_idx") < F.lit(hi)) & (F.col("start_idx") + F.col("n") > F.lit(lo))
    )
    return decompress_blocks(pruned).filter((F.col("idx") >= lo) & (F.col("idx") < hi))
