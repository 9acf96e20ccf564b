"""Spark per-partition codec: block compression, decoding, random access,
range queries — query results verified against the DuckDB oracle over the
original uncompressed data."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.sparkio.codec import (
    compress_to_blocks, decode_block, decompress_blocks, encode_block,
    random_access, range_query,
)
from repro.tsdata import load

N = 3000
BLOCK = 512


@pytest.fixture(scope="module")
def series():
    return load("IT", n=N, seed=7)


@pytest.fixture(scope="module")
def ts_df(spark, series):
    pdf = pd.DataFrame({"idx": np.arange(N), "y": series.ints})
    return spark.createDataFrame(pdf)


@pytest.fixture(scope="module")
def neats_blocks(spark, ts_df):
    return compress_to_blocks(ts_df, codec="neats", block_size=BLOCK).cache()


class TestEncodeBlock:
    @pytest.mark.parametrize("codec", ["neats", "leats", "sneats", "zstd", "lz4", "xz", "snappy", "brotli", "gorilla", "chimp"])
    def test_roundtrip(self, codec, series):
        vals = series.ints[:800]
        payload = encode_block(vals, codec)
        out = decode_block(payload, codec, len(vals))
        assert np.array_equal(out, vals)

    def test_unknown_codec(self):
        with pytest.raises(ValueError):
            encode_block(np.arange(4, dtype=np.int64), "nope")

    def test_neats_payload_compresses(self, series):
        payload = encode_block(series.ints, "neats")
        assert len(payload) < 8 * series.n


class TestBlocksPipeline:
    def test_block_layout(self, neats_blocks):
        rows = neats_blocks.orderBy("block_id").collect()
        assert len(rows) == (N + BLOCK - 1) // BLOCK
        assert rows[0]["start_idx"] == 0
        assert sum(r["n"] for r in rows) == N
        for r in rows:
            assert r["codec"] == "neats"
            assert len(r["payload"]) > 0

    def test_decompress_roundtrip_via_oracle(self, spark, neats_blocks, series):
        decoded = decompress_blocks(neats_blocks)
        pdf = pd.DataFrame({"idx": np.arange(N), "y": series.ints})
        assert_equivalent(decoded, "SELECT idx, y FROM original", original=pdf)

    def test_aggregate_query_via_oracle(self, spark, neats_blocks, series):
        decoded = decompress_blocks(neats_blocks)
        got = decoded.agg(
            F.sum("y").alias("total"), F.count("y").alias("cnt"),
            F.min("y").alias("lo"), F.max("y").alias("hi"),
        )
        pdf = pd.DataFrame({"idx": np.arange(N), "y": series.ints})
        assert_equivalent(
            got,
            "SELECT sum(y) AS total, count(y) AS cnt, min(y) AS lo, max(y) AS hi FROM original",
            original=pdf,
        )

    def test_range_query_via_oracle(self, spark, neats_blocks, series):
        lo, hi = 700, 2100
        got = range_query(neats_blocks, lo, hi)
        pdf = pd.DataFrame({"idx": np.arange(N), "y": series.ints})
        assert_equivalent(
            got,
            f"SELECT idx, y FROM original WHERE idx >= {lo} AND idx < {hi}",
            original=pdf,
        )

    def test_range_query_prunes_blocks(self, neats_blocks):
        lo, hi = 0, 10  # touches only block 0
        pruned = neats_blocks.filter(
            (F.col("start_idx") < hi) & (F.col("start_idx") + F.col("n") > lo)
        )
        assert pruned.count() == 1

    def test_random_access_join(self, spark, neats_blocks, series):
        rng = np.random.default_rng(0)
        keys = rng.choice(N, 40, replace=False)
        keys_df = spark.createDataFrame(pd.DataFrame({"idx": keys}))
        got = random_access(neats_blocks, keys_df, block_size=BLOCK)
        pdf = pd.DataFrame({"idx": np.arange(N), "y": series.ints})
        assert_equivalent(
            got,
            f"SELECT idx, y FROM original WHERE idx IN ({','.join(map(str, keys))})",
            original=pdf,
        )

    def test_zstd_blocks_equivalent(self, spark, ts_df, series):
        blocks = compress_to_blocks(ts_df, codec="zstd", block_size=BLOCK)
        decoded = decompress_blocks(blocks)
        pdf = pd.DataFrame({"idx": np.arange(N), "y": series.ints})
        assert_equivalent(decoded, "SELECT idx, y FROM original", original=pdf)
