"""Shared helpers for the ``jobs/`` spark-submit entrypoints.

Jobs are functions taking a SparkSession (so tests reuse the ``spark``
fixture); ``get_spark`` builds an equivalent local session for standalone
``spark-submit``/``python jobs/<name>.py`` runs.
"""
from __future__ import annotations

import json
import os
from pathlib import Path

from pyspark.sql import SparkSession

__all__ = ["get_spark", "results_dir", "dump_json", "fan_out"]


def get_spark(app: str = "repro-job") -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def results_dir() -> Path:
    d = Path(__file__).resolve().parents[2] / "results"
    d.mkdir(exist_ok=True)
    return d


def dump_json(name: str, obj) -> Path:
    path = results_dir() / name
    path.write_text(json.dumps(obj, indent=2, default=str))
    return path


def fan_out(spark: SparkSession, items: list[str], fn, schema):
    """Run ``fn(item) -> list[dict]`` for every item in parallel executors.

    Implemented with the DataFrame API (mapInPandas over a one-column
    DataFrame, one item per partition) so the 16 per-dataset measurement
    loops of the table harnesses use all cores.
    """
    import pandas as pd

    df = spark.createDataFrame([(it,) for it in items], "item string").repartition(len(items), "item")

    def _run(batches):
        for pdf in batches:
            rows = []
            for it in pdf["item"]:
                rows.extend(fn(it))
            if rows:
                yield pd.DataFrame(rows)

    return df.mapInPandas(_run, schema=schema).collect()
