"""Spark SQL baseline (paper Fig. 3 style).

Each query reads the JSON-Lines file with ``spark.read.json`` — whose
schema-inference pass is part of the measured end-to-end time, exactly
the cost the paper credits for Rumble beating Spark SQL on the filter
query — registers a temp view and runs a SQL string.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession


def _load(spark: SparkSession, path: str) -> DataFrame:
    # Accept the comma-joined replication paths the experiments use
    # (sc.textFile takes them natively; DataFrameReader needs a list).
    return spark.read.json(path.split(","))


def filter_count(spark: SparkSession, path: str) -> int:
    """Paper filter query: objects whose guess equals the target."""
    df = _load(spark, path)
    df.createOrReplaceTempView("dataset")
    return spark.sql(
        "SELECT COUNT(*) AS n FROM dataset WHERE guess = target"
    ).collect()[0]["n"]


def group_counts(spark: SparkSession, path: str) -> list[dict]:
    """Paper grouping query (Fig. 2 semantics): count per target."""
    df = _load(spark, path)
    df.createOrReplaceTempView("dataset")
    rows = spark.sql(
        "SELECT target, COUNT(*) AS n FROM dataset GROUP BY target"
    ).collect()
    return [r.asDict() for r in rows]


def sort_top(spark: SparkSession, path: str, n: int = 10) -> list[dict]:
    """Paper sorting query (Fig. 3): filter + 3-key sort, take n."""
    df = _load(spark, path)
    df.createOrReplaceTempView("dataset")
    rows = spark.sql(
        "SELECT guess, target, country, date FROM dataset "
        "WHERE guess = target "
        "ORDER BY target ASC, country DESC, date DESC"
    ).take(n)
    return [r.asDict() for r in rows]
