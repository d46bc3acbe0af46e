"""PySpark RDD baseline — the paper's Fig. 2 program style.

RDD transformations with Python lambdas: every row crosses the
JVM↔Python boundary and is parsed and processed by Python workers.
This is the paper's per-row host-language-overhead comparison point
("Rumble is faster than PySpark on all queries").
"""
from __future__ import annotations

import json

from pyspark.sql import SparkSession


def _rdd(spark: SparkSession, path: str):
    return spark.sparkContext.textFile(path).map(json.loads)


def filter_count(spark: SparkSession, path: str) -> int:
    return _rdd(spark, path).filter(lambda e: e.get("guess") == e.get("target")).count()


def group_counts(spark: SparkSession, path: str) -> list[dict]:
    # The exact shape of paper Fig. 2: map to pairs, reduceByKey.
    pairs = (
        _rdd(spark, path)
        .map(lambda e: (e["target"], 1))
        .reduceByKey(lambda a, b: a + b)
        .collect()
    )
    return [{"target": t, "n": n} for t, n in pairs]


def _desc_str(s: str) -> tuple:
    """Order-inverting encoding of a string, so a DESC string key can
    join an ASC composite sortBy key. Negated code points compare in
    reverse lexicographic order; the trailing sentinel makes longer
    strings with an equal prefix sort first, as DESC requires."""
    return tuple(-ord(c) for c in s) + (1,)


def sort_top(spark: SparkSession, path: str, n: int = 10) -> list[dict]:
    # ORDER BY target ASC, country DESC, date DESC as one composite
    # ascending key (Spark's sortBy is a range-partitioned total sort;
    # chaining sortBy calls would not compose stably).
    rdd = _rdd(spark, path).filter(lambda e: e.get("guess") == e.get("target"))
    rows = (
        rdd.map(lambda e: {k: e.get(k) for k in ("guess", "target", "country", "date")})
        .sortBy(lambda e: (e["target"], _desc_str(e["country"]), _desc_str(e["date"])))
        .take(n)
    )
    return rows
