""""Raw Spark" baseline — the paper's hand-written Java Spark programs.

The measured property of that baseline is: a single pass over the
input, JSON parsed in the JVM with a schema known to the programmer
(no inference), every operator executed in the JVM with no per-row
host-language code. The PySpark equivalent (DESIGN.md §4) is
``spark.read.text`` + ``from_json`` with an explicit schema, followed
by DataFrame-API operators — the plan is built from Python but executes
entirely in the JVM, like compiled Java lambdas.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, functions as F
from pyspark.sql.types import ArrayType, StringType, StructField, StructType

#: The confusion dataset's schema, as a Java programmer would hard-code it.
CONFUSION_SCHEMA = StructType(
    [
        StructField("guess", StringType()),
        StructField("target", StringType()),
        StructField("country", StringType()),
        StructField("choices", ArrayType(StringType())),
        StructField("sample", StringType()),
        StructField("date", StringType()),
    ]
)


def _load(spark: SparkSession, path: str, schema: StructType = CONFUSION_SCHEMA) -> DataFrame:
    # path may be the comma-joined replication list used by T3/T5.
    return (
        spark.read.text(path.split(","))
        .select(F.from_json(F.col("value"), schema).alias("o"))
        .select("o.*")
    )


def filter_count(spark: SparkSession, path: str) -> int:
    df = _load(spark, path)
    return df.filter(F.col("guess") == F.col("target")).count()


def group_counts(spark: SparkSession, path: str) -> list[dict]:
    df = _load(spark, path)
    rows = df.groupBy("target").agg(F.count(F.lit(1)).alias("n")).collect()
    return [r.asDict() for r in rows]


def sort_top(spark: SparkSession, path: str, n: int = 10) -> list[dict]:
    df = _load(spark, path)
    rows = (
        df.filter(F.col("guess") == F.col("target"))
        .select("guess", "target", "country", "date")
        .orderBy(F.col("target").asc(), F.col("country").desc(), F.col("date").desc())
        .take(n)
    )
    return [r.asDict() for r in rows]
