"""The paper's comparison systems (Fig. 11–13), rebuilt per DESIGN.md §4:

* :mod:`spark_native` — "raw Spark (Java)": JVM-only execution with an
  explicit schema and no Python per-row code.
* :mod:`spark_sql` — Spark SQL over ``spark.read.json`` (schema
  inference included in the measured time, as in the paper).
* :mod:`pyspark_rdd` — PySpark RDD + Python lambdas (paper Fig. 2).
* :mod:`local_single_thread` — the Zorba-like and Xidel-like
  single-threaded JSONiq engines of Fig. 12.
"""
