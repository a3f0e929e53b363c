"""Runtime Spark tuning for reproduction-scale workloads.

Two facts dominate performance here: (1) per-action scheduling overhead
(~0.3–3 s in this sandbox) dwarfs data movement, so pipelines minimize
actions and truncate lineage eagerly; (2) plans built on (local-)
checkpointed RDDs get ``defaultSizeInBytes = Long.MaxValue`` statistics,
whose products across joins become huge BigIntegers that stall Catalyst's
size-only stats estimation for tens of seconds.  ``tune(spark)`` sets the
runtime-settable confs that avoid both; it is idempotent and called by
pipelines, jobs and tests.
"""
from __future__ import annotations

from pyspark.sql import SparkSession


def tune(spark: SparkSession, *, shuffle_partitions: int | None = 8) -> SparkSession:
    """Apply reproduction-scale session settings (idempotent)."""
    spark.conf.set("spark.sql.defaultSizeInBytes", str(32 * 1024 * 1024))
    if shuffle_partitions is not None:
        spark.conf.set("spark.sql.shuffle.partitions", str(shuffle_partitions))
    return spark
