"""Checkpoint analytics (paper Table III/IV, Fig. 8).

Totals, invalid percentages and average checkpointing times, computed with
Spark SQL over the per-run metrics rows or the per-snapshot checkpoint
frame. DuckDB oracle equivalents accompany each aggregation.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

INVALID_SQL = """
SELECT query, workers, protocol, ckpt_total,
       round(100.0 * invalid / NULLIF(ckpt_total, 0), 2) AS invalid_pct
FROM metrics
WHERE protocol <> 'none'
"""


def invalid_summary(spark: SparkSession, metrics: pd.DataFrame) -> DataFrame:
    """Total checkpoints and invalid percentage per table cell."""
    df = spark.createDataFrame(metrics) if isinstance(metrics, pd.DataFrame) else metrics
    return df.where(F.col("protocol") != "none").select(
        "query",
        "workers",
        "protocol",
        "ckpt_total",
        F.round(
            100.0 * F.col("invalid") / F.nullif(F.col("ckpt_total"), F.lit(0)), 2
        ).alias("invalid_pct"),
    )


CKPT_TIME_SQL = """
SELECT op, count(*) AS n, avg(duration) AS avg_duration, avg(state_bytes) AS avg_bytes
FROM ckpts
GROUP BY op
"""


def checkpoint_times(spark: SparkSession, ckpts: pd.DataFrame) -> DataFrame:
    """Average snapshot duration / state size per logical operator, from a
    run's checkpoint frame (UNC/CIC checkpointing time, Fig. 8)."""
    df = spark.createDataFrame(ckpts) if isinstance(ckpts, pd.DataFrame) else ckpts
    return df.groupBy("op").agg(
        F.count(F.lit(1)).alias("n"),
        F.avg("duration").alias("avg_duration"),
        F.avg("state_bytes").alias("avg_bytes"),
    )
