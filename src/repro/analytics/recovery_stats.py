"""Restart / recovery analytics (paper §V, Figs. 11 & 13).

Restart time is produced by the simulator's cost model per run; this
module aggregates it across runs and derives recovery time from the
per-second latency series (first second whose p50 returns to within 2x of
the pre-failure baseline).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.harness import recovered_threshold

RESTART_SQL = """
SELECT query, workers, protocol, round(restart_time, 4) AS restart_time,
       n_replay
FROM metrics
WHERE protocol <> 'none'
"""


def restart_summary(spark: SparkSession, metrics: pd.DataFrame) -> DataFrame:
    df = spark.createDataFrame(metrics) if isinstance(metrics, pd.DataFrame) else metrics
    return df.where(F.col("protocol") != "none").select(
        "query",
        "workers",
        "protocol",
        F.round("restart_time", 4).alias("restart_time"),
        "n_replay",
    )


def recovery_seconds(
    spark: SparkSession,
    lat: pd.DataFrame,
    t_fail: float,
    t_resume: float,
    baseline_p50: float,
) -> float:
    """Recovery time (s) from a latency frame: first whole second at or
    after ``t_resume`` whose p50 is back under ``recovered_threshold`` of
    the pre-failure p50, measured from the failure instant. NaN if never
    recovered. Matches ``repro.core.harness`` bucket-for-bucket."""
    df = spark.createDataFrame(lat) if isinstance(lat, pd.DataFrame) else lat
    per_sec = (
        df.where(F.col("sink_ts") >= t_resume)
        .withColumn("sec", F.floor("sink_ts").cast("long"))
        .withColumn("lat", F.col("sink_ts") - F.col("ingest_ts"))
        .groupBy("sec")
        .agg(F.expr("percentile(lat, 0.5)").alias("p50"))
        .where(F.col("p50") <= recovered_threshold(baseline_p50))
        .agg(F.min("sec").alias("sec"))
        .collect()
    )
    sec = per_sec[0]["sec"]
    return float("nan") if sec is None else (sec + 1) - t_fail
