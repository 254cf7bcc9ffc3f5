"""Latency analytics over sink telemetry (paper §V / Figs. 9-10).

The simulator's latency log is a frame of (sink_ts, ingest_ts) pairs; the
per-second 50th/99th percentiles are computed with Spark SQL (exact
``percentile``, matching DuckDB's ``quantile_cont`` for the oracle tests).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

#: DuckDB oracle equivalent over a table named ``lat(sink_ts, ingest_ts)``
PERCENTILES_SQL = """
SELECT CAST(floor(sink_ts) AS BIGINT) AS sec,
       quantile_cont(sink_ts - ingest_ts, 0.5) AS p50,
       quantile_cont(sink_ts - ingest_ts, 0.99) AS p99
FROM lat
GROUP BY floor(sink_ts)
"""


def percentiles_per_second(spark: SparkSession, lat: pd.DataFrame) -> DataFrame:
    """Per-second p50/p99 end-to-end latency (exact percentiles)."""
    df = spark.createDataFrame(lat) if isinstance(lat, pd.DataFrame) else lat
    lat_col = F.col("sink_ts") - F.col("ingest_ts")
    return (
        df.withColumn("sec", F.floor(F.col("sink_ts")).cast("long"))
        .withColumn("lat", lat_col)
        .groupBy("sec")
        .agg(
            F.expr("percentile(lat, 0.5)").alias("p50"),
            F.expr("percentile(lat, 0.99)").alias("p99"),
        )
    )


def steady_percentiles(
    spark: SparkSession, lat: pd.DataFrame, t0: float, t1: float
) -> DataFrame:
    """Overall p50/p99 within a window — the steady-state numbers the skew
    experiments (Fig. 12) report."""
    df = spark.createDataFrame(lat) if isinstance(lat, pd.DataFrame) else lat
    return (
        df.where((F.col("sink_ts") >= t0) & (F.col("sink_ts") < t1))
        .withColumn("lat", F.col("sink_ts") - F.col("ingest_ts"))
        .agg(
            F.expr("percentile(lat, 0.5)").alias("p50"),
            F.expr("percentile(lat, 0.99)").alias("p99"),
        )
    )


def steady_sql(t0: float, t1: float) -> str:
    return f"""
SELECT quantile_cont(sink_ts - ingest_ts, 0.5) AS p50,
       quantile_cont(sink_ts - ingest_ts, 0.99) AS p99
FROM lat WHERE sink_ts >= {t0} AND sink_ts < {t1}
"""
