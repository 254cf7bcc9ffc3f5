"""Oracle checks for the Spark SQL telemetry analytics."""
import numpy as np
import pandas as pd
import pytest

from helpers import run_query
from repro.analytics.checkpoints import (
    CKPT_TIME_SQL,
    INVALID_SQL,
    checkpoint_times,
    invalid_summary,
)
from repro.analytics.latency import (
    PERCENTILES_SQL,
    percentiles_per_second,
    steady_percentiles,
    steady_sql,
)
from repro.analytics.overhead import OVERHEAD_SQL, overhead_ratios
from repro.analytics.recovery_stats import RESTART_SQL, restart_summary, recovery_seconds
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def lat_frame():
    res = run_query("q12", "UNC", fail_at=6.0)
    return res.telemetry.latency_frame()


@pytest.fixture(scope="module")
def metrics_frame():
    rows = [
        dict(query="q1", workers=10, protocol="none", total_bytes=1000, data_bytes=1000,
             ckpt_total=0, invalid=0, restart_time=float("nan"), n_replay=0),
        dict(query="q1", workers=10, protocol="COOR", total_bytes=1010, data_bytes=1000,
             ckpt_total=240, invalid=0, restart_time=0.25, n_replay=0),
        dict(query="q1", workers=10, protocol="UNC", total_bytes=1005, data_bytes=1000,
             ckpt_total=303, invalid=3, restart_time=0.4, n_replay=100),
        dict(query="q1", workers=10, protocol="CIC", total_bytes=2100, data_bytes=1000,
             ckpt_total=285, invalid=5, restart_time=0.5, n_replay=90),
    ]
    return pd.DataFrame(rows)


class TestLatencyAnalytics:
    def test_percentiles_match_duckdb(self, spark, lat_frame):
        got = percentiles_per_second(spark, lat_frame)
        assert_equivalent(got, PERCENTILES_SQL, lat=lat_frame)

    def test_steady_percentiles_match_duckdb(self, spark, lat_frame):
        got = steady_percentiles(spark, lat_frame, 2.0, 6.0)
        assert_equivalent(got, steady_sql(2.0, 6.0), lat=lat_frame)

    def test_failure_visible_in_series(self, spark, lat_frame):
        pdf = percentiles_per_second(spark, lat_frame).toPandas().set_index("sec")
        assert pdf["p99"].max() > 10 * pdf.loc[:5, "p99"].median()


class TestOverheadAnalytics:
    def test_matches_duckdb(self, spark, metrics_frame):
        got = overhead_ratios(spark, metrics_frame)
        assert_equivalent(got, OVERHEAD_SQL, metrics=metrics_frame)

    def test_values(self, spark, metrics_frame):
        pdf = overhead_ratios(spark, metrics_frame).toPandas().set_index("protocol")
        assert pdf.loc["CIC", "ratio"] == pytest.approx(2.1)
        assert pdf.loc["COOR", "ratio"] == pytest.approx(1.01)
        assert "none" not in pdf.index


class TestCheckpointAnalytics:
    def test_invalid_summary_matches_duckdb(self, spark, metrics_frame):
        got = invalid_summary(spark, metrics_frame)
        assert_equivalent(got, INVALID_SQL, metrics=metrics_frame)

    def test_checkpoint_times_match_duckdb(self, spark):
        res = run_query("q12", "UNC", fail_at=None)
        cf = res.telemetry.checkpoints_frame().drop(columns=["round_id"])
        got = checkpoint_times(spark, cf)
        assert_equivalent(got, CKPT_TIME_SQL, ckpts=cf)


class TestRecoveryAnalytics:
    def test_restart_summary_matches_duckdb(self, spark, metrics_frame):
        got = restart_summary(spark, metrics_frame)
        assert_equivalent(got, RESTART_SQL, metrics=metrics_frame)

    def test_recovery_seconds_finite_for_long_run(self, spark):
        res = run_query("q12", "UNC", fail_at=6.0, duration=25.0, rate=200.0)
        rec = res.telemetry.recovery
        lat = res.telemetry.latency_frame()
        pre = lat[(lat.sink_ts > 2) & (lat.sink_ts < 6)]
        base = float(np.median(pre.sink_ts - pre.ingest_ts))
        t = recovery_seconds(spark, lat, rec["t_fail"], rec["t_resume"], base)
        assert np.isfinite(t) and t > 0
