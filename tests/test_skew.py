"""The paper's headline finding (Fig. 12, §VII-B skewed NexMark): under
hot-item skew the coordinated protocol collapses — markers queue behind
the straggling worker and alignment blocks the fast channels — while the
uncoordinated protocols stay low on both p50 latency and checkpointing
time."""
import pytest

from repro.core.config import ExperimentConfig
from repro.core.harness import run_config


def skew_run(protocol, hot_ratio, frac=0.5, query="q12", workers=10, duration=20.0):
    cfg = ExperimentConfig(
        query=query, protocol=protocol, workers=workers, rate=-frac,
        duration=duration, fail_at=None, hot_ratio=hot_ratio,
    )
    row, _ = run_config(cfg)
    return row


class TestSkewHeadline:
    def test_coor_checkpoint_time_explodes(self):
        coor = skew_run("COOR", 0.3)
        unc = skew_run("UNC", 0.3)
        assert coor["avg_ckpt_time"] > 50 * unc["avg_ckpt_time"]

    def test_coor_p50_explodes_unc_stays_low(self):
        coor = skew_run("COOR", 0.3)
        unc = skew_run("UNC", 0.3)
        cic = skew_run("CIC", 0.3)
        assert coor["p50_pre"] > 10 * unc["p50_pre"]
        assert cic["p50_pre"] < 3 * unc["p50_pre"]

    def test_uniform_baseline_equal(self):
        coor = skew_run("COOR", 0.0)
        unc = skew_run("UNC", 0.0)
        assert coor["p50_pre"] == pytest.approx(unc["p50_pre"], rel=0.2)

    def test_skew_worsens_with_hot_ratio(self):
        mild = skew_run("COOR", 0.2)
        heavy = skew_run("COOR", 0.3)
        assert heavy["avg_ckpt_time"] >= mild["avg_ckpt_time"]

    def test_unc_ct_insensitive_to_skew(self):
        uniform = skew_run("UNC", 0.0)
        skewed = skew_run("UNC", 0.3)
        assert skewed["avg_ckpt_time"] < 3 * uniform["avg_ckpt_time"]

    def test_throughput_unaffected_pre_backpressure(self):
        # input keeps flowing (queues absorb it); both protocols ingest the
        # same workload — the damage shows in latency, not drained count
        coor = skew_run("COOR", 0.3)
        unc = skew_run("UNC", 0.3)
        assert coor["n_sinked"] == unc["n_sinked"]
