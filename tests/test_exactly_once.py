"""Exactly-once processing guarantees (paper Def. 3) under failure.

The decisive check: for every query and protocol, a run with an injected
failure + recovery must produce *exactly* the failure-free run's
deduplicated sink output and the same final operator states. Any dropped
message, double-applied state update, or wrong recovery line fails these.
"""
import pytest

from helpers import FAIL_AT, run_cyclic, run_query

QUERIES = ["q1", "q3", "q8", "q12"]
PROTOCOLS = ["COOR", "UNC", "CIC"]


@pytest.mark.parametrize("query", QUERIES)
@pytest.mark.parametrize("protocol", PROTOCOLS)
class TestExactlyOnceUnderFailure:
    def test_sink_output_identical_to_failure_free(self, query, protocol):
        base = run_query(query, "none")
        rec = run_query(query, protocol, fail_at=FAIL_AT)
        assert rec.sink_values() == base.sink_values()

    def test_final_operator_states_identical(self, query, protocol):
        base = run_query(query, "none")
        rec = run_query(query, protocol, fail_at=FAIL_AT)
        assert rec.state_fingerprints == base.state_fingerprints

    def test_failure_free_protocol_run_matches_baseline(self, query, protocol):
        base = run_query(query, "none")
        clean = run_query(query, protocol, fail_at=None)
        assert clean.sink_values() == base.sink_values()
        assert clean.n_duplicate_sink_arrivals == 0


@pytest.mark.parametrize("protocol", PROTOCOLS)
@pytest.mark.parametrize("query", QUERIES)
def test_recovery_produces_duplicates_but_dedup_hides_them(query, protocol):
    """At-least-once redelivery happens (duplicate arrivals observed at the
    sink, paper §II-A: external systems can observe duplicates), but
    exactly-once *processing* holds after deduplication."""
    rec = run_query(query, protocol, fail_at=FAIL_AT)
    assert rec.n_duplicate_sink_arrivals > 0
    assert len(rec.sink_values()) == len(run_query(query, "none").sink_values())


@pytest.mark.parametrize("protocol", ["UNC", "CIC"])
class TestCyclicExactlyOnce:
    def test_cyclic_sink_identical_after_failure(self, protocol):
        base = run_cyclic("none")
        rec = run_cyclic(protocol, fail_at=3.0)
        assert set(rec.sink_values()) == set(base.sink_values())

    def test_cyclic_states_identical_after_failure(self, protocol):
        base = run_cyclic("none")
        rec = run_cyclic(protocol, fail_at=3.0)
        assert rec.state_fingerprints == base.state_fingerprints
