"""Unit tests for the wire-level message model."""
import pytest

from repro.dataflow.messages import (
    CKPT_META_BYTES,
    MARKER_BYTES,
    PAYLOAD_BYTES,
    Kind,
    Message,
    Record,
    payload_bytes_for,
    stable_hash,
)


def _rec(kind="bid", key=1, value=None, uid="r1", ts=1.0):
    return Record(uid=uid, key=key, value=value or {}, ingest_ts=ts, kind=kind)


class TestStableHash:
    def test_deterministic(self):
        assert stable_hash(42) == stable_hash(42)

    def test_distinct_keys_differ(self):
        assert stable_hash("a") != stable_hash("b")

    def test_nonnegative(self):
        for k in [0, -1, "x", (1, 2)]:
            assert stable_hash(k) >= 0

    def test_stable_across_types(self):
        # repr-based: ints and strings of same text must not collide silently
        assert stable_hash(1) != stable_hash("1")


class TestRecord:
    def test_derive_inherits_ingest_ts(self):
        r = _rec(ts=3.5)
        d = r.derive("m", key=2, value={"x": 1}, kind="bid_eur")
        assert d.ingest_ts == 3.5

    def test_derive_uid_suffix(self):
        d = _rec(uid="bid7").derive("m", 1, {}, "bid_eur")
        assert d.uid == "bid7/m"

    def test_derive_sets_kind_and_key(self):
        d = _rec().derive("m", key=9, value={"v": 2}, kind="q12_out")
        assert d.kind == "q12_out" and d.key == 9 and d.value == {"v": 2}


class TestPayloadBytes:
    def test_known_kind(self):
        assert payload_bytes_for(_rec("bid")) == PAYLOAD_BYTES["bid"]

    def test_unknown_kind_falls_back(self):
        assert payload_bytes_for(_rec("mystery")) == PAYLOAD_BYTES["event"]

    def test_path_records_grow_with_path(self):
        short = _rec("source_node", value={"op": "source", "path": (1,)})
        long = _rec("source_node", value={"op": "source", "path": (1, 2, 3, 4)})
        assert payload_bytes_for(long) > payload_bytes_for(short)

    def test_bid_is_smallest_nexmark_payload(self):
        # Q1 has the largest CIC overhead ratio in the paper because bids
        # are the smallest records
        assert PAYLOAD_BYTES["bid"] < PAYLOAD_BYTES["person"]
        assert PAYLOAD_BYTES["bid"] < PAYLOAD_BYTES["auction"]


class TestMessage:
    def _msg(self, proto=0):
        return Message(
            kind=Kind.DATA,
            channel=("a", 0, "b", 1),
            seq=5,
            record=_rec(),
            payload_bytes=22,
            proto_bytes=proto,
        )

    def test_total_bytes(self):
        assert self._msg(proto=10).total_bytes == 32

    def test_src_dst(self):
        m = self._msg()
        assert m.src == ("a", 0) and m.dst == ("b", 1)

    def test_marker_and_meta_sizes_positive(self):
        assert MARKER_BYTES > 0 and CKPT_META_BYTES > 0
