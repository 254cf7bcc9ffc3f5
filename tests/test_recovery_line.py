"""Unit + property tests for the checkpoint graph and rollback propagation
(paper §III-B, Algorithm 1)."""
from typing import Dict, List

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.dataflow.state import CheckpointMeta, CheckpointStore, StoredCheckpoint
from repro.protocols.recovery import (
    build_checkpoint_graph,
    find_recovery_line,
    rollback_propagation,
)


class Builder:
    """Hand-build a consistent execution history of sends/receives and
    checkpoints over single-instance operators."""

    def __init__(self, ops: List[str], channels: List[tuple]):
        self.insts = [(op, 0) for op in ops]
        self.channels = [(a, 0, b, 0) for a, b in channels]
        self.sent = {ch: 0 for ch in self.channels}
        self.recv = {ch: 0 for ch in self.channels}
        self.store = CheckpointStore()
        self.out = {i: [ch for ch in self.channels if (ch[0], ch[1]) == i] for i in self.insts}
        self.inn = {i: [ch for ch in self.channels if (ch[2], ch[3]) == i] for i in self.insts}
        for i in self.insts:
            self.checkpoint(i[0])  # implicit initial checkpoints

    def send(self, a: str, b: str, n: int = 1):
        self.sent[(a, 0, b, 0)] += n

    def deliver(self, a: str, b: str, n: int = 1):
        ch = (a, 0, b, 0)
        self.recv[ch] = min(self.sent[ch], self.recv[ch] + n)

    def checkpoint(self, op: str):
        inst = (op, 0)
        idx = len(self.store.checkpoints(inst))
        meta = CheckpointMeta(
            instance=inst, index=idx, ts=float(idx), kind="local", round_id=None,
            state_bytes=0,
            last_sent={ch: self.sent[ch] for ch in self.out[inst]},
            last_recv={ch: self.recv[ch] for ch in self.inn[inst]},
        )
        self.store.put(StoredCheckpoint(meta, None))

    def line(self):
        return find_recovery_line(self.store, self.insts, self.out)


class TestSimpleScenarios:
    def test_no_traffic_latest_line(self):
        b = Builder(["A", "B"], [("A", "B")])
        b.checkpoint("A"); b.checkpoint("B")
        line, invalid, scanned = b.line()
        assert line == {("A", 0): 1, ("B", 0): 1}
        assert invalid == 0 and scanned == 4

    def test_clean_cut_latest_line(self):
        b = Builder(["A", "B"], [("A", "B")])
        b.send("A", "B", 5); b.deliver("A", "B", 5)
        b.checkpoint("A"); b.checkpoint("B")
        line, invalid, _ = b.line()
        assert line == {("A", 0): 1, ("B", 0): 1} and invalid == 0

    def test_orphan_rolls_receiver_back(self):
        b = Builder(["A", "B"], [("A", "B")])
        b.checkpoint("A")        # A ckpt1: sent=0
        b.send("A", "B", 3); b.deliver("A", "B", 3)
        b.checkpoint("B")        # B ckpt1: recv=3 > A.ckpt1.sent=0 -> orphan
        line, invalid, _ = b.line()
        assert line == {("A", 0): 1, ("B", 0): 0}
        assert invalid == 1

    def test_no_orphan_when_sender_checkpoints_after(self):
        b = Builder(["A", "B"], [("A", "B")])
        b.send("A", "B", 3); b.deliver("A", "B", 3)
        b.checkpoint("B")        # recv=3
        b.checkpoint("A")        # sent=3 >= recv -> consistent
        line, invalid, _ = b.line()
        assert line == {("A", 0): 1, ("B", 0): 1} and invalid == 0

    def test_domino_chain(self):
        b = Builder(["A", "B", "C"], [("A", "B"), ("B", "C")])
        b.checkpoint("A")
        b.send("A", "B"); b.deliver("A", "B")
        b.checkpoint("B")  # orphan wrt A ckpt1 - but B->C also cascades:
        b.send("B", "C"); b.deliver("B", "C")
        b.checkpoint("C")  # orphan wrt B ckpt1
        line, invalid, _ = b.line()
        assert line == {("A", 0): 1, ("B", 0): 0, ("C", 0): 0}
        assert invalid == 2

    def test_mutual_orphans_roll_both(self):
        b = Builder(["A", "B"], [("A", "B"), ("B", "A")])
        b.checkpoint("A")
        b.send("A", "B"); b.deliver("A", "B")
        b.checkpoint("B")
        b.send("B", "A"); b.deliver("B", "A")
        b.checkpoint("A")  # A ckpt2 saw B's post-ckpt... build z-pattern
        line, invalid, _ = b.line()
        # every checkpoint must be consistent across the returned line
        for ch in b.channels:
            a, bb = (ch[0], 0), (ch[2], 0)
            sa = b.store.get(a, line[a]).meta.last_sent[ch]
            rb = b.store.get(bb, line[bb]).meta.last_recv[ch]
            assert rb <= sa

    def test_initial_checkpoints_always_fallback(self):
        b = Builder(["A", "B"], [("A", "B")])
        # traffic but no real checkpoints at all: line = initial everywhere
        b.send("A", "B", 4); b.deliver("A", "B", 4)
        line, invalid, _ = b.line()
        assert line == {("A", 0): 0, ("B", 0): 0} and invalid == 0


class TestCheckpointGraph:
    def test_consecutive_edges_present(self):
        b = Builder(["A"], [])
        b.checkpoint("A"); b.checkpoint("A")
        adj = build_checkpoint_graph(b.store, b.insts, b.out)
        assert (("A", 0), 1) in adj[(("A", 0), 0)]
        assert (("A", 0), 2) in adj[(("A", 0), 1)]

    def test_orphan_edge_targets_earliest(self):
        b = Builder(["A", "B"], [("A", "B")])
        b.checkpoint("A")  # A1 sent=0
        b.send("A", "B", 2); b.deliver("A", "B", 2)
        b.checkpoint("B")  # B1 recv=2
        b.deliver("A", "B", 0)
        b.checkpoint("B")  # B2 recv=2
        adj = build_checkpoint_graph(b.store, b.insts, b.out)
        assert (("B", 0), 1) in adj[(("A", 0), 1)]
        assert (("B", 0), 2) not in adj[(("A", 0), 1)]

    def test_no_edges_without_traffic(self):
        b = Builder(["A", "B"], [("A", "B")])
        b.checkpoint("A"); b.checkpoint("B")
        adj = build_checkpoint_graph(b.store, b.insts, b.out)
        assert all(dst[0] == ("A", 0) for dst in adj[(("A", 0), 0)])


@st.composite
def execution(draw):
    """Random consistent execution over a 3-operator ring."""
    ops = ["A", "B", "C"]
    channels = [("A", "B"), ("B", "C"), ("C", "A")]
    b = Builder(ops, channels)
    steps = draw(st.lists(st.tuples(st.integers(0, 2), st.integers(0, 2)), max_size=60))
    for kind, which in steps:
        if kind == 0:
            a, c = channels[which]
            b.send(a, c)
        elif kind == 1:
            a, c = channels[which]
            b.deliver(a, c)
        else:
            b.checkpoint(ops[which])
    return b


class TestRollbackPropagationProperties:
    @settings(max_examples=60, deadline=None)
    @given(execution())
    def test_line_is_consistent_and_maximal_enough(self, b):
        line, invalid, scanned = b.line()
        # 1. a valid index per instance
        for inst in b.insts:
            assert 0 <= line[inst] < len(b.store.checkpoints(inst))
        # 2. no orphan across the line (Def. 5 "no orphans")
        for ch in b.channels:
            a, bb = (ch[0], 0), (ch[2], 0)
            sa = b.store.get(a, line[a]).meta.last_sent[ch]
            rb = b.store.get(bb, line[bb]).meta.last_recv[ch]
            assert rb <= sa
        # 3. invalid counts exactly the checkpoints above the line
        assert invalid == sum(
            (len(b.store.checkpoints(i)) - 1) - line[i] for i in b.insts
        )
