"""Benchmark-suite helpers (pytest-benchmark, one bench per paper table).

Each benchmark runs a scaled-down version of the table's experiment grid
exactly once (``pedantic(rounds=1)``) — the interesting number is the
end-to-end cost of regenerating the table, not micro-variance — and then
asserts the table's qualitative shape so a silent regression in the
protocols also fails the bench.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
